package repro.graph

import scala.collection.mutable
import scala.util.Random

/** A generated benchmark graph: topology plus ground-truth communities.
  * Communities may overlap (Seq of node sets); `labels` gives the primary
  * community id per node for non-overlapping datasets.
  */
final case class GroundTruthGraph(
    name: String,
    graph: LocalGraph,
    communities: IndexedSeq[Set[Int]]) {
  lazy val labels: Array[Int] = {
    val l = Array.fill(graph.n)(-1)
    communities.zipWithIndex.foreach { case (c, i) => c.foreach(v => if (l(v) == -1) l(v) = i) }
    l
  }
  /** Communities containing node v. */
  def communitiesOf(v: Int): Seq[Set[Int]] = communities.filter(_.contains(v))
}

/** Synthetic and embedded graph generators.
  *
  * All generators are deterministic in their seed. The LFR implementation is
  * the standard configuration-model variant: power-law degrees (exponent ~2),
  * power-law community sizes (exponent ~1), each node spends a (1-mu)
  * fraction of its stubs inside its community.
  */
object GraphGen {

  // ---------------------------------------------------------------- karate
  /** Zachary's Karate club (exact), with the canonical two-faction split. */
  lazy val karate: GroundTruthGraph = {
    val e1 = Seq(
      (2,1),(3,1),(3,2),(4,1),(4,2),(4,3),(5,1),(6,1),(7,1),(7,5),(7,6),(8,1),
      (8,2),(8,3),(8,4),(9,1),(9,3),(10,3),(11,1),(11,5),(11,6),(12,1),(13,1),
      (13,4),(14,1),(14,2),(14,3),(14,4),(17,6),(17,7),(18,1),(18,2),(20,1),
      (20,2),(22,1),(22,2),(26,24),(26,25),(28,3),(28,24),(28,25),(29,3),
      (30,24),(30,27),(31,2),(31,9),(32,1),(32,25),(32,26),(32,29),(33,3),
      (33,9),(33,15),(33,16),(33,19),(33,21),(33,23),(33,24),(33,30),(33,31),
      (33,32),(34,9),(34,10),(34,14),(34,15),(34,16),(34,19),(34,20),(34,21),
      (34,23),(34,24),(34,27),(34,28),(34,29),(34,30),(34,31),(34,32),(34,33))
    val g = LocalGraph.fromEdges(34, e1.map { case (u, v) => (u - 1, v - 1) })
    val hi = Set(1,2,3,4,5,6,7,8,11,12,13,14,17,18,20,22).map(_ - 1)
    val officer = (1 to 34).map(_ - 1).toSet -- hi
    GroundTruthGraph("karate", g, IndexedSeq(hi, officer))
  }

  // ------------------------------------------------------- ring of cliques
  /** The Fig-2 resolution-limit example: `nCliques` cliques of `cliqueSize`
    * nodes arranged in a ring, one bridge edge between consecutive cliques
    * (leaving node 0 of clique i, entering node 1 of clique i+1).
    */
  def ringOfCliques(nCliques: Int, cliqueSize: Int): LocalGraph = {
    val n = nCliques * cliqueSize
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    for (c <- 0 until nCliques) {
      val base = c * cliqueSize
      for (i <- 0 until cliqueSize; j <- i + 1 until cliqueSize) es += ((base + i, base + j))
      val next = ((c + 1) % nCliques) * cliqueSize
      es += ((base, next + 1))
    }
    LocalGraph.fromEdges(n, es.toSeq)
  }

  // ------------------------------------------------------ planted partition
  /** Planted-partition graph with given community sizes. `pIn`/`pOut` are
    * within/between edge probabilities. Degree-corrected when `zipfAlpha>0`
    * (node propensities ~ rank^-alpha, normalized per community).
    */
  def plantedPartition(sizes: Seq[Int], pIn: Double, pOut: Double, seed: Long,
                       name: String = "planted", zipfAlpha: Double = 0.0): GroundTruthGraph = {
    val rnd = new Random(seed)
    val n = sizes.sum
    val label = new Array[Int](n)
    var idx = 0
    sizes.zipWithIndex.foreach { case (s, c) => (0 until s).foreach { _ => label(idx) = c; idx += 1 } }
    val theta = Array.tabulate(n) { v =>
      if (zipfAlpha <= 0) 1.0 else math.pow((v % sizes(label(v))) + 1.0, -zipfAlpha)
    }
    // normalize propensities so the mean is 1 (keeps pIn/pOut interpretable)
    val meanTheta = theta.sum / n
    (0 until n).foreach(v => theta(v) /= meanTheta)
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    var u = 0
    while (u < n) {
      var v = u + 1
      while (v < n) {
        val base = if (label(u) == label(v)) pIn else pOut
        val p = math.min(1.0, base * theta(u) * theta(v))
        if (rnd.nextDouble() < p) es += ((u, v))
        v += 1
      }
      u += 1
    }
    val g = LocalGraph.fromEdges(n, es.toSeq)
    val comms = sizes.indices.map(c => (0 until n).filter(label(_) == c).toSet).toIndexedSeq
    GroundTruthGraph(name, g, comms)
  }

  // ------------------------------------------------------------------- LFR
  /** LFR benchmark (configuration-model variant).
    *
    * @param n      number of nodes
    * @param davg   target average degree
    * @param dmax   maximum degree
    * @param mu     mixing parameter: fraction of each node's edges that leave
    *               its community
    * @param minC   minimum community size
    * @param maxC   maximum community size
    */
  def lfr(n: Int, davg: Double, dmax: Int, mu: Double,
          minC: Int, maxC: Int, seed: Long): GroundTruthGraph = {
    val rnd = new Random(seed)

    // 1. degrees: continuous power-law exponent 2 on [a, dmax]; binary-search
    //    the lower bound a so the mean hits davg.
    def plMean(a: Double): Double = {
      val b = dmax.toDouble
      if (math.abs(b - a) < 1e-9) a else math.log(b / a) / (1.0 / a - 1.0 / b)
    }
    var lo = 1.0; var hi = dmax.toDouble
    (0 until 60).foreach { _ =>
      val mid = (lo + hi) / 2
      if (plMean(mid) < davg) lo = mid else hi = mid
    }
    val a = (lo + hi) / 2
    val b = dmax.toDouble
    def sampleDeg(): Int = {
      val u = rnd.nextDouble()
      val inv = 1.0 / (1.0 / a - u * (1.0 / a - 1.0 / b))
      math.max(2, math.min(dmax, math.round(inv).toInt))
    }
    val deg = Array.fill(n)(sampleDeg())

    // 2. community sizes: power-law exponent 1 on [minC, maxC]
    val sizes = mutable.ArrayBuffer.empty[Int]
    var tot = 0
    while (tot < n) {
      val s0 = math.round(minC * math.pow(maxC.toDouble / minC, rnd.nextDouble())).toInt
      val s = math.max(minC, math.min(maxC, s0))
      sizes += s; tot += s
    }
    sizes(sizes.length - 1) -= (tot - n)
    if (sizes.last < minC) {
      // fold the undersized remainder into the previous community
      val last = sizes.remove(sizes.length - 1)
      if (sizes.isEmpty) sizes += n else sizes(sizes.length - 1) += last
    }

    // 3. assign nodes to communities: internal degree must fit the community
    val nComm = sizes.length
    val capacity = sizes.toArray
    val label = Array.fill(n)(-1)
    val intDeg = new Array[Int](n)
    val order = rnd.shuffle((0 until n).toList).sortBy(v => -deg(v))
    for (v <- order) {
      val want = math.round((1.0 - mu) * deg(v)).toInt
      val fits = (0 until nComm).filter(c => capacity(c) > 0 && want <= sizes(c) - 1)
      val c =
        if (fits.nonEmpty) fits(rnd.nextInt(fits.length))
        else {
          val open = (0 until nComm).filter(capacity(_) > 0)
          open.maxBy(sizes(_))
        }
      label(v) = c; capacity(c) -= 1
      intDeg(v) = math.min(math.round((1.0 - mu) * deg(v)).toInt, sizes(c) - 1)
    }

    val es = mutable.HashSet.empty[Long]
    def ekey(u: Int, v: Int): Long = if (u < v) u.toLong * n + v else v.toLong * n + u
    def addEdge(u: Int, v: Int): Boolean = u != v && es.add(ekey(u, v))

    // 4. internal wiring per community: configuration model on internal stubs
    val byComm = Array.fill(nComm)(mutable.ArrayBuffer.empty[Int])
    (0 until n).foreach(v => byComm(label(v)) += v)
    for (c <- 0 until nComm) {
      val stubs = mutable.ArrayBuffer.empty[Int]
      byComm(c).foreach(v => (0 until intDeg(v)).foreach(_ => stubs += v))
      if (stubs.length % 2 == 1) stubs.remove(stubs.length - 1)
      val arr = rnd.shuffle(stubs.toList).toArray
      var i = 0
      var retries = mutable.ArrayBuffer.empty[Int]
      while (i + 1 < arr.length) {
        if (!addEdge(arr(i), arr(i + 1))) { retries += arr(i); retries += arr(i + 1) }
        i += 2
      }
      // one retry round for collided stubs
      val arr2 = rnd.shuffle(retries.toList).toArray
      i = 0
      while (i + 1 < arr2.length) { addEdge(arr2(i), arr2(i + 1)); i += 2 }
    }

    // 5. external wiring: configuration model on remaining stubs, rejecting
    //    intra-community pairs
    val extStubs = mutable.ArrayBuffer.empty[Int]
    (0 until n).foreach(v => (0 until math.max(0, deg(v) - intDeg(v))).foreach(_ => extStubs += v))
    var arr = rnd.shuffle(extStubs.toList).toArray
    var round = 0
    while (arr.length >= 2 && round < 5) {
      val rejected = mutable.ArrayBuffer.empty[Int]
      var i = 0
      while (i + 1 < arr.length) {
        val u = arr(i); val v = arr(i + 1)
        if (label(u) == label(v) || !addEdge(u, v)) { rejected += u; rejected += v }
        i += 2
      }
      if (i < arr.length) rejected += arr(i)
      arr = rnd.shuffle(rejected.toList).toArray
      round += 1
    }

    val edgeSeq = es.iterator.map(k => ((k / n).toInt, (k % n).toInt)).toSeq
    val g = LocalGraph.fromEdges(n, edgeSeq)
    val comms = (0 until nComm).map(c => byComm(c).toSet).toIndexedSeq.filter(_.nonEmpty)
    GroundTruthGraph(s"lfr(n=$n,davg=$davg,dmax=$dmax,mu=$mu)", g, comms)
  }

  // ------------------------------------------------------------ stand-ins
  /** Stand-ins for the paper's real-world datasets (see DESIGN.md §3).
    * `scale` shrinks the *-lite graphs for tests; 1.0 = bench size.
    */
  def dolphinStandIn(seed: Long = 11): GroundTruthGraph =
    plantedPartition(Seq(42, 20), pIn = 0.155, pOut = 0.012, seed = seed, name = "dolphin-standin")

  def mexicanStandIn(seed: Long = 13): GroundTruthGraph =
    plantedPartition(Seq(21, 14), pIn = 0.30, pOut = 0.09, seed = seed, name = "mexican-standin")

  def polblogsStandIn(seed: Long = 17): GroundTruthGraph =
    plantedPartition(Seq(586, 638), pIn = 0.042, pOut = 0.0033, seed = seed,
      name = "polblogs-standin", zipfAlpha = 0.75)

  /** DBLP-like: many small communities, low average degree (few triangles). */
  def dblpLite(scale: Double = 1.0, seed: Long = 23): GroundTruthGraph =
    lfr(n = math.max(200, (3000 * scale).toInt), davg = 6.6, dmax = 60, mu = 0.30,
      minC = 5, maxC = 30, seed = seed).copy(name = "dblp-lite")

  /** Youtube-like: noisier, slightly larger, low degree, higher mixing. */
  def youtubeLite(scale: Double = 1.0, seed: Long = 29): GroundTruthGraph =
    lfr(n = math.max(200, (4000 * scale).toInt), davg = 5.3, dmax = 120, mu = 0.45,
      minC = 5, maxC = 50, seed = seed).copy(name = "youtube-lite")

  /** Livejournal-like: denser, moderate mixing. */
  def livejournalLite(scale: Double = 1.0, seed: Long = 31): GroundTruthGraph =
    lfr(n = math.max(200, (5000 * scale).toInt), davg = 17.0, dmax = 200, mu = 0.30,
      minC = 10, maxC = 80, seed = seed).copy(name = "livejournal-lite")
}
