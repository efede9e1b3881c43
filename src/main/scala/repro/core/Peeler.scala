package repro.core

import repro.graph.LocalGraph
import scala.collection.mutable

/** The paper's Algorithm-1 top-down greedy peeling framework, parameterized
  * by the two key functions of Figure 3:
  *
  *  - removable-node rule: (a) non-articulation nodes or (b) farthest nodes;
  *  - best-node rule: (c) density modularity gain Λ or (d) density ratio Θ;
  *
  * plus the Section-5.7 layer-based pruning strategy. Presets:
  *   NCA = (a)+(c), NCA-DR = (a)+(d), FPA-DMG = (b)+(c)+prune,
  *   FPA = (b)+(d)+prune, FPA-noprune = (b)+(d).
  *
  * The engine can traverse a *pruned* subgraph while still scoring DM against
  * the full graph: `globalDeg` and `mEGlobal` supply the full-graph degree
  * and edge count (used by the Spark pipeline, which collects only the
  * distance-prefix subgraph).
  */
object Peeler {

  sealed trait RemovableRule
  case object NonArticulation extends RemovableRule
  case object FarthestLayer extends RemovableRule

  sealed trait Goodness
  case object DMGain extends Goodness
  case object DensityRatio extends Goodness

  /** Selects the best intermediate subgraph from (l, d, |S|, |E|). */
  type Objective = (Long, Long, Long, Long) => Double
  val DmObjective: Objective = (l, d, s, m) => Modularity.dm(l, d, s, m)
  val CmObjective: Objective = (l, d, s, m) => Modularity.cm(l, d, m)
  val GmdObjective: Objective = (l, d, s, m) => Modularity.gmd(l, d, s, m)

  final case class Result(community: Set[Int], score: Double, removed: Int,
                          millis: Long, ok: Boolean, note: String = "")

  private final case class Entry(r: Double, v: Int)
  private val entryOrder: java.util.Comparator[Entry] = (a: Entry, b: Entry) => {
    val c = java.lang.Double.compare(b.r, a.r) // max-heap on ratio
    if (c != 0) c else Integer.compare(a.v, b.v) // then smaller id first
  }

  def run(g: LocalGraph, queries: Seq[Int], rule: RemovableRule, goodness: Goodness,
          layerPrune: Boolean, objective: Objective = DmObjective,
          globalDeg: Int => Int = null, mEGlobal: Long = -1L): Result = {
    val t0 = System.nanoTime()
    def elapsedMs: Long = (System.nanoTime() - t0) / 1000000L
    require(queries.nonEmpty, "need at least one query node")
    queries.foreach(q => require(q >= 0 && q < g.n, s"query $q out of range [0,${g.n})"))
    val deg: Int => Int = if (globalDeg == null) g.degree(_) else globalDeg
    val mE: Long = if (mEGlobal >= 0) mEGlobal else g.m

    val q0 = queries.head
    val comp = g.componentOf(q0)
    if (!queries.forall(comp))
      return Result(queries.toSet, Double.NaN, 0, elapsedMs, ok = false,
        "query nodes are not in the same connected component")

    // protected nodes: the queries, plus (FPA, |Q|>1) the Steiner-ish union
    // of shortest paths linking them so farthest-layer removal never
    // disconnects the remainder (Section 5.6).
    val prot = mutable.BitSet.empty
    queries.foreach(prot += _)
    if (rule == FarthestLayer && queries.length > 1) {
      val parents = g.bfsParents(q0, comp)
      for (q <- queries) {
        // start from parents(q): q itself is already protected, and a stop at
        // any protected node is safe (its own chain to q0 is/will be walked)
        var v = parents(q)
        while (v != -1 && !prot.contains(v)) { prot += v; v = parents(v) }
      }
    }
    val dist = g.bfsDist(prot, comp)

    // incremental state: S, k_{v,S}, l_S, d_S, |S|
    val s = comp.clone()
    val kv = new Array[Int](g.n)
    var lS = 0L
    s.foreach { v => kv(v) = g.degreeWithin(v, s); lS += kv(v) }
    lS /= 2
    var dS = 0L
    s.foreach(dS += deg(_))
    var size = s.size.toLong

    val removed = mutable.ArrayBuffer.empty[Int]
    var bestScore = objective(lS, dS, size, mE)
    var bestCount = 0

    def removeNode(v: Int): Unit = {
      s -= v
      lS -= kv(v)
      dS -= deg(v)
      size -= 1
      val a = g.adj(v); var i = 0
      while (i < a.length) { val w = a(i); if (s(w)) kv(w) -= 1; i += 1 }
      removed += v
    }
    def consider(): Unit = {
      val sc = objective(lS, dS, size, mE)
      if (sc >= bestScore) { bestScore = sc; bestCount = removed.length }
    }

    rule match {
      case NonArticulation =>
        var continue = true
        while (continue) {
          val art = g.articulationPoints(s)
          var bestV = -1; var bestG = Double.NegativeInfinity; var bestD = -1
          s.foreach { v =>
            if (!prot(v) && !art(v)) {
              val gn = Modularity.gain(kv(v), deg(v), dS, mE)
              val better = gn > bestG ||
                (gn == bestG && (dist(v) > bestD || (dist(v) == bestD && v < bestV)))
              if (better) { bestV = v; bestG = gn; bestD = dist(v) }
            }
          }
          if (bestV == -1) continue = false
          else { removeNode(bestV); consider() }
        }

      case FarthestLayer =>
        var maxDist = 0
        s.foreach(v => if (dist(v) > maxDist) maxDist = dist(v))
        val layers = Array.fill(maxDist + 1)(mutable.ArrayBuffer.empty[Int])
        s.foreach(v => layers(dist(v)) += v)

        def peelLayer(dlev: Int): Unit = {
          val cand = mutable.BitSet.empty
          layers(dlev).foreach(v => if (s(v)) cand += v)
          goodness match {
            case DensityRatio =>
              val pq = new java.util.PriorityQueue[Entry](math.max(1, cand.size), entryOrder)
              cand.foreach(v => pq.add(Entry(Modularity.ratio(deg(v), kv(v)), v)))
              while (cand.nonEmpty) {
                val e = pq.poll()
                val v = e.v
                if (cand(v) && e.r == Modularity.ratio(deg(v), kv(v))) {
                  cand -= v
                  removeNode(v)
                  consider()
                  // Θ is stable: only neighbors of v change; push fresh entries
                  val a = g.adj(v); var i = 0
                  while (i < a.length) {
                    val w = a(i)
                    if (cand(w)) pq.add(Entry(Modularity.ratio(deg(w), kv(w)), w))
                    i += 1
                  }
                }
              }
            case DMGain =>
              // Λ is unstable (d_S changes globally): rescan every iteration
              while (cand.nonEmpty) {
                var bestV = -1; var bestG = Double.NegativeInfinity
                cand.foreach { v =>
                  val gn = Modularity.gain(kv(v), deg(v), dS, mE)
                  if (gn > bestG || (gn == bestG && v < bestV) || bestV == -1) {
                    bestV = v; bestG = gn
                  }
                }
                cand -= bestV
                removeNode(bestV)
                consider()
              }
          }
        }

        if (layerPrune && maxDist > 0) {
          // Section 5.7: score every distance-prefix subgraph, jump to the
          // best one, then peel only its outermost layer.
          val nNodes = new Array[Long](maxDist + 1)
          val sumDeg = new Array[Long](maxDist + 1)
          val edgesAt = new Array[Long](maxDist + 1)
          s.foreach { v => nNodes(dist(v)) += 1; sumDeg(dist(v)) += deg(v) }
          s.foreach { u =>
            val a = g.adj(u); var i = 0
            while (i < a.length) {
              val w = a(i)
              if (w > u && s(w)) edgesAt(math.max(dist(u), dist(w))) += 1
              i += 1
            }
          }
          var cl = 0L; var cd = 0L; var cn = 0L
          var bestT = 0; var bestPrefix = Double.NegativeInfinity
          var t = 0
          while (t <= maxDist) {
            cl += edgesAt(t); cd += sumDeg(t); cn += nNodes(t)
            val sc = objective(cl, cd, cn, mE)
            if (sc > bestPrefix) { bestPrefix = sc; bestT = t }
            t += 1
          }
          t = maxDist
          while (t > bestT) { layers(t).foreach(removeNode); t -= 1 }
          consider() // the chosen prefix subgraph is a candidate solution
          if (bestT > 0) peelLayer(bestT)
        } else {
          var dlev = maxDist
          while (dlev >= 1) { peelLayer(dlev); dlev -= 1 }
        }
    }

    val community = comp.clone()
    removed.take(bestCount).foreach(community -= _)
    Result(community.toSet, bestScore, bestCount, elapsedMs, ok = true)
  }

  // ------------------------------------------------------------- presets
  /** Non-articulation Cancellation Algorithm (Section 5.4). */
  def nca(g: LocalGraph, queries: Seq[Int], objective: Objective = DmObjective): Result =
    run(g, queries, NonArticulation, DMGain, layerPrune = false, objective)

  /** NCA with density ratio (variant (a)+(d), Section 6.2.5). */
  def ncaDR(g: LocalGraph, queries: Seq[Int]): Result =
    run(g, queries, NonArticulation, DensityRatio, layerPrune = false)

  /** Fast Peeling Algorithm with layer pruning (Sections 5.5 + 5.7). */
  def fpa(g: LocalGraph, queries: Seq[Int], objective: Objective = DmObjective): Result =
    run(g, queries, FarthestLayer, DensityRatio, layerPrune = true, objective)

  /** FPA without the pruning strategy (Fig 13 comparator). */
  def fpaNoPrune(g: LocalGraph, queries: Seq[Int], objective: Objective = DmObjective): Result =
    run(g, queries, FarthestLayer, DensityRatio, layerPrune = false, objective)

  /** FPA with density-modularity gain (variant (b)+(c), Section 6.2.5). */
  def fpaDMG(g: LocalGraph, queries: Seq[Int]): Result =
    run(g, queries, FarthestLayer, DMGain, layerPrune = true)
}
