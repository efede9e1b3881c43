package repro.baselines

import repro.graph.LocalGraph
import scala.collection.mutable

/** Luo–Wang–Promislow (WI'06/icwi2008) local-modularity greedy search.
  * Local modularity M(S) = internal edges / external edges. Alternates an
  * addition phase (add the neighbor that maximizes M) and a deletion phase
  * (drop non-query, non-articulation members that increase M) until stable.
  */
object LocalModularity {

  def find(g: LocalGraph, queries: Seq[Int], maxIters: Int = 100000): Option[Set[Int]] = {
    val comp = g.componentOf(queries.head)
    if (!queries.forall(comp)) return None
    // start from the Steiner-ish union of the queries so S is connected
    val s = mutable.BitSet.empty
    queries.foreach(s += _)
    if (queries.length > 1) {
      val parents = g.bfsParents(queries.head, comp)
      for (q <- queries) {
        var v = parents(q)
        while (v != -1 && !s.contains(v)) { s += v; v = parents(v) }
      }
    }
    var lIn = g.edgeCount(s)
    var dSum = g.degreeSum(s)
    def lOut: Long = dSum - 2 * lIn
    def mScore(in: Long, out: Long): Double =
      if (out == 0) Double.PositiveInfinity else in.toDouble / out

    var changed = true
    var iters = 0
    while (changed && iters < maxIters) {
      changed = false
      iters += 1
      // addition phase: best neighbor by resulting M
      val candidates = mutable.HashSet.empty[Int]
      s.foreach(v => g.adj(v).foreach(w => if (!s(w)) candidates += w))
      var bestV = -1; var bestM = mScore(lIn, lOut)
      candidates.foreach { v =>
        val k = g.degreeWithin(v, s)
        val nIn = lIn + k
        val nOut = (dSum + g.degree(v)) - 2 * nIn
        val sc = mScore(nIn, nOut)
        if (sc > bestM || (sc == bestM && bestV != -1 && v < bestV)) { bestM = sc; bestV = v }
      }
      if (bestV != -1 && bestM > mScore(lIn, lOut)) {
        val k = g.degreeWithin(bestV, s)
        s += bestV; lIn += k; dSum += g.degree(bestV)
        changed = true
      }
      // deletion phase: best removable member by resulting M
      if (s.size > queries.length) {
        val art = g.articulationPoints(s)
        var delV = -1; var delM = mScore(lIn, lOut)
        s.foreach { v =>
          if (!queries.contains(v) && !art(v)) {
            val k = g.degreeWithin(v, s)
            val nIn = lIn - k
            val nOut = (dSum - g.degree(v)) - 2 * nIn
            val sc = mScore(nIn, nOut)
            if (sc > delM) { delM = sc; delV = v }
          }
        }
        if (delV != -1) {
          val k = g.degreeWithin(delV, s)
          s -= delV; lIn -= k; dSum -= g.degree(delV)
          changed = true
        }
      }
    }
    Some(s.toSet)
  }
}
