package repro.baselines

import repro.graph.LocalGraph
import scala.collection.mutable

/** Wu et al. 2015 query-biased density, reproduced as a greedy node-deletion
  * peel (DESIGN.md §3): node weights grow as (1/eta)^dist from the queries so
  * far-away nodes are expensive to keep; the peel repeatedly removes the
  * non-articulation node with the smallest connectivity-per-weight and
  * returns the best query-biased-density intermediate.
  */
object QueryBiased {

  def find(g: LocalGraph, queries: Seq[Int], eta: Double = 0.5): Option[Set[Int]] = {
    val comp = g.componentOf(queries.head)
    if (!queries.forall(comp)) return None
    val dist = g.bfsDist(queries, comp)
    val weight = new Array[Double](g.n)
    comp.foreach(v => weight(v) = math.pow(1.0 / eta, math.min(30, dist(v))))

    val s = comp.clone()
    val kv = new Array[Int](g.n)
    var lS = 0L
    s.foreach { v => kv(v) = g.degreeWithin(v, s); lS += kv(v) }
    lS /= 2
    var wSum = 0.0
    s.foreach(wSum += weight(_))

    val removedOrder = mutable.ArrayBuffer.empty[Int]
    def rho: Double = if (wSum <= 0) 0.0 else lS / wSum
    var bestRho = rho
    var bestCount = 0

    var continue = true
    while (continue) {
      val art = g.articulationPoints(s)
      var bestV = -1; var bestScore = Double.PositiveInfinity
      s.foreach { v =>
        if (!queries.contains(v) && !art(v)) {
          val sc = kv(v) / weight(v) // cheap-to-drop: few links, far away
          if (sc < bestScore || (sc == bestScore && v < bestV)) { bestScore = sc; bestV = v }
        }
      }
      if (bestV == -1) continue = false
      else {
        s -= bestV
        lS -= kv(bestV)
        wSum -= weight(bestV)
        g.adj(bestV).foreach(w => if (s(w)) kv(w) -= 1)
        removedOrder += bestV
        if (rho >= bestRho) { bestRho = rho; bestCount = removedOrder.length }
      }
    }
    val community = comp.clone()
    removedOrder.take(bestCount).foreach(community -= _)
    Some(community.toSet)
  }
}
