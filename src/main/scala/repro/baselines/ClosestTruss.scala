package repro.baselines

import scala.collection.mutable

/** Huang et al. 2015 "closest truss community" (basic algorithm, the
  * paper's huang2015 baseline): the maximal connected k-truss containing all
  * queries with the largest k, then bulk-delete the node farthest from the
  * queries while maintaining the k-truss, until the queries would be
  * disconnected. Returns the last valid subgraph.
  */
object ClosestTruss {

  def find(ctx: GraphCtx, queries: Seq[Int]): Option[Set[Int]] = {
    val t = ctx.truss
    var kTry = math.max(2, queries.map(t.nodeTrussness(_)).min)
    var g0: Option[Set[Int]] = None
    var kSel = 2
    while (kTry >= 2 && g0.isEmpty) {
      CoreTruss.kt(ctx, queries, kTry) match {
        case Some(c) => g0 = Some(c); kSel = kTry
        case None => kTry -= 1
      }
    }
    val nodes0 = g0.getOrElse(return None)
    val g = ctx.g
    val n = g.n
    def ekey(u: Int, v: Int): Long = if (u < v) u.toLong * n + v else v.toLong * n + u

    // restrict the >=k-truss edge set to the component's nodes
    val aliveEdges = mutable.HashSet.empty[Long]
    val adj = mutable.HashMap.empty[Int, mutable.HashSet[Int]]
    var i = 0
    while (i < t.truss.length) {
      if (t.truss(i) >= kSel && nodes0.contains(t.edgeU(i)) && nodes0.contains(t.edgeV(i))) {
        aliveEdges += ekey(t.edgeU(i), t.edgeV(i))
        adj.getOrElseUpdate(t.edgeU(i), mutable.HashSet.empty) += t.edgeV(i)
        adj.getOrElseUpdate(t.edgeV(i), mutable.HashSet.empty) += t.edgeU(i)
      }
      i += 1
    }
    val aliveNodes = mutable.BitSet.empty
    nodes0.foreach(aliveNodes += _)

    // triangle support within the current subgraph
    val sup = mutable.HashMap.empty[Long, Int]
    aliveEdges.foreach { e =>
      val u = (e / n).toInt; val v = (e % n).toInt
      sup(e) = (adj(u) intersect adj(v)).size
    }

    def deleteEdgeCascade(first: Long): Unit = {
      val queue = new java.util.ArrayDeque[java.lang.Long]()
      queue.add(first)
      while (!queue.isEmpty) {
        val e = queue.poll().longValue()
        if (aliveEdges.remove(e)) {
          val u = (e / n).toInt; val v = (e % n).toInt
          adj(u) -= v; adj(v) -= u
          val common = adj(u) intersect adj(v)
          common.foreach { w =>
            val e1 = ekey(u, w); val e2 = ekey(v, w)
            sup(e1) = sup(e1) - 1; sup(e2) = sup(e2) - 1
            if (sup(e1) < kSel - 2) queue.add(e1)
            if (sup(e2) < kSel - 2) queue.add(e2)
          }
          if (adj(u).isEmpty) aliveNodes -= u
          if (adj(v).isEmpty) aliveNodes -= v
        }
      }
    }

    def bfsFrom(src: Int): mutable.HashMap[Int, Int] = {
      val d = mutable.HashMap.empty[Int, Int]
      if (!aliveNodes(src)) return d
      val queue = new java.util.ArrayDeque[Integer]()
      d(src) = 0; queue.add(src)
      while (!queue.isEmpty) {
        val u = queue.poll().intValue()
        adj.getOrElse(u, mutable.HashSet.empty[Int]).foreach { v =>
          if (!d.contains(v)) { d(v) = d(u) + 1; queue.add(v) }
        }
      }
      d
    }

    var continue = true
    var answer = aliveNodes.toSet
    while (continue) {
      // query distance qd(v) = max over queries of dist(q, v)
      val dists = queries.map(bfsFrom)
      if (queries.exists(q => !aliveNodes(q)) || dists.exists(d => !queries.forall(d.contains))) {
        return Some(answer) // queries violated by last deletion: report last valid
      }
      answer = aliveNodes.toSet
      var bestV = -1; var bestD = 0
      aliveNodes.foreach { v =>
        if (!queries.contains(v) && dists.forall(_.contains(v))) {
          val qd = dists.map(_(v)).max
          if (qd > bestD || (qd == bestD && qd > 0 && v < bestV)) { bestD = qd; bestV = v }
        }
      }
      if (bestV == -1 || bestD == 0) continue = false
      else {
        val incident = adj.getOrElse(bestV, mutable.HashSet.empty[Int]).toArray
        aliveNodes -= bestV
        incident.foreach(w => deleteEdgeCascade(ekey(bestV, w)))
      }
    }
    Some(answer)
  }
}
