package repro.baselines

import repro.core.Modularity
import repro.graph.LocalGraph
import scala.collection.mutable

/** Clauset–Newman–Moore agglomerative modularity clustering, adapted for
  * community search as the paper does: merge greedily to the end and, among
  * all intermediate clusters that contain every query node, return the one
  * with the largest density modularity.
  */
object CNM {

  def find(g: LocalGraph, queries: Seq[Int]): Option[Set[Int]] = {
    val m2 = 2.0 * g.m
    if (g.m == 0) return None
    val n = g.n
    // e(i)(j): fraction of edge endpoints between communities i and j
    val e = Array.fill(n)(mutable.HashMap.empty[Int, Double])
    val a = new Array[Double](n)
    g.edges.foreach { case (u, v) =>
      e(u)(v) = e(u).getOrElse(v, 0.0) + 1.0 / m2
      e(v)(u) = e(v).getOrElse(u, 0.0) + 1.0 / m2
      a(u) += 1.0 / m2; a(v) += 1.0 / m2
    }
    val alive = Array.fill(n)(true)
    val members = Array.tabulate(n)(i => mutable.ArrayBuffer(i))
    val commOf = Array.tabulate(n)(identity)

    var best: Option[(Double, Array[Int])] = None
    def considerQueryCommunity(): Unit = {
      val c0 = commOf(queries.head)
      if (queries.forall(commOf(_) == c0)) {
        val set = mutable.BitSet.empty
        members(c0).foreach(set += _)
        val dm = Modularity.dmOf(g, set)
        if (best.forall(_._1 < dm)) best = Some((dm, members(c0).toArray))
      }
    }
    considerQueryCommunity()

    var aliveCount = (0 until n).count(i => alive(i))
    var progress = true
    while (aliveCount > 1 && progress) {
      // best ΔQ = 2(e_ij − a_i a_j) over connected community pairs
      var bi = -1; var bj = -1; var bdq = Double.NegativeInfinity
      var i = 0
      while (i < n) {
        if (alive(i)) {
          e(i).foreach { case (j, eij) =>
            if (alive(j) && j > i) {
              val dq = 2.0 * (eij - a(i) * a(j))
              if (dq > bdq) { bdq = dq; bi = i; bj = j }
            }
          }
        }
        i += 1
      }
      if (bi == -1) progress = false
      else {
        // merge bj into bi
        e(bj).foreach { case (k, w) =>
          if (k != bi) {
            e(bi)(k) = e(bi).getOrElse(k, 0.0) + w
            e(k)(bi) = e(k).getOrElse(bi, 0.0) + w
          }
          e(k).remove(bj)
        }
        e(bi).remove(bj)
        a(bi) += a(bj)
        members(bj).foreach(v => commOf(v) = bi)
        members(bi) ++= members(bj)
        members(bj).clear()
        alive(bj) = false
        aliveCount -= 1
        considerQueryCommunity()
      }
    }
    best.map(_._2.toSet)
  }
}
