package repro.baselines

import repro.graph.{GraphAlgos, LocalGraph, TrussResult}
import scala.collection.mutable

/** Per-graph cache of the expensive decompositions shared by baselines. */
final class GraphCtx(val g: LocalGraph) {
  lazy val core: Array[Int] = g.coreNumbers()
  lazy val truss: TrussResult = GraphAlgos.trussDecomposition(g)
}

/** Minimum-degree (k-core) and triangle (k-truss) community search models. */
object CoreTruss {

  /** Sozio–Gionis style global search: the connected component of the k-core
    * containing all query nodes. None if some query is outside the k-core or
    * the queries are split across components.
    */
  def kc(ctx: GraphCtx, queries: Seq[Int], k: Int): Option[Set[Int]] = {
    val inCore = (v: Int) => ctx.core(v) >= k
    if (!queries.forall(inCore)) return None
    val comp = ctx.g.componentOf(queries.head, inCore)
    if (queries.forall(comp)) Some(comp.toSet) else None
  }

  /** Highest-order core: the maximum k for which `kc` succeeds. */
  def highcore(ctx: GraphCtx, queries: Seq[Int]): Option[Set[Int]] = {
    val kmax = queries.map(ctx.core(_)).min
    var k = kmax
    while (k >= 1) {
      kc(ctx, queries, k) match {
        case Some(c) => return Some(c)
        case None => k -= 1
      }
    }
    kc(ctx, queries, 0)
  }

  /** k-truss community: connected component of the subgraph made of edges
    * with truss number >= k that contains all the queries. (The original
    * model uses triangle-connectivity; we use the standard edge-connected
    * relaxation — see DESIGN.md.)
    */
  def kt(ctx: GraphCtx, queries: Seq[Int], k: Int): Option[Set[Int]] = {
    val t = ctx.truss
    val adj = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Int]]
    var i = 0
    while (i < t.truss.length) {
      if (t.truss(i) >= k) {
        adj.getOrElseUpdate(t.edgeU(i), mutable.ArrayBuffer.empty) += t.edgeV(i)
        adj.getOrElseUpdate(t.edgeV(i), mutable.ArrayBuffer.empty) += t.edgeU(i)
      }
      i += 1
    }
    if (!queries.forall(adj.contains)) return None
    // BFS over the truss subgraph
    val comp = mutable.HashSet.empty[Int]
    val queue = new java.util.ArrayDeque[Integer]()
    comp += queries.head; queue.add(queries.head)
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      adj(u).foreach { v => if (!comp(v)) { comp += v; queue.add(v) } }
    }
    if (queries.forall(comp)) Some(comp.toSet) else None
  }

  /** Highest-order truss: maximum k for which `kt` succeeds. */
  def hightruss(ctx: GraphCtx, queries: Seq[Int]): Option[Set[Int]] = {
    val kmax = queries.map(ctx.truss.nodeTrussness(_)).min
    var k = math.max(2, kmax)
    while (k >= 2) {
      kt(ctx, queries, k) match {
        case Some(c) => return Some(c)
        case None => k -= 1
      }
    }
    None
  }
}
