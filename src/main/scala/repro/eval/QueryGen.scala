package repro.eval

import repro.baselines.GraphCtx
import repro.graph.GroundTruthGraph
import scala.util.Random

/** Query-set generation per Section 6.1: query nodes are sampled from
  * ground-truth communities, preferring nodes that belong to the (k+1)-truss
  * (k=4 by default, i.e. trussness >= 5) "so that the query nodes are more
  * likely to be located in a meaningful community". If a community has no
  * such node, the highest-trussness nodes available are used.
  */
object QueryGen {

  /** Returns `(queries, groundTruthCommunity)` pairs. Picks up to `nSets`
    * communities (cycling through communities when there are fewer, as the
    * paper does for small datasets).
    */
  def querySets(gt: GroundTruthGraph, ctx: GraphCtx, nSets: Int, qSize: Int,
                seed: Long, minTruss: Int = 5): Seq[(Seq[Int], Set[Int])] = {
    val rnd = new Random(seed)
    val trussness = ctx.truss.nodeTrussness
    val eligible = gt.communities.filter(_.size >= math.max(qSize, 2))
    if (eligible.isEmpty) return Seq.empty
    val picks =
      if (eligible.length >= nSets) rnd.shuffle(eligible.toList).take(nSets)
      else Seq.tabulate(nSets)(i => eligible(i % eligible.length))
    picks.flatMap { comm =>
      val nodes = comm.toSeq.sorted
      val maxT = nodes.map(trussness(_)).max
      val pool0 = nodes.filter(trussness(_) >= minTruss)
      val pool = if (pool0.size >= qSize) pool0 else nodes.filter(trussness(_) >= maxT)
      val chosen =
        if (pool.size >= qSize) rnd.shuffle(pool.toList).take(qSize)
        else rnd.shuffle(nodes.toList).take(qSize)
      if (chosen.size == qSize) Some((chosen.sorted, comm)) else None
    }
  }
}
