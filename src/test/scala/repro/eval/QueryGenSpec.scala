package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.GraphCtx
import repro.graph.GraphGen

class QueryGenSpec extends AnyFunSuite {

  private lazy val gt = GraphGen.lfr(400, 12, 50, 0.3, 20, 80, seed = 8)
  private lazy val ctx = new GraphCtx(gt.graph)

  test("produces the requested number of sets") {
    val qs = QueryGen.querySets(gt, ctx, nSets = 5, qSize = 2, seed = 1)
    assert(qs.length == 5)
  }

  test("queries come from their ground-truth community") {
    val qs = QueryGen.querySets(gt, ctx, nSets = 5, qSize = 3, seed = 2)
    qs.foreach { case (q, comm) =>
      assert(q.length == 3)
      assert(q.forall(comm.contains))
    }
  }

  test("queries are distinct within a set") {
    val qs = QueryGen.querySets(gt, ctx, nSets = 8, qSize = 4, seed = 3)
    qs.foreach { case (q, _) => assert(q.distinct.length == q.length) }
  }

  test("deterministic in the seed") {
    val a = QueryGen.querySets(gt, ctx, 5, 2, seed = 4)
    val b = QueryGen.querySets(gt, ctx, 5, 2, seed = 4)
    assert(a == b)
  }

  test("cycles communities when fewer than nSets (small datasets)") {
    val k = GraphGen.karate
    val kctx = new GraphCtx(k.graph)
    val qs = QueryGen.querySets(k, kctx, nSets = 10, qSize = 1, seed = 5, minTruss = 4)
    assert(qs.length == 10)
    assert(qs.map(_._2).toSet.size == 2) // both factions used
  }

  test("prefers high-trussness nodes when available") {
    val k = GraphGen.karate
    val kctx = new GraphCtx(k.graph)
    val trussness = kctx.truss.nodeTrussness
    val qs = QueryGen.querySets(k, kctx, nSets = 6, qSize = 1, seed = 6, minTruss = 4)
    qs.foreach { case (q, comm) =>
      val maxT = comm.map(trussness(_)).max
      assert(trussness(q.head) >= math.min(4, maxT))
    }
  }
}
