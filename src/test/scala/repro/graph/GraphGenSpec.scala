package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class GraphGenSpec extends AnyFunSuite {

  // ------------------------------------------------------------- karate
  test("karate: 34 nodes, 78 edges") {
    val g = GraphGen.karate.graph
    assert(g.n == 34 && g.m == 78)
  }
  test("karate: canonical hub degrees (1:16, 34:17, 33:12, 2:9, 3:10)") {
    val g = GraphGen.karate.graph
    assert(g.degree(0) == 16)
    assert(g.degree(33) == 17)
    assert(g.degree(32) == 12)
    assert(g.degree(1) == 9)
    assert(g.degree(2) == 10)
  }
  test("karate: connected, and the two factions partition V") {
    val gt = GraphGen.karate
    assert(gt.graph.componentOf(0).size == 34)
    assert(gt.communities.map(_.size).sum == 34)
    assert((gt.communities(0) intersect gt.communities(1)).isEmpty)
    assert(gt.communities(0).contains(0) && gt.communities(1).contains(33))
  }
  test("karate: labels derived from communities") {
    val gt = GraphGen.karate
    assert(gt.labels(0) == 0 && gt.labels(33) == 1)
  }

  // ------------------------------------------------------ ring of cliques
  test("ringOfCliques: each clique is internally complete") {
    val g = GraphGen.ringOfCliques(5, 4)
    for (c <- 0 until 5; i <- 0 until 4; j <- i + 1 until 4)
      assert(g.hasEdge(c * 4 + i, c * 4 + j))
  }
  test("ringOfCliques: connected and degree bounds") {
    val g = GraphGen.ringOfCliques(6, 5)
    assert(g.componentOf(0).size == 30)
    assert(g.degree.forall(d => d == 4 || d == 5))
  }

  // ------------------------------------------------------ planted partition
  for ((sizes, pIn, pOut) <- Seq((Seq(30, 30), 0.3, 0.02), (Seq(20, 40, 20), 0.4, 0.03))) {
    test(s"plantedPartition sizes=$sizes is assortative") {
      val gt = GraphGen.plantedPartition(sizes, pIn, pOut, seed = 5)
      assert(gt.graph.n == sizes.sum)
      assert(gt.communities.map(_.size) == sizes.toIndexedSeq)
      var in = 0L; var out = 0L
      gt.graph.edges.foreach { case (u, v) =>
        if (gt.labels(u) == gt.labels(v)) in += 1 else out += 1
      }
      assert(in > out * 2, s"in=$in out=$out")
    }
  }

  // ------------------------------------------------------------- stand-ins
  test("dolphin stand-in matches the paper's scale") {
    val gt = GraphGen.dolphinStandIn()
    assert(gt.graph.n == 62)
    assert(gt.graph.m > 100 && gt.graph.m < 230, s"m=${gt.graph.m}")
    assert(gt.communities.length == 2)
  }
  test("mexican stand-in matches the paper's scale") {
    val gt = GraphGen.mexicanStandIn()
    assert(gt.graph.n == 35)
    assert(gt.graph.m > 70 && gt.graph.m < 170, s"m=${gt.graph.m}")
  }
  test("polblogs stand-in matches the paper's scale and is skewed") {
    val gt = GraphGen.polblogsStandIn()
    assert(gt.graph.n == 1224)
    assert(gt.graph.m > 10000 && gt.graph.m < 24000, s"m=${gt.graph.m}")
    assert(gt.graph.degree.max > 4 * (2.0 * gt.graph.m / gt.graph.n), "hub-dominated")
  }
  test("lite stand-ins scale down") {
    val gt = GraphGen.dblpLite(0.1)
    assert(gt.graph.n == 300)
    assert(gt.communities.length > 5)
  }

  // ------------------------------------------------------------------ LFR
  for ((davg, dmax, mu) <- Seq((20.0, 100, 0.2), (15.0, 60, 0.4), (25.0, 100, 0.3))) {
    test(s"LFR davg=$davg dmax=$dmax mu=$mu: realized statistics") {
      val n = 600
      val gt = GraphGen.lfr(n, davg, dmax, mu, minC = 20, maxC = 200, seed = 9)
      val g = gt.graph
      assert(g.n == n)
      val realAvg = 2.0 * g.m / n
      assert(math.abs(realAvg - davg) / davg < 0.35, s"avg=$realAvg want~$davg")
      assert(g.degree.max <= dmax)
      var ext = 0L
      g.edges.foreach { case (u, v) => if (gt.labels(u) != gt.labels(v)) ext += 1 }
      val realMu = ext.toDouble / g.m
      assert(math.abs(realMu - mu) < 0.18, s"mu=$realMu want~$mu")
      assert(gt.communities.map(_.size).sum == n)
      assert(gt.communities.forall(_.size <= 200 + 5))
    }
  }
  test("LFR is deterministic in the seed") {
    val a = GraphGen.lfr(300, 12, 50, 0.3, 10, 100, seed = 3)
    val b = GraphGen.lfr(300, 12, 50, 0.3, 10, 100, seed = 3)
    assert(a.graph.edges.toSeq == b.graph.edges.toSeq)
    assert(a.communities == b.communities)
  }
  test("LFR with different seeds differs") {
    val a = GraphGen.lfr(300, 12, 50, 0.3, 10, 100, seed = 3)
    val b = GraphGen.lfr(300, 12, 50, 0.3, 10, 100, seed = 4)
    assert(a.graph.edges.toSeq != b.graph.edges.toSeq)
  }
  test("LFR communities are denser inside than outside") {
    val gt = GraphGen.lfr(500, 16, 60, 0.3, 20, 120, seed = 21)
    // pick the smallest community; its internal density should beat the
    // graph's overall density by a wide margin (large communities dilute
    // density ~ 1/|C|, so the smallest is the sharpest check)
    val c = gt.communities.minBy(_.size)
    val s = scala.collection.mutable.BitSet.empty; c.foreach(s += _)
    val l = gt.graph.edgeCount(s)
    val inDens = 2.0 * l / (c.size.toDouble * (c.size - 1))
    val gDens = 2.0 * gt.graph.m / (gt.graph.n.toDouble * (gt.graph.n - 1))
    assert(inDens > 5 * gDens)
  }

  test("communitiesOf returns the communities containing a node") {
    val gt = GraphGen.karate
    assert(gt.communitiesOf(0).size == 1)
    assert(gt.communitiesOf(0).head.contains(0))
  }
}
