package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}
import scala.collection.mutable
import scala.util.Random

class BaselinesSpec extends AnyFunSuite {

  private def toBits(s: Set[Int]): mutable.BitSet = {
    val b = mutable.BitSet.empty; s.foreach(b += _); b
  }
  /** Two K5s joined by a single bridge edge 0-5. */
  private lazy val barbell: LocalGraph = LocalGraph.fromEdges(10,
    (for { i <- 0 until 5; j <- i + 1 until 5 } yield (i, j)) ++
    (for { i <- 5 until 10; j <- i + 1 until 10 } yield (i, j)) ++ Seq((0, 5)))
  private lazy val karate = GraphGen.karate

  // ------------------------------------------------------------------- kc
  test("kc returns the connected k-core component containing the query") {
    val ctx = new GraphCtx(karate.graph)
    val r = CoreTruss.kc(ctx, Seq(0), 3)
    assert(r.isDefined)
    val c = r.get
    assert(c.contains(0))
    val bits = toBits(c)
    assert(karate.graph.isConnected(bits))
    c.foreach(v => assert(karate.graph.degreeWithin(v, bits) >= 3,
      s"node $v violates min degree"))
  }
  test("kc fails when the query is outside the k-core") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3))) // path: 1-core only
    val ctx = new GraphCtx(g)
    assert(CoreTruss.kc(ctx, Seq(0), 2).isEmpty)
  }
  test("kc with k=0/1 returns the whole component") {
    val ctx = new GraphCtx(barbell)
    assert(CoreTruss.kc(ctx, Seq(2), 1).get.size == 10)
  }
  test("kc with multiple queries requires all in the same component") {
    val g = LocalGraph.fromEdges(6,
      Seq((0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (5, 3)))
    val ctx = new GraphCtx(g)
    assert(CoreTruss.kc(ctx, Seq(0, 3), 2).isEmpty)
    assert(CoreTruss.kc(ctx, Seq(0, 1), 2).isDefined)
  }

  // ------------------------------------------------------------- highcore
  test("highcore returns the max-k core community") {
    val ctx = new GraphCtx(barbell)
    val r = CoreTruss.highcore(ctx, Seq(2))
    assert(r.isDefined)
    // every barbell node has degree >= 4, so the 4-core is the whole graph —
    // exactly the "returns large communities" behaviour the paper reports
    assert(r.get.size == 10)
  }
  test("highcore on karate hub") {
    val ctx = new GraphCtx(karate.graph)
    val r = CoreTruss.highcore(ctx, Seq(0))
    assert(r.isDefined && r.get.contains(0))
    assert(r.get.size < 34)
  }

  // ------------------------------------------------------------------- kt
  test("kt finds the k-truss community") {
    val ctx = new GraphCtx(barbell)
    val r = CoreTruss.kt(ctx, Seq(1), 5)
    assert(r.get == Set(0, 1, 2, 3, 4)) // the K5, bridge has truss 2
  }
  test("kt fails on triangle-free graphs for k>=3") {
    val g = LocalGraph.fromEdges(6, (0 until 5).map(i => (i, i + 1)))
    val ctx = new GraphCtx(g)
    assert(CoreTruss.kt(ctx, Seq(0), 3).isEmpty)
    assert(CoreTruss.kt(ctx, Seq(0), 2).isDefined)
  }
  test("hightruss picks the largest k") {
    val ctx = new GraphCtx(barbell)
    assert(CoreTruss.hightruss(ctx, Seq(7)).get == Set(5, 6, 7, 8, 9))
  }
  test("hightruss on karate") {
    val ctx = new GraphCtx(karate.graph)
    val r = CoreTruss.hightruss(ctx, Seq(0))
    assert(r.isDefined && r.get.contains(0) && r.get.size < 34)
  }

  // ----------------------------------------------------------------- kecc
  test("kecc splits the barbell at the bridge (k=2)") {
    assert(KEcc.kecc(barbell, Seq(2), 2).get == Set(0, 1, 2, 3, 4))
  }
  test("kecc k=3 also returns the query-side K5") {
    assert(KEcc.kecc(barbell, Seq(7), 3).get == Set(5, 6, 7, 8, 9))
  }
  test("kecc respects the k-core prefilter") {
    val g = LocalGraph.fromEdges(5, Seq((0, 1), (1, 2), (2, 0), (2, 3), (3, 4)))
    assert(KEcc.kecc(g, Seq(4), 2).isEmpty) // node 4 peeled away at k=2
    assert(KEcc.kecc(g, Seq(0), 2).get == Set(0, 1, 2))
  }
  test("kecc result has edge connectivity >= k (small exact path)") {
    val rnd = new Random(3)
    val gts = GraphGen.lfr(200, 10, 40, 0.3, 20, 60, seed = 19)
    val q = rnd.nextInt(200)
    KEcc.kecc(gts.graph, Seq(q), 2).foreach { c =>
      assert(c.contains(q))
      assert(gts.graph.isConnected(toBits(c)))
    }
  }

  // --------------------------------------------------------------- clique
  test("clique percolation joins K4s sharing a triangle") {
    val g = LocalGraph.fromEdges(5,
      (for { i <- 0 until 4; j <- i + 1 until 4 } yield (i, j)) ++
        Seq((1, 4), (2, 4), (3, 4))) // second K4 = {1,2,3,4}
    val r = CliquePerc.find(g, Seq(0))
    assert(r.get == Set(0, 1, 2, 3, 4))
  }
  test("clique percolation separates the barbell K5s at k=5") {
    val r = CliquePerc.find(barbell, Seq(2))
    assert(r.get == Set(0, 1, 2, 3, 4))
  }
  test("clique percolation on karate contains the query") {
    val r = CliquePerc.find(karate.graph, Seq(0))
    assert(r.isDefined && r.get.contains(0))
  }

  // ------------------------------------------------------------------ CNM
  test("CNM isolates the query-side K5 of the barbell") {
    val r = CNM.find(barbell, Seq(2))
    assert(r.get == Set(0, 1, 2, 3, 4), r.get.toSeq.sorted.toString)
  }
  test("CNM community contains all queries") {
    val r = CNM.find(karate.graph, Seq(0, 1))
    assert(r.isDefined && r.get.contains(0) && r.get.contains(1))
  }

  // ------------------------------------------------------------------- GN
  test("GN isolates the query-side K5 of the barbell") {
    val r = GN.find(barbell, Seq(7))
    assert(r.get == Set(5, 6, 7, 8, 9))
  }
  test("GN on karate returns a proper sub-community") {
    val r = GN.find(karate.graph, Seq(33))
    assert(r.isDefined && r.get.contains(33))
  }
  test("GN respects the time budget") {
    val gt = GraphGen.lfr(300, 10, 40, 0.3, 20, 80, seed = 3)
    val t0 = System.currentTimeMillis()
    val r = GN.find(gt.graph, Seq(0), budgetMs = 200)
    assert(System.currentTimeMillis() - t0 < 30000)
    assert(r.isDefined)
  }

  // ------------------------------------------------------------- icwi2008
  test("local modularity stays inside the barbell K5") {
    val r = LocalModularity.find(barbell, Seq(2))
    assert(r.get == Set(0, 1, 2, 3, 4))
  }
  test("local modularity contains the queries and is connected") {
    val r = LocalModularity.find(karate.graph, Seq(0, 2))
    assert(r.isDefined && Seq(0, 2).forall(r.get.contains))
    assert(karate.graph.isConnected(toBits(r.get)))
  }

  // ------------------------------------------------------------ huang2015
  test("closest truss community on the barbell is within the query K5") {
    val ctx = new GraphCtx(barbell)
    val r = ClosestTruss.find(ctx, Seq(2))
    assert(r.isDefined)
    assert(r.get.contains(2))
    assert(r.get.subsetOf(Set(0, 1, 2, 3, 4)))
  }
  test("closest truss community on karate") {
    val ctx = new GraphCtx(karate.graph)
    val r = ClosestTruss.find(ctx, Seq(0))
    assert(r.isDefined && r.get.contains(0))
    assert(karate.graph.isConnected(toBits(r.get)))
  }
  test("closest truss shrinks toward multiple queries") {
    val ctx = new GraphCtx(karate.graph)
    val r = ClosestTruss.find(ctx, Seq(0, 1))
    assert(r.isDefined && Seq(0, 1).forall(r.get.contains))
  }

  // --------------------------------------------------------------- wu2015
  test("query-biased density stays on the query side of the barbell") {
    val r = QueryBiased.find(barbell, Seq(2))
    assert(r.isDefined && r.get.contains(2))
    assert(r.get.subsetOf(Set(0, 1, 2, 3, 4, 5))) // bridge node may survive
  }
  test("query-biased density community is connected and contains queries") {
    val r = QueryBiased.find(karate.graph, Seq(0, 1))
    assert(r.isDefined && Seq(0, 1).forall(r.get.contains))
    assert(karate.graph.isConnected(toBits(r.get)))
  }
  test("query-biased fails across components") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (2, 3)))
    assert(QueryBiased.find(g, Seq(0, 2)).isEmpty)
  }
}
