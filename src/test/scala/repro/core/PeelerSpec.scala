package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}
import scala.collection.mutable
import scala.util.Random

class PeelerSpec extends AnyFunSuite {

  private def toBits(s: Set[Int]): mutable.BitSet = {
    val b = mutable.BitSet.empty; s.foreach(b += _); b
  }
  private def randomConnected(n: Int, p: Double, seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    // random tree backbone guarantees connectivity, then extra edges
    (1 until n).foreach(i => es += ((rnd.nextInt(i), i)))
    for (i <- 0 until n; j <- i + 1 until n if rnd.nextDouble() < p) es += ((i, j))
    LocalGraph.fromEdges(n, es.toSeq)
  }

  // ------------------------------------------------ ring-of-cliques behavior
  test("FPA on the ring of cliques returns exactly the query's 6-clique") {
    val g = GraphGen.ringOfCliques(30, 6)
    val r = Peeler.fpa(g, Seq(14)) // interior node of clique 2 (nodes 12..17)
    assert(r.ok)
    assert(r.community == (12 until 18).toSet, r.community.toSeq.sorted.toString)
    assert(math.abs(r.score - 2.411111) < 1e-5)
  }
  test("FPA without pruning also resolves the 6-clique") {
    val g = GraphGen.ringOfCliques(30, 6)
    val r = Peeler.fpaNoPrune(g, Seq(14))
    assert(r.ok && r.community == (12 until 18).toSet)
  }
  test("FPA-DMG resolves the 6-clique as well") {
    val g = GraphGen.ringOfCliques(30, 6)
    val r = Peeler.fpaDMG(g, Seq(14))
    assert(r.ok && r.community == (12 until 18).toSet)
  }

  // ------------------------------------------------------------- karate
  test("FPA on karate finds a sub-faction community containing the query") {
    val gt = GraphGen.karate
    val r = Peeler.fpa(gt.graph, Seq(0))
    assert(r.ok && r.community.contains(0))
    assert(r.community.size < 34, "must not return the whole graph")
    val overlap = (r.community intersect gt.communities(0)).size.toDouble / r.community.size
    assert(overlap > 0.5, s"community=${r.community.toSeq.sorted}")
  }
  test("NCA on karate returns a valid connected community") {
    val gt = GraphGen.karate
    val r = Peeler.nca(gt.graph, Seq(33))
    assert(r.ok && r.community.contains(33))
    assert(gt.graph.isConnected(toBits(r.community)))
  }

  // -------------------------------------------------- failure / edge cases
  test("queries in different components fail gracefully") {
    val g = LocalGraph.fromEdges(6, Seq((0, 1), (2, 3)))
    val r = Peeler.fpa(g, Seq(0, 2))
    assert(!r.ok)
  }
  test("invalid query id is rejected") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1)))
    intercept[IllegalArgumentException](Peeler.fpa(g, Seq(7)))
    intercept[IllegalArgumentException](Peeler.fpa(g, Seq.empty))
  }
  test("singleton component: community is the query itself") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1)))
    val r = Peeler.fpa(g, Seq(3))
    assert(r.ok && r.community == Set(3))
  }
  test("a clique stays intact under every variant") {
    val g = LocalGraph.fromEdges(5, for { i <- 0 until 5; j <- i + 1 until 5 } yield (i, j))
    for (r <- Seq(Peeler.fpa(g, Seq(0)), Peeler.nca(g, Seq(0)), Peeler.ncaDR(g, Seq(0)),
      Peeler.fpaDMG(g, Seq(0)), Peeler.fpaNoPrune(g, Seq(0)))) {
      assert(r.ok && r.community == (0 until 5).toSet)
    }
  }

  // ------------------------------------------- invariants on random graphs
  private val variants: Seq[(String, (LocalGraph, Seq[Int]) => Peeler.Result)] = Seq(
    ("NCA", (g, q) => Peeler.nca(g, q)),
    ("NCA-DR", (g, q) => Peeler.ncaDR(g, q)),
    ("FPA", (g, q) => Peeler.fpa(g, q)),
    ("FPA-DMG", (g, q) => Peeler.fpaDMG(g, q)),
    ("FPA-noprune", (g, q) => Peeler.fpaNoPrune(g, q)))

  for (seed <- 1 to 6; (name, algo) <- variants) {
    test(s"$name invariants on random graph seed=$seed") {
      val g = randomConnected(60, 0.05, seed)
      val rnd = new Random(seed * 31)
      val q = Seq(rnd.nextInt(60))
      val r = algo(g, q)
      assert(r.ok)
      assert(q.forall(r.community.contains), "community must contain the queries")
      assert(g.isConnected(toBits(r.community)), "community must be connected")
      // the reported score must equal DM recomputed from scratch
      assert(math.abs(r.score - Modularity.dmOf(g, toBits(r.community))) < 1e-9,
        "incremental DM bookkeeping must match recomputation")
    }
  }

  for (seed <- 1 to 4; (name, algo) <- variants) {
    test(s"$name multi-query invariants seed=$seed") {
      val g = randomConnected(80, 0.04, seed + 77)
      val rnd = new Random(seed * 17)
      val q = Seq.fill(3)(rnd.nextInt(80)).distinct
      val r = algo(g, q)
      assert(r.ok)
      assert(q.forall(r.community.contains))
      assert(g.isConnected(toBits(r.community)))
    }
  }

  test("FPA best intermediate beats (or ties) the full component DM") {
    val g = randomConnected(100, 0.05, 5)
    val comp = g.componentOf(7)
    val r = Peeler.fpa(g, Seq(7))
    assert(r.score >= Modularity.dmOf(g, comp) - 1e-12)
  }

  test("NCA result is no worse than the full component DM") {
    val g = randomConnected(60, 0.06, 9)
    val comp = g.componentOf(3)
    val r = Peeler.nca(g, Seq(3))
    assert(r.score >= Modularity.dmOf(g, comp) - 1e-12)
  }

  test("objective=CM tracks classic modularity of the returned community") {
    val g = randomConnected(60, 0.06, 12)
    val r = Peeler.fpa(g, Seq(0), Peeler.CmObjective)
    assert(math.abs(r.score - Modularity.cmOf(g, toBits(r.community))) < 1e-9)
  }
  test("objective=GMD tracks generalized modularity density") {
    val g = randomConnected(60, 0.06, 13)
    val r = Peeler.fpa(g, Seq(0), Peeler.GmdObjective)
    assert(math.abs(r.score - Modularity.gmdOf(g, toBits(r.community))) < 1e-9)
  }

  test("determinism: same input, same output") {
    val g = randomConnected(70, 0.05, 21)
    val a = Peeler.fpa(g, Seq(5)); val b = Peeler.fpa(g, Seq(5))
    assert(a.community == b.community && a.score == b.score)
    val c = Peeler.nca(g, Seq(5)); val d = Peeler.nca(g, Seq(5))
    assert(c.community == d.community)
  }

  test("FPA on LFR recovers the planted community reasonably") {
    val gt = GraphGen.lfr(400, 12, 50, 0.25, 20, 80, seed = 31)
    val comm = gt.communities.maxBy(_.size)
    val q = comm.head
    val r = Peeler.fpa(gt.graph, Seq(q))
    val f1 = repro.eval.Metrics.f1(r.community, comm)
    assert(f1 > 0.3, s"f1=$f1 size=${r.community.size} truth=${comm.size}")
  }

  test("protected Steiner path keeps multi-query communities connected in FPA") {
    // path graph: queries at the two ends; FPA must keep the whole path
    val g = LocalGraph.fromEdges(7, (0 until 6).map(i => (i, i + 1)))
    val r = Peeler.fpa(g, Seq(0, 6))
    assert(r.ok && (0 to 6).forall(r.community.contains))
  }
}
