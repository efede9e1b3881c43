package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}
import scala.collection.mutable

/** Uses the paper's worked examples as test vectors. */
class ModularitySpec extends AnyFunSuite {

  // ---- Example 1 (Figure 1): |E|=26, community A is a 4-clique with two
  //      outgoing edges (l_A=6, d_A=14), A∪B has l=14, d=28, |C|=8.
  test("Example 1: classic modularity of A") {
    assert(math.abs(Modularity.cm(6, 14, 26) - 0.158284) < 1e-5)
  }
  test("Example 1: classic modularity of A∪B") {
    assert(math.abs(Modularity.cm(14, 28, 26) - 0.2485207) < 1e-6)
  }
  test("Example 2: density modularity of A") {
    assert(math.abs(Modularity.dm(6, 14, 4, 26) - 1.028846) < 1e-5)
  }
  test("Example 2: density modularity of A∪B") {
    assert(math.abs(Modularity.dm(14, 28, 8, 26) - 0.8076923) < 1e-6)
  }
  test("Example 1+2: CM prefers the merged community, DM prefers A") {
    assert(Modularity.cm(14, 28, 26) > Modularity.cm(6, 14, 26))
    assert(Modularity.dm(6, 14, 4, 26) > Modularity.dm(14, 28, 8, 26))
  }

  // ---- Example 3 (Figure 2): ring of 30 6-cliques, computed from the graph.
  private lazy val ring = GraphGen.ringOfCliques(30, 6)
  private def statsOf(nodes: Range): (Long, Long, Int) = {
    val s = mutable.BitSet.empty; nodes.foreach(s += _)
    (ring.edgeCount(s), ring.degreeSum(s), s.size)
  }

  test("ring graph has |V|=180 and |E|=480") {
    assert(ring.n == 180 && ring.m == 480)
  }
  test("Example 3: split community stats l=15, d=32") {
    val (l, d, n) = statsOf(0 until 6)
    assert(l == 15 && d == 32 && n == 6)
  }
  test("Example 3: merged community stats l=31, d=64") {
    val (l, d, n) = statsOf(0 until 12)
    assert(l == 31 && d == 64 && n == 12)
  }
  test("Example 3: classic modularity of merged = 0.06013889") {
    val (l, d, _) = statsOf(0 until 12)
    assert(math.abs(Modularity.cm(l, d, ring.m) - 0.06013889) < 1e-7)
  }
  test("Example 3: classic modularity of split = 0.03013889") {
    val (l, d, _) = statsOf(0 until 6)
    assert(math.abs(Modularity.cm(l, d, ring.m) - 0.03013889) < 1e-7)
  }
  test("Example 3: density modularity of merged = 2.405556") {
    val (l, d, n) = statsOf(0 until 12)
    assert(math.abs(Modularity.dm(l, d, n, ring.m) - 2.405556) < 1e-5)
  }
  test("Example 3: density modularity of split = 2.411111") {
    val (l, d, n) = statsOf(0 until 6)
    assert(math.abs(Modularity.dm(l, d, n, ring.m) - 2.411111) < 1e-5)
  }
  test("Example 3: CM suffers the resolution limit, DM does not") {
    val (lm, dm_, nm) = statsOf(0 until 12)
    val (ls, ds, ns) = statsOf(0 until 6)
    assert(Modularity.cm(lm, dm_, ring.m) > Modularity.cm(ls, ds, ring.m))
    assert(Modularity.dm(ls, ds, ns, ring.m) > Modularity.dm(lm, dm_, nm, ring.m))
  }

  // ---- gain and ratio
  test("gain prefers removing high-degree, weakly-attached nodes") {
    // same degree, fewer internal links => larger gain (cheaper to cut)
    assert(Modularity.gain(1, 10, 100, 50) > Modularity.gain(5, 10, 100, 50))
    // same links, higher global degree => larger gain
    assert(Modularity.gain(2, 20, 100, 50) > Modularity.gain(2, 5, 100, 50))
  }
  test("ratio matches definition and handles isolated nodes") {
    assert(Modularity.ratio(10, 2) == 5.0)
    assert(Modularity.ratio(3, 0).isPosInfinity)
  }
  test("gain formula equals the updated-DM comparison") {
    // removing the node with the larger Λ must yield the larger updated DM
    val mE = 200L; val lS = 50L; val dSsum = 120L; val size = 20L
    def updatedDm(k: Long, dv: Long): Double =
      Modularity.dm(lS - k, dSsum - dv, size - 1, mE)
    val candidates = Seq((1L, 4L), (3L, 9L), (2L, 14L), (5L, 5L))
    val byGain = candidates.maxBy { case (k, dv) => Modularity.gain(k, dv, dSsum, mE) }
    val byDm = candidates.maxBy { case (k, dv) => updatedDm(k, dv) }
    assert(byGain == byDm)
  }

  // ---- consistency of the convenience wrappers
  test("dmOf/cmOf/gmdOf agree with raw stats") {
    val g = GraphGen.karate.graph
    val s = mutable.BitSet(0, 1, 2, 3, 7)
    val (l, d) = Modularity.stats(g, s)
    assert(Modularity.dmOf(g, s) == Modularity.dm(l, d, s.size, g.m))
    assert(Modularity.cmOf(g, s) == Modularity.cm(l, d, g.m))
    assert(Modularity.gmdOf(g, s) == Modularity.gmd(l, d, s.size, g.m))
  }
  test("sum of per-community CM over a partition is the partition modularity") {
    val g = GraphGen.karate.graph
    val gt = GraphGen.karate
    val q = gt.communities.map { c =>
      val s = mutable.BitSet.empty; c.foreach(s += _)
      Modularity.cmOf(g, s)
    }.sum
    // the canonical two-faction modularity of karate is ~0.3715
    assert(math.abs(q - 0.3715) < 0.01, s"Q=$q")
  }
  test("gmd penalizes sparse communities") {
    // same CM stats, half the internal density => lower GMD
    assert(Modularity.gmd(10, 30, 6, 100) > Modularity.gmd(10, 30, 12, 100))
  }
}
