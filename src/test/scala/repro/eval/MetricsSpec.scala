package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MetricsSpec extends AnyFunSuite {

  test("identical communities score 1 on all metrics") {
    val c = Set(1, 2, 3, 4)
    assert(Metrics.nmi(10, c, c) == 1.0)
    assert(Metrics.ari(10, c, c) == 1.0)
    assert(Metrics.f1(c, c) == 1.0)
  }

  test("complementary split scores 1 on NMI (partitions identical)") {
    // found = complement of truth => same binary partition, clusters swapped
    val t = Set(0, 1, 2)
    val f = Set(3, 4, 5)
    assert(math.abs(Metrics.nmi(6, f, t) - 1.0) < 1e-9)
  }

  test("disjoint communities score 0 on F1") {
    assert(Metrics.f1(Set(1, 2), Set(3, 4)) == 0.0)
  }

  test("F1 hand example") {
    val f = Set(0, 1, 2, 3, 4)
    val t = Set(0, 1, 2, 3, 5)
    assert(math.abs(Metrics.f1(f, t) - 0.8) < 1e-9)
  }

  test("NMI/ARI symmetry in (found, truth)") {
    val f = Set(0, 1, 2, 5)
    val t = Set(0, 1, 3)
    assert(math.abs(Metrics.nmi(8, f, t) - Metrics.nmi(8, t, f)) < 1e-12)
    assert(math.abs(Metrics.ari(8, f, t) - Metrics.ari(8, t, f)) < 1e-12)
  }

  test("NMI is within [0,1]") {
    val rnd = new Random(7)
    (1 to 20).foreach { _ =>
      val f = (0 until 20).filter(_ => rnd.nextBoolean()).toSet
      val t = (0 until 20).filter(_ => rnd.nextBoolean()).toSet
      if (f.nonEmpty && t.nonEmpty) {
        val x = Metrics.nmi(20, f, t)
        assert(x >= 0.0 && x <= 1.0 + 1e-12)
      }
    }
  }

  test("ARI of independent random splits is near 0") {
    val rnd = new Random(11)
    val n = 2000
    val f = (0 until n).filter(_ => rnd.nextBoolean()).toSet
    val t = (0 until n).filter(_ => rnd.nextBoolean()).toSet
    assert(math.abs(Metrics.ari(n, f, t)) < 0.1)
  }

  test("NMI of independent random splits is near 0") {
    val rnd = new Random(13)
    val n = 2000
    val f = (0 until n).filter(_ => rnd.nextBoolean()).toSet
    val t = (0 until n).filter(_ => rnd.nextBoolean()).toSet
    assert(Metrics.nmi(n, f, t) < 0.05)
  }

  test("better overlap gives higher scores (monotonicity spot-check)") {
    val t = (0 until 50).toSet
    val good = (0 until 45).toSet
    val bad = (0 until 20).toSet ++ (60 until 80).toSet
    assert(Metrics.nmi(200, good, t) > Metrics.nmi(200, bad, t))
    assert(Metrics.ari(200, good, t) > Metrics.ari(200, bad, t))
    assert(Metrics.f1(good, t) > Metrics.f1(bad, t))
  }

  test("whole-graph community scores low against a small truth") {
    val t = (0 until 20).toSet
    val f = (0 until 1000).toSet
    assert(Metrics.nmi(1000, f, t) < 0.05)
    assert(Metrics.f1(f, t) < 0.1)
  }

  test("known 2x2 contingency ARI value") {
    // n=6: found={0,1,2}, truth={0,1,3}: a=2,b=1,c=1,d=2
    // index=2*C(2,2)+2*C(1,2)=2 ; rows=C(3,2)*2=6; cols=6; total=C(6,2)=15
    // exp=6*6/15=2.4 ; max=6 ; ari=(2-2.4)/(6-2.4)=-0.1111
    val v = Metrics.ari(6, Set(0, 1, 2), Set(0, 1, 3))
    assert(math.abs(v - (-1.0 / 9.0)) < 1e-9)
  }

  test("known 2x2 contingency NMI value") {
    // n=4: found={0,1}, truth={0,2}: a=1,b=1,c=1,d=1 -> I = 0 exactly
    assert(math.abs(Metrics.nmi(4, Set(0, 1), Set(0, 2))) < 1e-12)
  }

  test("median of odd and even lists") {
    assert(Metrics.median(Seq(3, 1, 2).map(_.toDouble)) == 2.0)
    assert(Metrics.median(Seq(4, 1, 2, 3).map(_.toDouble)) == 2.5)
    assert(Metrics.median(Seq()).isNaN)
  }

  test("mean") {
    assert(Metrics.mean(Seq(1.0, 2.0, 3.0)) == 2.0)
    assert(Metrics.mean(Seq()).isNaN)
  }
}
