package repro.eval

/** Accuracy metrics for community search, computed exactly as the paper
  * evaluates: the found community and the ground-truth community are both
  * treated as binary labelings of V (member / non-member), then NMI, ARI,
  * and F-score are computed between the two 2-cluster partitions.
  */
object Metrics {

  private def log2(x: Double): Double = math.log(x) / math.log(2.0)

  /** Normalized mutual information of the binary partitions. */
  def nmi(n: Int, found: Set[Int], truth: Set[Int]): Double = {
    require(n > 0)
    val a = (found intersect truth).size.toDouble
    val b = (found diff truth).size.toDouble
    val c = (truth diff found).size.toDouble
    val d = n - a - b - c
    val joint = Seq(a, b, c, d).map(_ / n)
    val px = Seq((a + b) / n, (c + d) / n)
    val py = Seq((a + c) / n, (b + d) / n)
    def h(p: Seq[Double]): Double = -p.filter(_ > 0).map(x => x * log2(x)).sum
    val hx = h(px); val hy = h(py)
    var i = 0.0
    val pxy = Seq((0, 0, a / n), (0, 1, b / n), (1, 0, c / n), (1, 1, d / n))
    pxy.foreach { case (xi, yi, p) =>
      if (p > 0 && px(xi) > 0 && py(yi) > 0) i += p * log2(p / (px(xi) * py(yi)))
    }
    if (hx + hy == 0) { if (found == truth) 1.0 else 0.0 }
    else math.max(0.0, 2.0 * i / (hx + hy))
  }

  /** Adjusted Rand index of the binary partitions. */
  def ari(n: Int, found: Set[Int], truth: Set[Int]): Double = {
    val a = (found intersect truth).size.toLong
    val b = (found diff truth).size.toLong
    val c = (truth diff found).size.toLong
    val d = n - a - b - c
    def c2(x: Long): Double = x.toDouble * (x - 1) / 2.0
    val index = c2(a) + c2(b) + c2(c) + c2(d)
    val rowS = c2(a + b) + c2(c + d)
    val colS = c2(a + c) + c2(b + d)
    val total = c2(n.toLong)
    if (total == 0) return if (found == truth) 1.0 else 0.0
    val expected = rowS * colS / total
    val maxIdx = (rowS + colS) / 2.0
    if (maxIdx == expected) { if (found == truth) 1.0 else 0.0 }
    else (index - expected) / (maxIdx - expected)
  }

  /** F-score treating membership as the positive class. */
  def f1(found: Set[Int], truth: Set[Int]): Double = {
    val tp = (found intersect truth).size.toDouble
    if (found.isEmpty || truth.isEmpty || tp == 0) return 0.0
    val p = tp / found.size
    val r = tp / truth.size
    2 * p * r / (p + r)
  }

  def median(xs: Seq[Double]): Double = {
    if (xs.isEmpty) return Double.NaN
    val s = xs.sorted
    val k = s.length
    if (k % 2 == 1) s(k / 2) else (s(k / 2 - 1) + s(k / 2)) / 2.0
  }

  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) Double.NaN else xs.sum / xs.length
}
