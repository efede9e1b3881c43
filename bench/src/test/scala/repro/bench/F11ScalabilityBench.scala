package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Fig 11: scalability of FPA (local and Spark), NCA, kc, highcore as the
  * graph grows 10k → 100k nodes.
  */
class F11ScalabilityBench extends SparkSpec {
  test("Fig 11: scalability") {
    val t = Experiments.scalability(spark,
      sizes = Seq(10000, 25000, 50000, 100000), ncaUpTo = 10000)
    println(t)
    assert(t.contains("100000"))
  }
}
