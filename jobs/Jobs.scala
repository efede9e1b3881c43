package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.Experiments

/** spark-submit entrypoints, one per evaluation table (DESIGN.md §5).
  * Example:
  *   spark-submit --class repro.jobs.F8Effectiveness target/scala-2.13/repro_*.jar
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

object Table1Datasets {
  def main(args: Array[String]): Unit = println(Experiments.table1())
}

object Table2Lfr {
  def main(args: Array[String]): Unit = println(Experiments.table2())
}

object F8Effectiveness {
  def main(args: Array[String]): Unit = println(Experiments.syntheticSweep())
}

object F10QuerySize {
  def main(args: Array[String]): Unit = println(Experiments.querySetSize())
}

object F11Scalability {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("f11-scalability")
    try println(Experiments.scalability(spark)) finally spark.stop()
  }
}

object F12ModularityMeasures {
  def main(args: Array[String]): Unit = println(Experiments.modularityMeasures())
}

object F13Pruning {
  def main(args: Array[String]): Unit = println(Experiments.pruning())
}

object F14Variants {
  def main(args: Array[String]): Unit = println(Experiments.variants())
}

object F15RealSmall {
  def main(args: Array[String]): Unit = println(Experiments.smallRealWorld())
}

object F17RealOverlap {
  def main(args: Array[String]): Unit = println(Experiments.overlappingRealWorld())
}

object F19VaryK {
  def main(args: Array[String]): Unit = println(Experiments.varyK())
}

object CaseStudy {
  def main(args: Array[String]): Unit = println(Experiments.caseStudy())
}
