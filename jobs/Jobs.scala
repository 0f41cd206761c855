package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness._

/** Shared session builder for the spark-submit entrypoints. */
object JobSession {
  def make(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def scaleArg(args: Array[String], default: Double): Double =
    args.headOption.map(_.toDouble).getOrElse(default)
}

/** Table I — dataset summary. Usage: Table1Job [scale]. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("inferturbo-table1")
    try println(Table1Harness.run(spark, JobSession.scaleArg(args, 1.0)))
    finally spark.stop()
  }
}

/** Table II — prediction performance across pipelines. Usage: Table2Job [epochs]. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("inferturbo-table2")
    val cfg = Table2Harness.Config(epochs = args.headOption.map(_.toInt).getOrElse(20))
    try println(Table2Harness.run(spark, cfg))
    finally spark.stop()
  }
}

/** Table III — time/resource across systems. Usage: Table3Job [magScale]. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("inferturbo-table3")
    val cfg = Table3Harness.Config(magScale = JobSession.scaleArg(args, 0.5))
    try println(Table3Harness.run(spark, cfg))
    finally spark.stop()
  }
}

/** Table IV — time/resource vs hops. Usage: Table4Job [magScale]. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("inferturbo-table4")
    val cfg = Table4Harness.Config(magScale = JobSession.scaleArg(args, 0.5))
    try println(Table4Harness.run(spark, cfg))
    finally spark.stop()
  }
}

/** Strategy studies (partial-gather / broadcast / shadow-nodes IO effects). */
object StrategiesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.make("inferturbo-strategies")
    val cfg = StrategiesHarness.Config(
      nNodes = args.headOption.map(_.toLong).getOrElse(20000L))
    try println(StrategiesHarness.run(spark, cfg))
    finally spark.stop()
  }
}
