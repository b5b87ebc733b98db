package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.Window
import repro.eval.RuntimeHarness
import repro.exec.AggSpec

/** Wall-clock supporting experiment (spark-submit entrypoint): execute the
  * baseline and rewritten plans on a synthetic event stream and time them.
  */
object RuntimeJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-runtime")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val nEvents = args.headOption.map(_.toLong).getOrElse(2000000L)
      println(RuntimeHarness.run(spark, "Example-1 tumbling windows",
        Seq(10L, 20L, 30L, 40L).map(Window.tumbling), AggSpec.Min,
        nEvents, horizon = 1200))
      println(RuntimeHarness.run(spark, "Example-7 windows (factor window kicks in)",
        Seq(20L, 30L, 40L).map(Window.tumbling), AggSpec.Min,
        nEvents, horizon = 1200))
      println(RuntimeHarness.run(spark, "hopping windows",
        Seq(Window(40, 10), Window(80, 20), Window(120, 40)), AggSpec.Min,
        nEvents, horizon = 2400))
    } finally spark.stop()
  }
}
