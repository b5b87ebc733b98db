package repro.bench

import repro.SparkSpec
import repro.core.Window
import repro.eval.RuntimeHarness
import repro.exec.AggSpec

/** Wall-clock supporting experiment: the rewritten plans must return the
  * baseline's exact results (asserted inside the harness) on a ~SF 0.1
  * event stream, and the timings are printed for EXPERIMENTS.md. Timing
  * assertions are deliberately loose — absolute wall-clock is machine
  * noise; the analytic cost model is the paper's metric.
  */
class RuntimeBench extends SparkSpec {

  private val nEvents = 1000000L

  test("runtime: Example-1 tumbling windows, MIN") {
    val out = RuntimeHarness.run(spark, "Example-1 tumbling windows",
      Seq(10L, 20L, 30L, 40L).map(Window.tumbling), AggSpec.Min,
      nEvents, horizon = 1200)
    println(out)
  }

  test("runtime: Example-7 windows (factor window engaged), MIN") {
    val out = RuntimeHarness.run(spark, "Example-7 windows",
      Seq(20L, 30L, 40L).map(Window.tumbling), AggSpec.Min,
      nEvents, horizon = 1200)
    println(out)
    assert(out.contains("W(10,10)"), "factor window should appear in the plan")
  }

  test("runtime: hopping windows, MIN (baseline replicates events per instance)") {
    val out = RuntimeHarness.run(spark, "hopping windows",
      Seq(Window(40, 10), Window(80, 20), Window(120, 40)), AggSpec.Min,
      nEvents, horizon = 2400)
    println(out)
  }

  test("runtime: SUM under partitioned-by semantics") {
    val out = RuntimeHarness.run(spark, "tumbling SUM",
      Seq(15L, 30L, 60L, 120L).map(Window.tumbling), AggSpec.Sum,
      nEvents, horizon = 1200)
    println(out)
  }
}
