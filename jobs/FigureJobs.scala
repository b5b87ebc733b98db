package repro.jobs

import repro.core.Semantics
import repro.eval.EvalHarness

/** spark-submit entrypoints, one per evaluation figure. The figure
  * experiments are analytic-cost comparisons (as in the paper), so these
  * mains need no SparkSession; they are jobs so every reproduced artifact
  * has a uniform `spark-submit --class repro.jobs.<Name>` entrypoint.
  */
object Fig11Job {
  /** Figure 11: RandomGen, general windows, η ∈ {1, 10, 100}. */
  def main(args: Array[String]): Unit =
    Seq(1L, 10L, 100L).foreach(eta => println(EvalHarness.runExperiment(
      s"Figure 11 (eta=$eta)", "random", Semantics.CoveredBy, eta)))
}

object Fig12Job {
  /** Figure 12: RandomGen, tumbling windows, η ∈ {1, 10, 100}. */
  def main(args: Array[String]): Unit =
    Seq(1L, 10L, 100L).foreach(eta => println(EvalHarness.runExperiment(
      s"Figure 12 (eta=$eta)", "random-tumbling", Semantics.PartitionedBy, eta)))
}

object Fig13Job {
  /** Figure 13: ChainGen, general (a) and tumbling (b), η = 100. */
  def main(args: Array[String]): Unit = {
    println(EvalHarness.runExperiment("Figure 13(a)", "chain", Semantics.CoveredBy, 100))
    println(EvalHarness.runExperiment("Figure 13(b)", "chain-tumbling", Semantics.PartitionedBy, 100))
  }
}

object Fig14Job {
  /** Figure 14: StarGen, general (a) and tumbling (b), η = 100. */
  def main(args: Array[String]): Unit = {
    println(EvalHarness.runExperiment("Figure 14(a)", "star", Semantics.CoveredBy, 100))
    println(EvalHarness.runExperiment("Figure 14(b)", "star-tumbling", Semantics.PartitionedBy, 100))
  }
}

object Fig15Job {
  /** Figure 15: RandomGraphGen (3 levels, 2/4/6 windows), η = 100. */
  def main(args: Array[String]): Unit =
    println(EvalHarness.runExperiment("Figure 15", "dag", Semantics.CoveredBy, 100))
}
