package repro.eval

import repro.core.{Semantics, Window}
import repro.gen.WindowGen

/** Shared harness that regenerates the evaluation figures' data as text
  * tables. Each figure of §5.3 becomes one table: rows are the ten
  * randomly-generated window sets, columns the five techniques' costs over
  * the common period. Used by both the bench suites and the spark-submit
  * jobs so the printed numbers are identical.
  */
object EvalHarness {

  val SetsPerExperiment = 10
  val WindowsPerSet     = 5
  val BaseSeed          = 20220513L // fixed → reproducible tables

  /** The window-set generators of §5.2, keyed as in the paper. */
  def generate(kind: String, seed: Long, n: Int = WindowsPerSet): Vector[Window] = {
    val g = new WindowGen(seed)
    kind match {
      case "random"          => g.randomSet(n)
      case "random-tumbling" => g.randomTumblingSet(n)
      case "chain"           => g.chainSet(n)
      case "chain-tumbling"  => g.chainTumblingSet(n)
      case "star"            => g.starSet(n)
      case "star-tumbling"   => g.starTumblingSet(n)
      // Fig. 15 setup: 3 levels of 2/4/6 windows (base 2, +2 per level).
      case "dag"             => g.dagSet(levels = 3, base = 2, delta = 2, p = 0.5)
      case other             => throw new IllegalArgumentException(s"unknown generator '$other'")
    }
  }

  /** Ten deterministic window sets for a generator kind. */
  def sets(kind: String): Seq[(String, Vector[Window])] =
    (1 to SetsPerExperiment).map(i => (s"set$i", generate(kind, BaseSeed + 1000L * i)))

  /** Run one experiment (one figure panel): all sets × all techniques. */
  def runExperiment(title: String, kind: String, semantics: Semantics,
                    eta: Long): String = {
    val rows = sets(kind).map { case (label, ws) =>
      (label, ws, Techniques.evaluate(ws, semantics, eta))
    }
    val sb = new StringBuilder
    sb ++= s"== $title  (generator=$kind, semantics=$semantics, eta=$eta) ==\n"
    sb ++= f"${"set"}%-6s ${"BL"}%14s ${"UP"}%14s ${"SP"}%14s ${"WCG"}%14s ${"WCG-FW"}%14s   windows\n"
    rows.foreach { case (label, ws, c) =>
      sb ++= f"$label%-6s ${c.bl}%14s ${c.up}%14s ${c.sp}%14s ${c.wcg}%14s ${c.wcgFw}%14s   ${ws.mkString(" ")}\n"
    }
    // Geometric-mean cost ratios vs BL — the "shape" statistic recorded in
    // EXPERIMENTS.md (the paper reports log-scale per-set bars).
    def geoMeanRatio(f: TechniqueCosts => BigInt): Double = {
      val logs = rows.map { case (_, _, c) =>
        math.log(f(c).doubleValue / c.bl.doubleValue)
      }
      math.exp(logs.sum / logs.size)
    }
    sb ++= f"geo-mean cost ratio vs BL:  UP=${geoMeanRatio(_.up)}%.4f  " +
      f"SP=${geoMeanRatio(_.sp)}%.4f  WCG=${geoMeanRatio(_.wcg)}%.4f  " +
      f"WCG-FW=${geoMeanRatio(_.wcgFw)}%.4f\n"
    sb.result()
  }
}
