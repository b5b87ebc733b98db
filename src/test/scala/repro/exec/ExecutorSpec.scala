package repro.exec

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core._
import repro.gen.WindowGen

/** End-to-end correctness of the rewriting: the hierarchical (min-cost WCG)
  * plan must return exactly the baseline plan's rows, for every aggregate,
  * on tumbling, hopping, and randomly generated window sets; and the
  * baseline itself is checked against DuckDB.
  */
class ExecutorSpec extends SparkSpec {

  private val ex1 = Seq(10L, 20L, 30L, 40L).map(Window.tumbling)
  private val ex7 = Seq(20L, 30L, 40L).map(Window.tumbling)

  private def events(n: Long = 3000, horizon: Long = 240, keys: Long = 4,
                     seed: Long = 7): DataFrame =
    SynthData.events(spark, n, horizon, keys, seed)

  /** Keyed rows: all columns except the trailing `value` form the key; the
    * value is compared with a tolerance (hierarchical AVG/SUM associate
    * float additions differently than the flat plan).
    */
  private def keyed(df: DataFrame): Map[String, Double] =
    df.collect().map { r =>
      val key = (0 until r.length - 1).map(i => String.valueOf(r.get(i))).mkString("|")
      key -> r.getDouble(r.length - 1)
    }.toMap

  private def assertSameResults(a: DataFrame, b: DataFrame, hint: String): Unit = {
    val (ka, kb) = (keyed(a), keyed(b))
    assert(ka.keySet == kb.keySet,
      s"$hint: ${ka.size} vs ${kb.size} rows; " +
        s"onlyA=${(ka.keySet -- kb.keySet).take(3)} onlyB=${(kb.keySet -- ka.keySet).take(3)}")
    ka.foreach { case (k, v) =>
      assert(math.abs(v - kb(k)) <= 1e-6 * math.max(1.0, math.abs(v)),
        s"$hint: value mismatch at $k: $v vs ${kb(k)}")
    }
  }

  private def checkPlanEquality(windows: Seq[Window], agg: AggSpec,
                                ev: DataFrame, withFactors: Boolean,
                                hint: String): Unit = {
    val plan =
      if (withFactors) FactorWindows.minCostPlanWithFactors(windows, agg.semantics, 100)
      else CostModel.minCostPlan(windows, agg.semantics, 100)
    val base = Executor.baseline(ev, windows, agg)
    val rew  = Executor.rewritten(ev, plan, agg)
    assertSameResults(base, rew, s"$hint (agg=${agg.name}, factors=$withFactors)")
  }

  // ---- oracle: the baseline itself is right ------------------------------

  private def oracleCheck(w: Window, agg: AggSpec, duckAgg: String): Unit = {
    val ev = events(1500, 120)
    val sparkDf = Executor
      .finish(Executor.subAggFromEvents(ev, w, agg), w, agg)
      .select(col("k"), col("wstart"), col("value"))
    val sql =
      s"""SELECT CAST(e.k AS BIGINT) AS k, ws.a AS wstart,
         |       CAST($duckAgg AS DOUBLE) AS value
         |FROM events e, (SELECT range AS a FROM range(0, 120, ${w.s})) ws
         |WHERE CAST(e.t AS BIGINT) >= ws.a AND CAST(e.t AS BIGINT) < ws.a + ${w.r}
         |GROUP BY 1, 2""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "events" -> ev)
  }

  test("oracle: tumbling MIN matches DuckDB")  { oracleCheck(Window(20, 20), AggSpec.Min,   "MIN(CAST(e.v AS DOUBLE))") }
  test("oracle: tumbling MAX matches DuckDB")  { oracleCheck(Window(30, 30), AggSpec.Max,   "MAX(CAST(e.v AS DOUBLE))") }
  test("oracle: hopping MIN matches DuckDB")   { oracleCheck(Window(20, 5),  AggSpec.Min,   "MIN(CAST(e.v AS DOUBLE))") }
  test("oracle: hopping SUM matches DuckDB")   { oracleCheck(Window(12, 4),  AggSpec.Sum,   "SUM(CAST(e.v AS DOUBLE))") }
  test("oracle: tumbling COUNT matches DuckDB"){ oracleCheck(Window(15, 15), AggSpec.Count, "COUNT(*)") }
  test("oracle: hopping AVG matches DuckDB")   { oracleCheck(Window(24, 8),  AggSpec.Avg,   "AVG(CAST(e.v AS DOUBLE))") }

  test("oracle: the rewritten Example-1 MIN plan matches DuckDB window-by-window") {
    val ev = events(1500, 120)
    val plan = CostModel.minCostPlan(ex1, Semantics.CoveredBy, 100)
    val rew = Executor.rewritten(ev, plan, AggSpec.Min)
    ex1.foreach { w =>
      val sparkDf = rew.filter(col("w_r") === w.r)
        .select(col("k"), col("wstart"), col("value"))
      val sql =
        s"""SELECT CAST(e.k AS BIGINT) AS k, ws.a AS wstart,
           |       CAST(MIN(CAST(e.v AS DOUBLE)) AS DOUBLE) AS value
           |FROM events e, (SELECT range AS a FROM range(0, 120, ${w.s})) ws
           |WHERE CAST(e.t AS BIGINT) >= ws.a AND CAST(e.t AS BIGINT) < ws.a + ${w.r}
           |GROUP BY 1, 2""".stripMargin
      Oracle.assertEquivalent(sparkDf, sql, "events" -> ev)
    }
  }

  // ---- baseline == rewritten on the worked examples -----------------------

  AggSpec.all.foreach { agg =>
    test(s"Example 1 windows: rewritten == baseline for ${agg.name}") {
      checkPlanEquality(ex1, agg, events(), withFactors = false, "Example 1")
    }
    test(s"Example 7 windows with factor windows: rewritten == baseline for ${agg.name}") {
      checkPlanEquality(ex7, agg, events(), withFactors = true, "Example 7")
    }
  }

  test("Example 7 factor plan really contains the factor window during execution") {
    val plan = FactorWindows.minCostPlanWithFactors(ex7, Semantics.CoveredBy, 100)
    assert(plan.factorWindows.contains(Window.tumbling(10)))
    val rew = Executor.rewritten(events(), plan, AggSpec.Min)
    // Factor window results must not leak into the output.
    assert(rew.select("w_r").distinct().collect().map(_.getLong(0)).toSet ==
      Set(20L, 30L, 40L))
  }

  // ---- hopping windows ----------------------------------------------------

  test("hopping coverage chain: rewritten == baseline for MIN") {
    // W(10,2) covered by W(8,2): the Example 2 pair, plus a deeper window.
    val ws = Seq(Window(8, 2), Window(10, 2), Window(14, 2))
    val plan = CostModel.minCostPlan(ws, Semantics.CoveredBy, 100)
    assert(plan.parent(Window(10, 2)).nonEmpty, "coverage edge should be used")
    checkPlanEquality(ws, AggSpec.Min, events(), withFactors = false, "hopping chain")
  }

  test("hopping windows partitioned by a tumbling base: all aggregates agree") {
    val ws = Seq(Window.tumbling(5), Window(20, 10), Window(30, 15))
    AggSpec.all.foreach { agg =>
      checkPlanEquality(ws, agg, events(), withFactors = false, "hopping over tumbling")
    }
  }

  test("hopping windows with factor windows: MIN and MAX agree") {
    val ws = Seq(Window(40, 10), Window(80, 20), Window(120, 40))
    Seq(AggSpec.Min, AggSpec.Max).foreach { agg =>
      checkPlanEquality(ws, agg, events(3000, 480), withFactors = true, "hopping FW")
    }
  }

  // ---- randomized window sets --------------------------------------------

  (1L to 6L).foreach { seed =>
    test(s"random window set (seed $seed): rewritten == baseline, all aggregates") {
      val ws = new WindowGen(seed, sMax = 6, kMax = 4).randomSet(4)
      val ev = events(2500, 200, keys = 3, seed = seed)
      AggSpec.all.foreach(agg =>
        checkPlanEquality(ws, agg, ev, withFactors = false, s"random seed=$seed"))
    }
  }

  (1L to 4L).foreach { seed =>
    test(s"random chain set (seed $seed): rewritten-with-factors == baseline") {
      val ws = new WindowGen(seed, sMax = 4, kMax = 3).chainSet(4)
      val ev = events(2500, 300, keys = 3, seed = seed + 50)
      Seq(AggSpec.Min, AggSpec.Sum, AggSpec.Avg).foreach(agg =>
        checkPlanEquality(ws, agg, ev, withFactors = true, s"chain seed=$seed"))
    }
  }

  (1L to 4L).foreach { seed =>
    test(s"random tumbling set (seed $seed): rewritten-with-factors == baseline") {
      val ws = new WindowGen(seed, sMax = 5, kMax = 4).randomTumblingSet(4)
      val ev = events(2500, 250, keys = 3, seed = seed + 90)
      Seq(AggSpec.Count, AggSpec.Min, AggSpec.Avg).foreach(agg =>
        checkPlanEquality(ws, agg, ev, withFactors = true, s"tumbling seed=$seed"))
    }
  }

  // ---- plan mechanics ------------------------------------------------------

  test("rewritten plan refuses a semantics mismatch") {
    val plan = CostModel.minCostPlan(ex1, Semantics.CoveredBy, 1)
    assertThrows[IllegalArgumentException](
      Executor.rewritten(events(), plan, AggSpec.Sum))
  }

  test("persistShared executes identically and caches shared nodes") {
    val plan = FactorWindows.minCostPlanWithFactors(ex7, Semantics.CoveredBy, 100)
    val ev = events()
    val a = Executor.rewritten(ev, plan, AggSpec.Min)
    val b = Executor.rewritten(ev, plan, AggSpec.Min, persistShared = true)
    assertSameResults(a, b, "persistShared")
    Executor.unpersistAll(ev)
  }

  test("output schema is (w_r, w_s, k, wstart, value)") {
    val df = Executor.baseline(events(500, 60), Seq(Window(10, 5)), AggSpec.Min)
    assert(df.columns.toSeq == Seq("w_r", "w_s", "k", "wstart", "value"))
  }

  test("every window instance with events appears exactly once per key") {
    val ev = events(2000, 120)
    val df = Executor.baseline(ev, ex1, AggSpec.Count)
    val dup = df.groupBy("w_r", "w_s", "k", "wstart").count().filter(col("count") > 1)
    assert(dup.isEmpty, "duplicate output rows")
  }

  test("COUNT totals are conserved across a partitioned hierarchy") {
    val ev = events(2000, 120)
    val plan = CostModel.minCostPlan(Seq(Window.tumbling(10), Window.tumbling(120)),
      Semantics.PartitionedBy, 1)
    val rew = Executor.rewritten(ev, plan, AggSpec.Count)
    val total = rew.filter(col("w_r") === 120 && col("wstart") === 0)
      .agg(sum("value")).collect()(0).getDouble(0)
    val expected = ev.filter(col("t") < 120).count().toDouble
    assert(total == expected)
  }

  test("events before any complete window still land in instance 0") {
    import spark.implicits._
    val ev = Seq((0L, 1L, 5.0), (1L, 1L, 3.0)).toDF("t", "k", "v")
    val df = Executor.baseline(ev, Seq(Window(10, 2)), AggSpec.Min)
    val row0 = df.filter($"wstart" === 0).collect()
    assert(row0.length == 1 && row0(0).getAs[Double]("value") == 3.0)
  }
}
