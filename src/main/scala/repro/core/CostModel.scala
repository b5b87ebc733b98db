package repro.core

/** Number-theory helpers shared by the cost model and the slicing substrate. */
object NumberTheory {
  def gcd(a: BigInt, b: BigInt): BigInt = a.gcd(b)
  def lcm(a: BigInt, b: BigInt): BigInt = a / a.gcd(b) * b
  def lcmAll(xs: Iterable[BigInt]): BigInt = xs.foldLeft(BigInt(1))(lcm)
  def gcdAll(xs: Iterable[BigInt]): BigInt = xs.foldLeft(BigInt(0))(gcd)

  /** All positive divisors of `n`, ascending. */
  def divisors(n: Long): Seq[Long] = {
    require(n > 0)
    val small = (1L to math.sqrt(n.toDouble).toLong).filter(n % _ == 0)
    (small ++ small.map(n / _)).distinct.sorted
  }
}

/** The cost model of §3.2.1 and Algorithm 1 (§3.2.2).
  *
  * For a window set with hyper-period `R = lcm(r_i)` and steady event rate
  * `η`, window `W_i` fires `n_i = 1 + (R − r_i)/s_i` times per period
  * (Equation 1 / Figure 5). Computing an instance directly from the raw
  * stream costs `η·r_i` processed events; computing it from sub-aggregates
  * of an upstream window `W'` costs `M(W_i, W')` processed sub-aggregates
  * (Observation 1). Algorithm 1 keeps, per window, the incoming WCG edge of
  * minimum cost, yielding the min-cost WCG — a forest (Theorem 7).
  *
  * Cost accounting for roots follows the paper's worked Examples 6–8: a
  * window computed from the raw stream (equivalently, parented at the
  * virtual root S⟨1,1⟩ of the augmented WCG) costs `n_i·η·r_i`; see
  * DESIGN.md "Interpretation choices".
  */
object CostModel {

  /** Hyper-period `R = lcm(r_1, …, r_n)` of a window set. */
  def hyperPeriod(windows: Seq[Window]): BigInt =
    NumberTheory.lcmAll(windows.map(w => BigInt(w.r)))

  /** Recurrence count `n_i` (Equation 1) of `w` over period `R`. */
  def recurrenceCount(w: Window, bigR: BigInt): BigInt = {
    require((bigR - w.r) % w.s == 0,
      s"recurrence count of $w not integral over R=$bigR")
    1 + (bigR - w.r) / w.s
  }

  /** Cost of computing `w` from the raw stream: `n_w · η · r_w`. */
  def rootCost(w: Window, bigR: BigInt, eta: BigInt): BigInt =
    recurrenceCount(w, bigR) * eta * w.r

  /** Cost of computing `w` from sub-aggregates of its upstream `parent`:
    * `n_w · M(w, parent)` (Observation 1).
    */
  def edgeCost(w: Window, parent: Window, bigR: BigInt): BigInt =
    recurrenceCount(w, bigR) * w.multiplier(parent)

  /** Cost of `w` given an optional parent (None = raw stream). */
  def cost(w: Window, parent: Option[Window], bigR: BigInt, eta: BigInt): BigInt =
    parent.fold(rootCost(w, bigR, eta))(p => edgeCost(w, p, bigR))

  /** Baseline (BL) cost: every window computed directly from the stream. */
  def baselineCost(windows: Seq[Window], eta: BigInt): BigInt = {
    val bigR = hyperPeriod(windows)
    windows.map(rootCost(_, bigR, eta)).sum
  }

  /** Algorithm 1: the min-cost WCG over `user ∪ factor` windows, with the
    * hyper-period taken over the *user* windows (factor windows are
    * auxiliary; their ranges divide into the user hyper-period by
    * construction, see §4.2). Factor windows that end up feeding no other
    * window are pruned — they would add cost without being part of the
    * query result.
    */
  def minCostPlan(user: Seq[Window], factor: Seq[Window], semantics: Semantics,
                  eta: BigInt): WcgPlan = {
    require(eta >= 1, s"event rate must be >= 1, got $eta")
    val userV   = user.toVector.distinct
    val factorV = factor.toVector.distinct.filterNot(userV.contains)
    val bigR    = hyperPeriod(userV)
    val wcg     = Wcg(userV ++ factorV, semantics)

    // Lines 2–7 of Algorithm 1: per window, pick the cheapest incoming edge
    // (or the raw stream). Ties break deterministically toward the coarsest
    // parent (largest r, then largest s) so plans are reproducible.
    val parentOf: Map[Window, Option[Window]] = wcg.windows.map { w =>
      val viaRoot: (BigInt, Option[Window]) = (rootCost(w, bigR, eta), None)
      val viaEdges = wcg.parentsOf(w).map(p => (edgeCost(w, p, bigR), Some(p): Option[Window]))
      val best = (viaRoot +: viaEdges).minBy { case (c, p) =>
        (c, p.fold(Long.MaxValue)(-_.r), p.fold(Long.MaxValue)(-_.s))
      }
      w -> best._2
    }.toMap

    // Prune factor windows nobody reads from (iteratively: removing one may
    // orphan another factor window upstream of it).
    var alive = parentOf
    var changed = true
    while (changed) {
      val used = alive.values.flatten.toSet
      val dead = factorV.filter(f => alive.contains(f) && !used.contains(f))
      changed = dead.nonEmpty
      if (changed) {
        alive = (alive -- dead).map { case (w, p) =>
          w -> p.filterNot(dead.contains) // cannot happen (dead are leaves) but keep total
        }
      }
    }

    WcgPlan(userV, factorV.filter(alive.contains), alive, semantics, eta, bigR)
  }

  /** Algorithm 1 on the plain window set (no factor windows). */
  def minCostPlan(user: Seq[Window], semantics: Semantics, eta: BigInt): WcgPlan =
    minCostPlan(user, Nil, semantics, eta)
}

/** A min-cost WCG: the output of Algorithm 1 (and Algorithm 2). Each window
  * has at most one upstream parent (`None` = computed from the raw stream),
  * so the graph is a forest (Theorem 7). `factorWindows` are auxiliary
  * vertices whose results are not exposed to the user (§4).
  */
final case class WcgPlan(
    userWindows: Vector[Window],
    factorWindows: Vector[Window],
    parent: Map[Window, Option[Window]],
    semantics: Semantics,
    eta: BigInt,
    bigR: BigInt,
) {
  require((userWindows ++ factorWindows).forall(parent.contains),
    "every plan window needs a parent entry")

  /** All vertices of the forest (user + surviving factor windows). */
  def allWindows: Vector[Window] = userWindows ++ factorWindows

  /** Downstream consumers of `w` within the plan. */
  def childrenOf(w: Window): Vector[Window] =
    allWindows.filter(c => parent(c).contains(w))

  /** Windows computed directly from the raw stream. */
  def roots: Vector[Window] = allWindows.filter(parent(_).isEmpty)

  /** Per-window cost under the model of §3.2.1 / Observation 1. */
  def costOf(w: Window): BigInt = CostModel.cost(w, parent(w), bigR, eta)

  /** Total plan cost `C = Σ c_i`. */
  def totalCost: BigInt = allWindows.map(costOf).sum

  /** Vertices in dataflow (topological) order: parents before children. */
  def topological: Vector[Window] = {
    val remaining = scala.collection.mutable.LinkedHashSet(allWindows: _*)
    val out = Vector.newBuilder[Window]
    while (remaining.nonEmpty) {
      val ready = remaining.filter(w => parent(w).forall(p => !remaining.contains(p)))
      require(ready.nonEmpty, s"cycle in plan forest: $remaining")
      ready.foreach { w => out += w; remaining -= w }
    }
    out.result()
  }

  /** Forest sanity: no cycles, parents in-plan. Used by tests (Theorem 7). */
  def isForest: Boolean =
    scala.util.Try(topological).isSuccess &&
      parent.values.flatten.forall(allWindows.contains)
}
