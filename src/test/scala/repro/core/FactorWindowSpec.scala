package repro.core

import org.scalatest.funsuite.AnyFunSuite

class FactorWindowSpec extends AnyFunSuite with SeededProps {

  private val ex7 = Seq(20L, 30L, 40L).map(Window.tumbling) // Example 7
  private val w10 = Window.tumbling(10)

  // ---- Example 7: the headline factor-window result ----------------------

  test("Example 7: Algorithm 2 re-introduces W(10,10) and reaches cost 150") {
    val plan = FactorWindows.minCostPlanWithFactors(ex7, Semantics.PartitionedBy, 1)
    assert(plan.factorWindows == Vector(w10))
    assert(plan.totalCost == 150)
  }

  test("Example 7 under covered-by semantics reaches the same 150") {
    val plan = FactorWindows.minCostPlanWithFactors(ex7, Semantics.CoveredBy, 1)
    assert(plan.totalCost == 150)
    assert(plan.factorWindows.contains(w10))
  }

  test("Example 7 plan wiring: W2, W3 read W(10,10); W4 reads W2") {
    val Seq(w2, w3, w4) = ex7
    val plan = FactorWindows.minCostPlanWithFactors(ex7, Semantics.PartitionedBy, 1)
    assert(plan.parent(w10).isEmpty)
    assert(plan.parent(w2).contains(w10))
    assert(plan.parent(w3).contains(w10))
    assert(plan.parent(w4).contains(w2))
  }

  test("Example 7: factor windows cut 39% off the factor-free optimum (246 -> 150)") {
    val plain = CostModel.minCostPlan(ex7, Semantics.PartitionedBy, 1)
    assert(plain.totalCost == 246)
    val withF = FactorWindows.minCostPlanWithFactors(ex7, Semantics.PartitionedBy, 1)
    assert(withF.totalCost * 100 / plain.totalCost == 60) // 150/246 ≈ 61%
  }

  // ---- Example 8: candidate generation, pruning, selection ----------------

  test("Example 8: Algorithm 4 candidates for the virtual root are {2,5,10}") {
    val bigR = CostModel.hyperPeriod(ex7)
    // downstream of S in the augmented WCG: W2(20,20), W3(30,30) (W4 is
    // covered by W2 and so has an incoming edge already).
    val downstream = Seq(Window.tumbling(20), Window.tumbling(30))
    val d = NumberTheory.gcdAll(downstream.map(w => BigInt(w.r)))
    assert(d == 10)
    val eligible = NumberTheory.divisors(10).filter(_ > 1).map(Window.tumbling)
    assert(eligible.toSet == Set(Window.tumbling(2), Window.tumbling(5), w10))
    eligible.foreach(wf =>
      assert(FactorWindows.algorithm3WouldHelp(wf, Window.virtualRoot, downstream, bigR),
        s"$wf should be beneficial (K=2)"))
  }

  test("Example 8: dependent pruning keeps W(10,10), drops W(5,5) and W(2,2)") {
    val bigR = CostModel.hyperPeriod(ex7)
    val downstream = Seq(Window.tumbling(20), Window.tumbling(30))
    val best = FactorWindows.algorithm4Best(None, downstream, ex7.toSet, bigR, 1)
    assert(best.contains(w10))
  }

  test("Example 8 footnote: candidate benefits 240/168 locally, 150 full-plan") {
    // The footnote's (1)/(2) are the local Figure-9 pattern costs over
    // {S, W_f, W2, W3} (without-factor local cost: 120 + 120 = 240); its
    // (3) quotes the full-plan total 150 for W(10,10).
    val bigR = CostModel.hyperPeriod(ex7)
    val downstream = Seq(Window.tumbling(20), Window.tumbling(30))
    def localWith(rf: Long): BigInt =
      FactorWindows.delta(Window.tumbling(rf), None, downstream, bigR, 1) + 240
    assert(localWith(2) == 240)  // "(1) W(2,2) leads to the same cost 240"
    assert(localWith(5) == 168)  // "(2) W(5,5) leads to the cost 168"
    assert(localWith(10) == 144) // pattern-local; full plan below gives 150

    // Full-plan totals when forcing each candidate as the only factor window.
    def totalWith(rf: Long): BigInt =
      CostModel.minCostPlan(ex7, Seq(Window.tumbling(rf)), Semantics.PartitionedBy, 1).totalCost
    assert(totalWith(2) == 246)  // no better than the factor-free 246
    assert(totalWith(5) == 174)
    assert(totalWith(10) == 150) // "(3) W(10,10) ... the cost 150"
  }

  // ---- Equation 2/3: exact benefit ---------------------------------------

  test("delta is the exact plan-cost difference for the Figure 9 pattern") {
    val bigR = CostModel.hyperPeriod(ex7)
    val downstream = Seq(Window.tumbling(20), Window.tumbling(30))
    Seq(2L, 5L, 10L).foreach { rf =>
      val wf = Window.tumbling(rf)
      val d = FactorWindows.delta(wf, None, downstream, bigR, 1)
      val without = downstream.map(CostModel.rootCost(_, bigR, 1)).sum
      val withF = downstream.map(CostModel.edgeCost(_, wf, bigR)).sum +
        CostModel.rootCost(wf, bigR, 1)
      assert(d == withF - without)
      assert(d <= 0, s"$wf should not hurt (Algorithm 3 says K=2 helps)")
    }
    // W(2,2) is exactly break-even (the footnote's "same cost"); the larger
    // factors strictly help.
    assert(FactorWindows.delta(Window.tumbling(2), None, downstream, bigR, 1) == 0)
    assert(FactorWindows.delta(Window.tumbling(5), None, downstream, bigR, 1) == -72)
    assert(FactorWindows.delta(w10, None, downstream, bigR, 1) == -96)
  }

  test("delta for a real (non-root) target uses sub-aggregate costs") {
    // Insert W(20,20) between W(10,10) and W(40,40).
    val bigR = BigInt(120)
    val d = FactorWindows.delta(Window.tumbling(20), Some(w10),
      Seq(Window.tumbling(40)), bigR, 1)
    // with: n4*M(40,20) + n20*M(20,10) = 3*2 + 6*2 = 18; without: n4*M(40,10)=12.
    assert(d == 6)
  }

  // ---- Algorithm 3 -------------------------------------------------------

  test("Algorithm 3: K >= 2 is always beneficial") {
    val bigR = BigInt(240)
    assert(FactorWindows.algorithm3WouldHelp(Window.tumbling(4), Window.tumbling(2),
      Seq(Window.tumbling(12), Window.tumbling(16)), bigR))
  }

  test("Algorithm 3 Case 1: K=1 with tumbling downstream never helps") {
    val bigR = BigInt(240)
    assert(!FactorWindows.algorithm3WouldHelp(Window.tumbling(4), Window.tumbling(2),
      Seq(Window.tumbling(16)), bigR))
  }

  test("Algorithm 3: K=1 hopping downstream with k1>=3, m1>=3 helps") {
    // W1(12,4): k1=3; R=48 -> m1=4.
    assert(FactorWindows.algorithm3WouldHelp(Window.tumbling(4), Window.tumbling(2),
      Seq(Window(12, 4)), BigInt(48)))
  }

  test("Algorithm 3 rejects non-tumbling inputs") {
    assertThrows[IllegalArgumentException](
      FactorWindows.algorithm3WouldHelp(Window(4, 2), Window.tumbling(2),
        Seq(Window.tumbling(8)), BigInt(16)))
  }

  test("Theorem 8: Algorithm 3 decision equals the sign of the exact delta (eta=1)") {
    // Enumerate tumbling targets, tumbling factor candidates, and a single
    // downstream hopping/tumbling window; compare against exact Δ <= 0.
    for {
      rw <- Seq(1L, 2L, 3L)
      rf <- Seq(2L, 3L, 4L, 6L, 12L) if rf % rw == 0 && rf > rw
      k1 <- 1L to 4L
      s1 <- Seq(rf, 2 * rf) // downstream slide multiple of rf
      w1 = Window(k1 * s1, s1)
      if w1.r > rf && w1.partitionedBy(Window.tumbling(rf)) &&
        Window.tumbling(rf).partitionedBy(Window.tumbling(rw))
      mult <- Seq(1L, 2L, 3L)
      bigR = BigInt(w1.r) * mult
    } {
      val wf = Window.tumbling(rf)
      val tw = Window.tumbling(rw)
      val target = if (rw == 1) None else Some(tw)
      val alg3 = FactorWindows.algorithm3WouldHelp(wf, tw, Seq(w1), bigR)
      val d = FactorWindows.delta(wf, target, Seq(w1), bigR, 1)
      assert(alg3 == (d <= 0),
        s"Alg3=$alg3 but delta=$d for wf=$wf tw=$tw w1=$w1 R=$bigR")
    }
  }

  // ---- Theorem 9 ----------------------------------------------------------

  test("Theorem 9 inequality agrees with exact local-cost comparison") {
    val downstreams = Seq(
      Seq(Window.tumbling(20), Window.tumbling(30)),
      Seq(Window.tumbling(24), Window.tumbling(36)),
      Seq(Window(24, 12), Window(36, 12)),
    )
    for {
      ds <- downstreams
      bigR = CostModel.hyperPeriod(ds)
      rw <- Seq(1L)
      tw = Window.tumbling(rw)
      d  = NumberTheory.gcdAll(ds.flatMap(w => Seq(BigInt(w.r), BigInt(w.s)))).toLong
      rf1 <- NumberTheory.divisors(d) if rf1 > rw
      rf2 <- NumberTheory.divisors(d) if rf2 > rw && rf2 != rf1
      wf1 = Window.tumbling(rf1)
      wf2 = Window.tumbling(rf2)
      // independent candidates only (neither covers the other)
      if !wf1.coveredBy(wf2) && !wf2.coveredBy(wf1)
    } {
      val exact = FactorWindows.theorem9AtLeastAsGood(wf1, wf2, None, ds, bigR, 1)
      // Theorem 9's proof shows the comparison collapses to r_f ≥ r'_f for
      // tumbling candidates of a common target (n_f = m_f cancels the
      // r_f/r_W terms) — check that everywhere...
      assert(exact == (rf1 >= rf2), s"wf1=$wf1 wf2=$wf2 ds=$ds: exact=$exact")
      // ...and check the literal published inequality on its domain of
      // validity, where both denominators λ − r/r_W are positive (the proof
      // divides by them).
      val lambda = ds.map(wj =>
        CostModel.recurrenceCount(wj, bigR).doubleValue / (bigR / wj.r).doubleValue).sum
      if (lambda > rf1.toDouble / tw.r && lambda > rf2.toDouble / tw.r) {
        val thm = FactorWindows.theorem9Inequality(wf1, wf2, tw, ds, bigR)
        assert(exact == thm, s"wf1=$wf1 wf2=$wf2 ds=$ds: exact=$exact thm=$thm")
      }
    }
  }

  // ---- candidate generation (general, §4.2.1) -----------------------------

  test("general candidates satisfy all coverage constraints") {
    sampled(150) { rnd => alignedSet(rnd, 4) } { ws =>
      if (ws.size >= 2) {
        val target = ws.head
        val downstream = ws.tail.filter(w => w.coveredBy(target) && w != target)
        if (downstream.nonEmpty) {
          val cands = FactorWindows.candidates(Some(target), downstream, ws.toSet,
            Semantics.CoveredBy)
          cands.foreach { wf =>
            assert(wf.coveredBy(target) && wf != target)
            downstream.foreach(wj => assert(wj.coveredBy(wf)))
            assert(!ws.contains(wf), s"candidate $wf already in window set")
          }
        }
      }
    }
  }

  test("candidates exclude the virtual root itself") {
    val cands = FactorWindows.candidates(None, ex7, ex7.toSet, Semantics.CoveredBy)
    assert(!cands.contains(Window.virtualRoot))
    assert(cands.contains(w10))
  }

  test("no candidates for an empty downstream set") {
    assert(FactorWindows.candidates(None, Nil, Set.empty, Semantics.CoveredBy).isEmpty)
    assert(FactorWindows.algorithm4Best(None, Nil, Set.empty, BigInt(10), 1).isEmpty)
  }

  test("Algorithm 4 returns None when gcd equals the target range (line 3)") {
    val downstream = Seq(Window.tumbling(20), Window.tumbling(30))
    assert(FactorWindows.algorithm4Best(Some(w10), downstream,
      downstream.toSet + w10, BigInt(120), 1).isEmpty)
  }

  // ---- Algorithm 2 global properties --------------------------------------

  test("Algorithm 2 is never worse than Algorithm 1") {
    sampled(250) { rnd => alignedSet(rnd, 5) } { ws =>
      Seq(Semantics.CoveredBy, Semantics.PartitionedBy).foreach { sem =>
        Seq(BigInt(1), BigInt(10), BigInt(100)).foreach { eta =>
          val a1 = CostModel.minCostPlan(ws, sem, eta).totalCost
          val a2 = FactorWindows.minCostPlanWithFactors(ws, sem, eta).totalCost
          assert(a2 <= a1, s"Alg2 worse than Alg1 on $ws ($sem, eta=$eta)")
        }
      }
    }
  }

  test("factor windows in the final plan always feed someone") {
    sampled(200) { rnd => alignedSet(rnd, 5) } { ws =>
      val plan = FactorWindows.minCostPlanWithFactors(ws, Semantics.CoveredBy, 100)
      plan.factorWindows.foreach(f =>
        assert(plan.childrenOf(f).nonEmpty, s"dangling factor window $f in $ws"))
    }
  }

  test("factor windows never appear in the user window list") {
    sampled(100) { rnd => alignedSet(rnd, 5) } { ws =>
      val plan = FactorWindows.minCostPlanWithFactors(ws, Semantics.CoveredBy, 100)
      assert(plan.userWindows.toSet == ws.toSet)
      assert(plan.factorWindows.forall(!ws.contains(_)))
    }
  }

  test("higher eta makes factor windows at least as attractive") {
    // With a large eta, raw-stream scans dominate, so Algorithm 2's
    // improvement ratio is monotonically non-increasing in eta.
    sampled(100) { rnd => alignedSet(rnd, 5) } { ws =>
      def ratio(eta: BigInt): Double = {
        val a2 = FactorWindows.minCostPlanWithFactors(ws, Semantics.CoveredBy, eta)
        a2.totalCost.doubleValue / CostModel.baselineCost(ws, eta).doubleValue
      }
      assert(ratio(100) <= ratio(1) + 0.05, s"eta=100 ratio worse than eta=1 on $ws")
    }
  }
}
