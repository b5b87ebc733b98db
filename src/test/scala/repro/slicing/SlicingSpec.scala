package repro.slicing

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{NumberTheory, SeededProps, Window}

class SlicingSpec extends AnyFunSuite with SeededProps {

  // ---- slice shapes -------------------------------------------------------

  test("paned edges: panes of size gcd(r, s)") {
    assert(Slicing.panedEdges(Window(10, 4)) == Seq(Progression(0, 2)))
    assert(Slicing.panedEdges(Window(12, 4)) == Seq(Progression(0, 4)))
    assert(Slicing.panedEdges(Window(7, 3)) == Seq(Progression(0, 1)))
  }

  test("paired edges: two slices z2 = r mod s, z1 = s - z2 per period") {
    assert(Slicing.pairedEdges(Window(10, 4)).toSet ==
      Set(Progression(0, 4), Progression(2, 4)))
    assert(Slicing.pairedSliceCount(Window(10, 4)) == 2)
  }

  test("paired edges collapse to one slice for tumbling-aligned windows (s | r)") {
    assert(Slicing.pairedEdges(Window(12, 4)) == Seq(Progression(0, 4)))
    assert(Slicing.pairedSliceCount(Window(12, 4)) == 1)
    assert(Slicing.pairedEdges(Window(8, 8)) == Seq(Progression(0, 8)))
  }

  test("paired never has more slices than paned (Krishnamurthy et al.)") {
    sampled(300)(anyWindow(_)) { w =>
      val panedPerPeriod = w.s / NumberTheory.gcd(w.r, w.s).toLong
      assert(Slicing.pairedSliceCount(w) <= panedPerPeriod, s"$w")
    }
  }

  // ---- progressions -------------------------------------------------------

  test("progression membership and subset") {
    val p = Progression(2, 6)
    assert(p.contains(2) && p.contains(8) && !p.contains(4) && !p.contains(-4))
    assert(Progression(2, 6).subsetOf(Progression(2, 6)))
    assert(Progression(2, 6).subsetOf(Progression(0, 2)))
    assert(!Progression(2, 6).subsetOf(Progression(1, 2)))
  }

  test("progression validation") {
    assertThrows[IllegalArgumentException](Progression(6, 6))
    assertThrows[IllegalArgumentException](Progression(-1, 6))
    assertThrows[IllegalArgumentException](Progression(0, 0))
  }

  test("CRT intersection: compatible classes") {
    assert(Slicing.intersect(Progression(2, 6), Progression(0, 4))
      .contains(Progression(8, 12)))
    assert(Slicing.intersect(Progression(0, 2), Progression(0, 3))
      .contains(Progression(0, 6)))
  }

  test("CRT intersection: incompatible classes are empty") {
    assert(Slicing.intersect(Progression(1, 6), Progression(0, 2)).isEmpty)
  }

  test("countUnion agrees between sieve and inclusion-exclusion") {
    sampled(100) { rnd =>
      val n = 1 + rnd.nextInt(5)
      Vector.fill(n) {
        val m = 1 + rnd.nextLong(12)
        Progression(rnd.nextLong(m), m)
      }
    } { progs =>
      val period = NumberTheory.lcmAll(progs.map(p => BigInt(p.m)))
      val bySieve = Slicing.countUnion(progs, period) // small -> sieve path
      // Brute force on the same period.
      val brute = (0L until period.toLong).count(t => progs.exists(_.contains(t)))
      assert(bySieve == brute, s"$progs over $period")
      // Force the inclusion-exclusion path by scaling the period: counts
      // scale linearly with the number of repetitions.
      val big = period * ((1 << 22) / period + 1)
      assert(Slicing.countUnion(progs, big) == BigInt(brute) * (big / period))
    }
  }

  // ---- Table 1 cost formulas ---------------------------------------------

  private val ex1 = Seq(10L, 20L, 30L, 40L).map(Window.tumbling)

  test("slicing period S = lcm of slides") {
    assert(Slicing.slicingPeriod(ex1) == 120)
    assert(Slicing.slicingPeriod(Seq(Window(10, 4), Window(12, 6))) == 12)
  }

  test("Table 1 unshared paned on Example 1: partial nT, final per formula") {
    val c = Slicing.unsharedPaned(ex1, 1)
    assert(c.partial == 4 * 120) // n*T with T = eta*S = 120
    // Σ (S/s_i)·(r_i/g_i): tumbling ⇒ g=s, r/g=1 ⇒ Σ S/s_i = 12+6+4+3
    assert(c.finalAgg == 25)
  }

  test("Table 1 unshared paired on Example 1: ceil(2r/s) = 2 per window") {
    val c = Slicing.unsharedPaired(ex1, 1)
    assert(c.partial == 480)
    assert(c.finalAgg == 2 * 25)
  }

  test("Table 1 shared paned/paired on Example 1: partial T, E from composed edges") {
    // Composed edges of tumbling {10,20,30,40} = multiples of 10 in [0,120): E=12.
    val sp = Slicing.sharedPaned(ex1, 1)
    assert(sp.partial == 120)
    assert(sp.finalAgg == 12 * (1 + 1 + 1 + 1))
    assert(Slicing.sharedPaired(ex1, 1).total == sp.total) // tumbling: same slices
  }

  test("shared paired partial cost is eta*S regardless of window count") {
    sampled(100) { rnd => alignedSet(rnd, 4) } { ws =>
      Seq(BigInt(1), BigInt(50)).foreach { eta =>
        assert(Slicing.sharedPaired(ws, eta).partial == eta * Slicing.slicingPeriod(ws))
      }
    }
  }

  test("unshared partial cost replicates the stream n times") {
    sampled(100) { rnd => alignedSet(rnd, 5) } { ws =>
      val s = Slicing.slicingPeriod(ws)
      assert(Slicing.unsharedPaired(ws, 7).partial == 7 * s * ws.size)
      assert(Slicing.unsharedPaned(ws, 7).partial == 7 * s * ws.size)
    }
  }

  test("composed paired edge count is bounded by the sum of per-window edges") {
    sampled(100) { rnd => alignedSet(rnd, 5) } { ws =>
      val s = Slicing.slicingPeriod(ws)
      val e = Slicing.countUnion(ws.flatMap(Slicing.pairedEdges), s)
      val bound = ws.map(w => (s / w.s) * Slicing.pairedSliceCount(w)).sum
      assert(e <= bound && e >= s / BigInt(ws.map(_.s).max))
    }
  }

  // ---- executable slicing == direct evaluation ----------------------------

  private def checkExecutable(ws: Seq[Window], agg: SliceExec.ScalarAgg,
                              edges: Window => Seq[Progression], horizon: Long,
                              seed: Long): Unit = {
    val rnd = new scala.util.Random(seed)
    val events = Vector.fill(400)((rnd.nextLong(horizon), rnd.nextDouble() * 100))
    val composed = ws.flatMap(edges)
    val bounds = Slicing.edgePositions(composed, horizon)
    val partials = SliceExec.slicePartials(events, bounds, agg)
    ws.foreach { w =>
      val fromSlices = SliceExec.windowFromSlices(w, bounds, partials, horizon, agg)
      val direct = SliceExec.direct(w, events, horizon, agg)
      assert(fromSlices.keySet == direct.keySet, s"$w instances differ")
      fromSlices.foreach { case (a, v) =>
        assert(math.abs(v - direct(a)) < 1e-9, s"$w @ $a: $v vs ${direct(a)}")
      }
    }
  }

  test("shared paired slicing reproduces direct window results (min)") {
    checkExecutable(Seq(Window(10, 4), Window(12, 6), Window(8, 2)),
      SliceExec.Min, Slicing.pairedEdges, horizon = 120, seed = 1)
  }

  test("shared paned slicing reproduces direct window results (sum)") {
    checkExecutable(Seq(Window(10, 4), Window(12, 6), Window(8, 2)),
      SliceExec.Sum, Slicing.panedEdges, horizon = 120, seed = 2)
  }

  test("shared paired slicing reproduces direct results on tumbling sets (avg)") {
    checkExecutable(Seq(10L, 20L, 30L, 40L).map(Window.tumbling),
      SliceExec.Avg, Slicing.pairedEdges, horizon = 240, seed = 3)
  }

  test("executable slicing matches direct results on random aligned sets") {
    sampled(30) { rnd => (alignedSet(rnd, 3, sMax = 6, kMax = 4), rnd.nextLong(1000)) } {
      case (ws, seed) =>
        Seq(SliceExec.Min, SliceExec.Max, SliceExec.Count).foreach { agg =>
          checkExecutable(ws, agg, Slicing.pairedEdges, horizon = 150, seed = seed)
        }
    }
  }

  test("unshared slicing (per-window slices) also reproduces direct results") {
    val ws = Seq(Window(10, 4), Window(9, 3))
    ws.foreach { w =>
      checkExecutable(Seq(w), SliceExec.Min, Slicing.pairedEdges, 100, 4)
      checkExecutable(Seq(w), SliceExec.Sum, Slicing.panedEdges, 100, 5)
    }
  }
}
