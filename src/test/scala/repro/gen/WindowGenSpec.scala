package repro.gen

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{CostModel, Semantics, Wcg, Window}

class WindowGenSpec extends AnyFunSuite {

  private def gen(seed: Long) = new WindowGen(seed)

  test("generators are deterministic in the seed") {
    (1 to 5).foreach { i =>
      assert(gen(i).randomSet(5) == gen(i).randomSet(5))
      assert(gen(i).chainSet(5) == gen(i).chainSet(5))
      assert(gen(i).starSet(5) == gen(i).starSet(5))
      assert(gen(i).dagSet(3, 2, 2, 0.5) == gen(i).dagSet(3, 2, 2, 0.5))
    }
  }

  test("different seeds give different sets") {
    assert((1 to 10).map(i => gen(i).randomSet(5)).distinct.size > 5)
  }

  test("Algorithm 5: slides within [2, sMax], ranges are k*s with k <= kMax") {
    (1L to 30L).foreach { seed =>
      val w = gen(seed).randomWindow()
      assert(w.s >= 2 && w.s <= gen(seed).sMax)
      assert(w.r % w.s == 0 && w.r / w.s >= 1 && w.r / w.s <= gen(seed).kMax)
    }
  }

  test("all generators keep r a multiple of s (footnote 4 assumption)") {
    (1L to 10L).foreach { seed =>
      val g = gen(seed)
      val everything = g.randomSet(5) ++ g.randomTumblingSet(5) ++ g.chainSet(5) ++
        g.chainTumblingSet(5) ++ g.starSet(5) ++ g.starTumblingSet(5) ++
        g.dagSet(3, 2, 2, 0.5)
      everything.foreach(w => assert(w.r % w.s == 0, s"$w from seed $seed"))
    }
  }

  test("generated sets contain no duplicates") {
    (1L to 10L).foreach { seed =>
      val g = gen(seed)
      Seq(g.randomSet(5), g.randomTumblingSet(5), g.chainSet(5), g.starSet(5),
        g.dagSet(3, 2, 2, 0.5)).foreach(ws => assert(ws.distinct == ws))
    }
  }

  test("tumbling variants generate only tumbling windows") {
    (1L to 10L).foreach { seed =>
      val g = gen(seed)
      (g.randomTumblingSet(5) ++ g.chainTumblingSet(5) ++ g.starTumblingSet(5))
        .foreach(w => assert(w.isTumbling))
    }
  }

  test("ChainGen: W_{i+1} is covered by W_i for every consecutive pair") {
    (1L to 20L).foreach { seed =>
      val ws = gen(seed).chainSet(5)
      ws.sliding(2).foreach { case Seq(wi, wj) =>
        assert(wj.coveredBy(wi), s"$wj not covered by $wi (seed $seed)")
      }
    }
  }

  test("ChainGen tumbling: consecutive ranges divide") {
    (1L to 20L).foreach { seed =>
      gen(seed).chainTumblingSet(5).sliding(2).foreach { case Seq(wi, wj) =>
        assert(wj.r % wi.r == 0 && wj.r > wi.r)
      }
    }
  }

  test("StarGen: every satellite is covered by the hub W_1") {
    (1L to 20L).foreach { seed =>
      val ws = gen(seed).starSet(5)
      ws.tail.foreach(w => assert(w.coveredBy(ws.head), s"$w vs hub ${ws.head}"))
    }
  }

  test("Algorithm 6: DAG has the requested level sizes (2/4/6 for Fig. 15)") {
    (1L to 10L).foreach { seed =>
      assert(gen(seed).dagSet(3, 2, 2, 0.5).size == 12)
      assert(gen(seed).dagSet(2, 3, 1, 0.6).size == 7)
    }
  }

  test("Algorithm 6: cross-level coverage edges exist; WCG is nontrivial") {
    (1L to 10L).foreach { seed =>
      val ws = gen(seed).dagSet(3, 2, 2, 0.5)
      val edges = Wcg(ws, Semantics.CoveredBy).edges
      assert(edges.nonEmpty, s"DAG from seed $seed has no coverage edges")
    }
  }

  test("generated sets have workable hyper-periods for the cost model") {
    (1L to 10L).foreach { seed =>
      val g = gen(seed)
      Seq(g.randomSet(5), g.chainSet(5), g.starSet(5), g.dagSet(3, 2, 2, 0.5))
        .foreach { ws =>
          val bigR = CostModel.hyperPeriod(ws)
          ws.foreach(w => CostModel.recurrenceCount(w, bigR)) // must not throw
        }
    }
  }

  test("10-window sets generate as well (the paper's larger configuration)") {
    (1L to 5L).foreach { seed =>
      assert(gen(seed).randomSet(10).size == 10)
      assert(gen(seed).chainSet(10).size == 10)
      assert(gen(seed).starSet(10).size == 10)
    }
  }
}
