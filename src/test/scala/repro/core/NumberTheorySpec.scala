package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NumberTheorySpec extends AnyFunSuite with SeededProps {
  import NumberTheory._

  test("gcd and lcm basics") {
    assert(gcd(12, 18) == 6)
    assert(lcm(4, 6) == 12)
    assert(lcm(7, 13) == 91)
    assert(gcdAll(Seq(BigInt(12), BigInt(18), BigInt(30))) == 6)
    assert(lcmAll(Seq(BigInt(10), BigInt(20), BigInt(30), BigInt(40))) == 120)
  }

  test("lcmAll of the empty sequence is 1; gcdAll of empty is 0") {
    assert(lcmAll(Nil) == 1)
    assert(gcdAll(Nil) == 0)
  }

  test("lcm * gcd == product for pairs") {
    sampled(200) { rnd => (1 + rnd.nextLong(1000), 1 + rnd.nextLong(1000)) } {
      case (a, b) =>
        assert(lcm(a, b) * gcd(a, b) == BigInt(a) * b)
    }
  }

  test("divisors enumerates exactly the divisors, ascending") {
    assert(divisors(1) == Seq(1))
    assert(divisors(12) == Seq(1, 2, 3, 4, 6, 12))
    assert(divisors(49) == Seq(1, 7, 49))
    assert(divisors(97) == Seq(1, 97))
    sampled(100) { rnd => 1 + rnd.nextLong(2000) } { n =>
      val ds = divisors(n)
      assert(ds == ds.sorted && ds.distinct == ds)
      assert(ds.forall(d => n % d == 0))
      assert((1L to n).filter(n % _ == 0) == ds)
    }
  }

  test("divisors rejects non-positive input") {
    assertThrows[IllegalArgumentException](divisors(0))
  }

  test("BigInt arithmetic survives huge hyper-periods") {
    val primes = Seq(2L, 3L, 5L, 7L, 11L, 13L, 17L, 19L, 23L, 29L).map(p => p * p)
    val ws = primes.map(Window.tumbling)
    val bigR = CostModel.hyperPeriod(ws)
    assert(bigR > BigInt(Long.MaxValue)) // would overflow Long
    assert(CostModel.baselineCost(ws, 100) > 0)
    assert(CostModel.minCostPlan(ws, Semantics.CoveredBy, 100).totalCost > 0)
  }
}
