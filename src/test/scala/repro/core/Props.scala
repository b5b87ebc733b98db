package repro.core

import scala.util.Random

/** Seeded property-testing helper: the `org.scalatestplus` scalacheck
  * bridge is not available offline, so suites sample deterministically with
  * this trait (and use raw scalacheck `Prop`s where convenient).
  */
trait SeededProps {
  /** Run `body` on `n` samples drawn from `gen` with a fixed seed. */
  def sampled[A](n: Int, seed: Long = 42L)(gen: Random => A)(body: A => Unit): Unit = {
    val rnd = new Random(seed)
    (1 to n).foreach(_ => body(gen(rnd)))
  }

  /** Random window with `s ∈ [1, sMax]`, `r ∈ [s, rMax]` (r need not be a
    * multiple of s — coverage theory does not require it).
    */
  def anyWindow(rnd: Random, sMax: Long = 12, rMax: Long = 24): Window = {
    val s = 1 + rnd.nextLong(sMax)
    Window(s + rnd.nextLong(rMax - s + 1), s)
  }

  /** Random window with r a multiple of s (the paper's standing assumption
    * for the cost model, footnote 4).
    */
  def alignedWindow(rnd: Random, sMax: Long = 10, kMax: Long = 6): Window = {
    val s = 1 + rnd.nextLong(sMax)
    Window(s * (1 + rnd.nextLong(kMax)), s)
  }

  /** Random *distinct* aligned window set of size `n`. */
  def alignedSet(rnd: Random, n: Int, sMax: Long = 10, kMax: Long = 6): Vector[Window] = {
    val out = scala.collection.mutable.LinkedHashSet.empty[Window]
    var guard = 0
    while (out.size < n && guard < 1000) { out += alignedWindow(rnd, sMax, kMax); guard += 1 }
    out.toVector
  }
}
