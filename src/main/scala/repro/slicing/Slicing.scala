package repro.slicing

import repro.core.{NumberTheory, Window}

/** A residue class `{ t ≥ 0 : t ≡ a (mod m) }` — the positions of slice
  * edges of a sliced window recur with the window's period, so edge sets
  * are finite unions of these.
  */
final case class Progression(a: Long, m: Long) {
  require(m > 0 && a >= 0 && a < m, s"bad progression a=$a m=$m")
  def contains(t: Long): Boolean = t >= 0 && t % m == a

  /** True iff every member of `this` is a member of `that`. */
  def subsetOf(that: Progression): Boolean =
    m % that.m == 0 && a % that.m == that.a
}

/** Window slicing (§5.1): paned windows [Li et al. 2005] and paired windows
  * [Krishnamurthy et al. 2006], their composition into a shared sliced
  * window, and the cost model of Table 1.
  *
  * Slice edges are represented as residue classes. Our interval convention
  * anchors a window's instances at `m·s` (not at the firing time), so the
  * paired edges sit at residues `{0, r mod s}` — a pure time-shift of the
  * textbook `Y(z1, z2)` with `z1 = s − (r mod s)`, `z2 = r mod s`, with
  * identical slice counts and costs (DESIGN.md).
  */
object Slicing {
  import NumberTheory._

  /** Paned slices: uniform panes of size `g = gcd(r, s)`; edges at every
    * multiple of `g`.
    */
  def panedEdges(w: Window): Seq[Progression] =
    Seq(Progression(0, NumberTheory.gcd(w.r, w.s).toLong))

  /** Paired slices: per period `s`, two slices of sizes `z2 = r mod s` and
    * `z1 = s − z2` (one slice when `s | r`); edges at residues
    * `{0, r mod s} (mod s)`.
    */
  def pairedEdges(w: Window): Seq[Progression] = {
    val z2 = w.r % w.s
    if (z2 == 0) Seq(Progression(0, w.s))
    else Seq(Progression(0, w.s), Progression(z2, w.s))
  }

  /** Number of slices per period `s` of the paired window (|Y| ∈ {1, 2}). */
  def pairedSliceCount(w: Window): Long = if (w.r % w.s == 0) 1 else 2

  /** Intersection of two residue classes via CRT: nonempty iff the residues
    * agree modulo `gcd(m1, m2)`; then a single class mod `lcm(m1, m2)`.
    */
  def intersect(p: Progression, q: Progression): Option[Progression] = {
    val g = NumberTheory.gcd(p.m, q.m).toLong
    if ((p.a - q.a) % g != 0) None
    else {
      val l = NumberTheory.lcm(p.m, q.m)
      require(l <= Long.MaxValue / 2, s"modulus overflow composing $p and $q")
      val m = l.toLong
      // Solve x ≡ p.a (mod p.m), x ≡ q.a (mod q.m) by stepping p's class —
      // at most q.m/g steps, tiny for our slide magnitudes.
      val step = p.m
      var x = p.a
      while (x % q.m != q.a) x += step
      Some(Progression(x % m, m))
    }
  }

  /** `|union of progressions ∩ [0, period)|` — the composed-slice edge count
    * `E` of Table 1. Uses a sieve for small periods and CRT
    * inclusion–exclusion (with absorption pruning) for large ones; `period`
    * must be a multiple of every modulus.
    */
  def countUnion(progs0: Seq[Progression], period: BigInt): BigInt = {
    val distinct = progs0.distinct
    // Absorption: drop any class wholly contained in another (mutual
    // containment implies equality, already removed by distinct).
    val progs = distinct.filterNot(p => distinct.exists(q => q != p && p.subsetOf(q)))
    if (progs.isEmpty) return BigInt(0)
    progs.foreach(p => require(period % p.m == 0, s"period $period not multiple of ${p.m}"))

    if (period <= (1 << 22)) {
      val n = period.toInt
      val seen = new java.util.BitSet(n)
      progs.foreach { p =>
        var t = p.a
        while (t < n) { seen.set(t.toInt); t += p.m }
      }
      BigInt(seen.cardinality())
    } else {
      // Inclusion–exclusion over subsets; empty CRT intersections prune.
      def go(i: Int, acc: Option[Progression], size: Int): BigInt =
        if (i == progs.length) {
          acc match {
            case None    => BigInt(0)
            case Some(p) =>
              val sign = if (size % 2 == 1) 1 else -1
              sign * (period / p.m)
          }
        } else {
          val skip = go(i + 1, acc, size)
          val take = acc match {
            case None    => go(i + 1, Some(progs(i)), 1)
            case Some(p) =>
              intersect(p, progs(i)) match {
                case None     => BigInt(0)
                case combined => go(i + 1, combined, size + 1)
              }
          }
          skip + take
        }
      go(0, None, 0)
    }
  }

  /** All edge positions in `[0, horizon]` (inclusive of the horizon edge).
    * Used by the executable slice evaluator in tests.
    */
  def edgePositions(progs: Seq[Progression], horizon: Long): Vector[Long] =
    (progs.flatMap { p => (p.a to horizon by p.m) } :+ 0L :+ horizon)
      .distinct.sorted.toVector

  /** Costs of the Table 1 techniques over the slicing period `S = lcm(s_i)`
    * with `T = η·S` input events: `(partial, final)` pairs.
    */
  final case class SlicingCosts(partial: BigInt, finalAgg: BigInt) {
    def total: BigInt = partial + finalAgg
  }

  /** Slicing period `S = lcm(s_1, …, s_n)`. */
  def slicingPeriod(windows: Seq[Window]): BigInt =
    NumberTheory.lcmAll(windows.map(w => BigInt(w.s)))

  /** Unshared paned: partial `n·T`, final `Σ (S/s_i)·(r_i/g_i)`. */
  def unsharedPaned(windows: Seq[Window], eta: BigInt): SlicingCosts = {
    val s = slicingPeriod(windows)
    val t = eta * s
    val fin = windows.map { w =>
      val g = NumberTheory.gcd(w.r, w.s)
      (s / w.s) * (w.r / g)
    }.sum
    SlicingCosts(t * windows.size, fin)
  }

  /** Unshared paired: partial `n·T`, final `Σ (S/s_i)·⌈2·r_i/s_i⌉`. */
  def unsharedPaired(windows: Seq[Window], eta: BigInt): SlicingCosts = {
    val s = slicingPeriod(windows)
    val t = eta * s
    val fin = windows.map { w =>
      val perFiring = (2 * w.r + w.s - 1) / w.s // ⌈2 r/s⌉
      (s / w.s) * BigInt(perFiring)
    }.sum
    SlicingCosts(t * windows.size, fin)
  }

  /** Shared paned: partial `T`, final `Σ E_paned·(r_i/s_i)` where `E_paned`
    * is the composed paned edge count over `S`.
    */
  def sharedPaned(windows: Seq[Window], eta: BigInt): SlicingCosts = {
    val s = slicingPeriod(windows)
    val e = countUnion(windows.flatMap(panedEdges), s)
    SlicingCosts(eta * s, windows.map(w => e * w.r / w.s).sum)
  }

  /** Shared paired: partial `T`, final `Σ E_paired·(r_i/s_i)`. */
  def sharedPaired(windows: Seq[Window], eta: BigInt): SlicingCosts = {
    val s = slicingPeriod(windows)
    val e = countUnion(windows.flatMap(pairedEdges), s)
    SlicingCosts(eta * s, windows.map(w => e * w.r / w.s).sum)
  }
}
