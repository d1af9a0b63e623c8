package repro.core

/** RSUM kernel for `double` (paper §III, Algorithms 2 and 3).
  *
  * A summation state is `L` levels of `(running sum S^(l), carry count
  * C^(l))` plus the level-1 extractor exponent `e1` (`ufp(S^(1)) = 2^e1`).
  * The state is stored *struct-of-arrays* style in caller-provided slices
  * `s(off..off+L)` / `c(off..off+L)` so that hash-aggregation tables can
  * hold thousands of states without boxing; `e1` travels separately (an
  * `Int` per state, [[RsumD.EMPTY]] when no finite nonzero value was seen).
  *
  * Invariants maintained by every public operation ("normalized" state):
  *   - `e1` is a multiple of [[FpD.W]] on the fixed global grid (or EMPTY),
  *     chosen as the smallest grid point admitting every value seen — the
  *     fixed point of the paper's demote loop (Alg. 2 lines 4-7);
  *   - each `S^(l)` lies in `[1.5, 1.75) * ufp`, i.e. its deviation from
  *     the nominal `1.5 * ufp` is in `[0, 0.25 * ufp)`.
  *
  * All state mutations are exact (integer arithmetic in units of the level
  * grid), so the canonical state — and hence the finalized sum — depends
  * only on the *multiset* of added values, not on the order of additions or
  * the shape of the merge tree. That is the bit-reproducibility guarantee.
  *
  * Inputs must be finite; zeros are ignored (they carry no information and
  * must not set the extractor grid). NaN/Inf handling lives in the class
  * wrappers ([[ReproDouble]]).
  */
object RsumD {
  import FpD._

  /** Sentinel `e1` for "no finite nonzero value seen yet". */
  final val EMPTY: Int = Int.MinValue

  /** 2^e as a double, for e in the normal range [-1022, 1023]. */
  @inline def pow2(e: Int): Double =
    java.lang.Double.longBitsToDouble((e + 1023).toLong << 52)

  /** Exponent of level `l` (0-based) of a state with level-1 exponent e1. */
  @inline def eOf(e1: Int, l: Int): Int = {
    val e = e1 - l * W
    if (e < ELMIN) ELMIN else e
  }

  /** Nominal (deviation-zero) running sum of level `l`. */
  @inline def nominal(e1: Int, l: Int): Double = 1.5 * pow2(eOf(e1, l))

  /** Smallest grid exponent whose window admits |b|, i.e. the fixed point
    * of `while |b| >= 2^(W-1) * ulp(S^(1)) do demote` (Alg. 2 lines 4-7):
    * validity requires `e1 >= E(b) + M - W + 2` with `E(b) = getExponent`.
    */
  @inline def requiredE1(b: Double): Int = {
    val need = Math.getExponent(b) + M - W + 2
    val g = W * Math.floorDiv(need + W - 1, W)
    if (g < E1MIN) E1MIN else g
  }

  /** Initialize all levels of a state to their nominal values. */
  def initLevels(s: Array[Double], c: Array[Long], off: Int, levels: Int, e1: Int): Unit = {
    var l = 0
    while (l < levels) { s(off + l) = nominal(e1, l); c(off + l) = 0L; l += 1 }
  }

  /** Demote a state from frame `e1Old` to the higher frame `e1New` (both on
    * the grid): level `l` becomes level `l + k`, the bottom `k` levels are
    * discarded, the top `k` levels start nominal (Alg. 2 lines 5-7 applied
    * `k` times at once).
    */
  def demote(s: Array[Double], c: Array[Long], off: Int, levels: Int, e1Old: Int, e1New: Int): Unit = {
    val k = (e1New - e1Old) / W
    var l = levels - 1
    while (l >= 0) {
      if (l >= k) { s(off + l) = s(off + l - k); c(off + l) = c(off + l - k) }
      else { s(off + l) = nominal(e1New, l); c(off + l) = 0L }
      l -= 1
    }
  }

  /** Carry-bit propagation (Alg. 2 lines 14-18): renormalize every level
    * into the `[1.5, 1.75) * ufp` band, moving whole multiples of
    * `0.25 * ufp` into the carry count. Every step is exact.
    */
  def propagate(s: Array[Double], c: Array[Long], off: Int, levels: Int, e1: Int): Unit = {
    var l = 0
    while (l < levels) {
      val ufp     = pow2(eOf(e1, l))
      val quarter = 0.25 * ufp
      val dev     = s(off + l) - 1.5 * ufp // exact (Sterbenz)
      val d       = Math.floor(dev / quarter)
      if (d != 0.0) {
        s(off + l) -= d * quarter
        c(off + l) += d.toLong
      }
      l += 1
    }
  }

  /** Add one finite value to a normalized state; returns the new `e1`.
    * This is RSUM SCALAR (Alg. 2) for a single input value.
    */
  def add(s: Array[Double], c: Array[Long], off: Int, levels: Int, e1In: Int, b: Double): Int = {
    if (b == 0.0) return e1In
    var e1  = e1In
    val req = requiredE1(b)
    if (e1 == EMPTY) { e1 = req; initLevels(s, c, off, levels, e1) }
    else if (req > e1) { demote(s, c, off, levels, e1, req); e1 = req }
    var r = b
    var l = 0
    while (l < levels && r != 0.0) {
      // Error-free transformation against the FIXED extractor 1.5 * 2^e(l)
      // (not the running sum): its parity in ulp units is constant, so
      // round-half-even tie-breaking — and hence q — depends only on r and
      // the frame, never on accumulation order. This follows Demmel &
      // Nguyen's original design and is what makes reproducibility
      // unconditional.
      val a = nominal(e1, l)
      val q = (r + a) - a     // q = r rounded to the level grid, deterministically
      s(off + l) += q         // exact: q is a multiple of ulp, S stays in (1, 2) * ufp
      r -= q                  // exact
      l += 1
    }
    propagate(s, c, off, levels, e1)
    e1
  }

  /** Merge state B into state A (the paper's `operator+=(repro)`); returns
    * A's new `e1`. B is consumed: it may be demoted and renormalized in
    * place. Exact, hence associative and commutative bit-for-bit.
    */
  def merge(sA: Array[Double], cA: Array[Long], offA: Int, e1AIn: Int,
            sB: Array[Double], cB: Array[Long], offB: Int, e1BIn: Int,
            levels: Int): Int = {
    if (e1BIn == EMPTY) return e1AIn
    var e1A = e1AIn
    var e1B = e1BIn
    if (e1A == EMPTY) {
      var l = 0
      while (l < levels) { sA(offA + l) = sB(offB + l); cA(offA + l) = cB(offB + l); l += 1 }
      return e1B
    }
    if (e1B > e1A) { demote(sA, cA, offA, levels, e1A, e1B); e1A = e1B }
    else if (e1A > e1B) { demote(sB, cB, offB, levels, e1B, e1A); e1B = e1A }
    propagate(sA, cA, offA, levels, e1A)
    propagate(sB, cB, offB, levels, e1B)
    var l = 0
    while (l < levels) {
      val ufp = pow2(eOf(e1A, l))
      val dev = sB(offB + l) - 1.5 * ufp // in [0, 0.25 * ufp), exact
      sA(offA + l) += dev                // sum stays below 2 * ufp, exact
      cA(offA + l) += cB(offB + l)
      l += 1
    }
    propagate(sA, cA, offA, levels, e1A)
    e1A
  }

  /** Finalize a state into a double (Eq. 1): sum the per-level terms from
    * the last (smallest) level up, a fixed order so the result is a pure
    * function of the canonical state.
    */
  def eval(s: Array[Double], c: Array[Long], off: Int, levels: Int, e1: Int): Double = {
    if (e1 == EMPTY) return 0.0
    propagate(s, c, off, levels, e1)
    var q = 0.0
    var l = levels - 1
    while (l >= 0) {
      val ufp     = pow2(eOf(e1, l))
      val quarter = 0.25 * ufp
      q += (s(off + l) - 1.5 * ufp) + quarter * c(off + l).toDouble
      l -= 1
    }
    q
  }
}

/** RSUM SIMD (Alg. 3) for doubles: V-lane batched summation with NB-tiled
  * carry propagation and an exact, order-independent horizontal merge
  * (Eqs. 2-3). One instance holds the lane scratch so hot loops do not
  * allocate; not thread-safe — use one instance per thread.
  *
  * The resulting state is bit-identical to feeding the same values through
  * [[RsumD.add]] one by one (both capture the identical exact content and
  * leave the state in canonical form).
  */
final class RsumBatchD(val levels: Int) {
  import FpD._
  import RsumD._

  private val ls = new Array[Double](levels * V)
  private val lc = new Array[Long](levels * V)

  private def initLane(v: Int, e1: Int): Unit = {
    var l = 0
    while (l < levels) { ls(l * V + v) = nominal(e1, l); lc(l * V + v) = 0L; l += 1 }
  }

  private def demoteLanes(e1Old: Int, e1New: Int): Unit = {
    val k = (e1New - e1Old) / W
    var v = 0
    while (v < V) {
      var l = levels - 1
      while (l >= 0) {
        if (l >= k) { ls(l * V + v) = ls((l - k) * V + v); lc(l * V + v) = lc((l - k) * V + v) }
        else { ls(l * V + v) = nominal(e1New, l); lc(l * V + v) = 0L }
        l -= 1
      }
      v += 1
    }
  }

  private def propagateLanes(e1: Int): Unit = {
    var l = 0
    while (l < levels) {
      val ufp     = pow2(eOf(e1, l))
      val quarter = 0.25 * ufp
      var v = 0
      while (v < V) {
        val idx = l * V + v
        val dev = ls(idx) - 1.5 * ufp
        val d   = Math.floor(dev / quarter)
        if (d != 0.0) { ls(idx) -= d * quarter; lc(idx) += d.toLong }
        v += 1
      }
      l += 1
    }
  }

  // Per-block fixed extractors (see RsumD.add: fixed extractors keep
  // tie-breaking order-independent); refreshed whenever the frame changes.
  private val ext = new Array[Double](levels)
  // Remainder scratch for the level-major extraction passes.
  private val rbuf = new Array[Double](V * NB)

  private def refreshExtractors(e1: Int): Unit = {
    var l = 0
    while (l < levels) { ext(l) = nominal(e1, l); l += 1 }
  }

  /** Add `values(from until from+len)` (all finite) to the normalized state
    * in `s`/`c` at `off`; returns the new `e1`.
    */
  def run(values: Array[Double], from: Int, len: Int,
          s: Array[Double], c: Array[Long], off: Int, e1In: Int): Int = {
    if (len <= 0) return e1In
    var e1 = e1In

    // Load state into lane 0, nominals elsewhere (Alg. 3 lines 1-2).
    if (e1 != EMPTY) {
      var l = 0
      while (l < levels) { ls(l * V) = s(off + l); lc(l * V) = c(off + l); l += 1 }
      var v = 1
      while (v < V) { initLane(v, e1); v += 1 }
      refreshExtractors(e1)
    }

    val end = from + len
    var i   = from
    while (i < end) {
      val blockEnd = math.min(i + V * NB, end)
      val m = blockEnd - i
      // Copy the block into the remainder scratch, fusing the per-block
      // extractor-validity check on the block max (Alg. 3 line 4).
      var mx = 0.0
      var j  = 0
      while (j < m) {
        val b = values(i + j)
        rbuf(j) = b
        val a = Math.abs(b)
        if (a > mx) mx = a
        j += 1
      }
      if (mx > 0.0) {
        val req = requiredE1(mx)
        if (e1 == EMPTY) {
          e1 = req
          var v = 0
          while (v < V) { initLane(v, e1); v += 1 }
          refreshExtractors(e1)
        } else if (req > e1) { demoteLanes(e1, req); e1 = req; refreshExtractors(e1) }

        // Level-major, lane-striped extraction (Alg. 3 lines 5-6). Value t
        // feeds lane (t mod V) at every level, exactly as in the
        // value-major formulation; since each per-level operation is exact
        // and extractors are fixed, the resulting state is bit-identical.
        var l = 0
        while (l < levels) {
          val a    = ext(l)
          val base = l * V
          var t = 0
          while (t < m) {
            val r = rbuf(t)
            val q = (r + a) - a
            rbuf(t) = r - q
            ls(base + (t & (V - 1))) += q
            t += 1
          }
          l += 1
        }

        propagateLanes(e1) // Alg. 3 line 7
      }
      i = blockEnd
    }

    // Exact horizontal merge back into the scalar state (Eqs. 2-3).
    if (e1 != EMPTY) {
      var l = 0
      while (l < levels) {
        val ufp     = pow2(eOf(e1, l))
        val quarter = 0.25 * ufp
        var devTot  = 0.0
        var cTot    = 0L
        var v = 0
        while (v < V) { devTot += ls(l * V + v) - 1.5 * ufp; cTot += lc(l * V + v); v += 1 }
        val k = Math.floor(devTot / quarter) // devTot in [0, V * quarter), all exact
        s(off + l) = 1.5 * ufp + (devTot - k * quarter)
        c(off + l) = cTot + k.toLong
        l += 1
      }
    }
    e1
  }
}
