package repro.core

import java.nio.ByteBuffer

/** The paper's `repro<double,L>` data type (§IV): an *associative* drop-in
  * replacement for a floating-point accumulator. Wraps one [[RsumD]] state
  * (L levels of running sum + carry count) and adds SQL-grade handling of
  * the full double domain:
  *
  *   - NaN/±Inf are accumulated in a plain side sum, which is
  *     order-independent on the non-finite subset (Inf+Inf=Inf, Inf-Inf=NaN,
  *     NaN sticky);
  *   - values with |b| >= 2^987 would need an extractor exponent beyond the
  *     double range (`E(b) + M - W + 2 > 1023`), so they go into a second
  *     RSUM state over the exactly-scaled domain `b * 2^-600` (power-of-two
  *     scaling is error-free); the final value is
  *     `base + scalb(huge, 600)`, overflowing to ±Inf deterministically.
  *
  * `add`, `merge` and `value` are bit-reproducible: the result depends only
  * on the multiset of values added across the whole merge tree.
  */
final class ReproDouble private (val levels: Int,
                                 private[core] val s: Array[Double],
                                 private[core] val c: Array[Long],
                                 private[core] var e1: Int,
                                 private[core] var nonFinite: Double,
                                 private[core] var hasNonFinite: Boolean,
                                 private[core] var huge: ReproDouble)
    extends Serializable {

  def this(levels: Int) =
    this(levels, new Array[Double](levels), new Array[Long](levels),
         RsumD.EMPTY, 0.0, false, null)

  require(levels >= 1 && levels <= 16, s"levels must be in [1,16], got $levels")

  /** True if nothing contributing to the sum was added. */
  def isEmpty: Boolean =
    e1 == RsumD.EMPTY && !hasNonFinite && (huge == null || huge.isEmpty)

  /** The paper's `operator+=(ScalarT)`. */
  def add(b: Double): Unit = {
    val a = Math.abs(b)
    if (a < ReproDouble.HugeThreshold) e1 = RsumD.add(s, c, 0, levels, e1, b)
    else if (java.lang.Double.isFinite(b)) hugeState.add(b * ReproDouble.HugeScaleDown)
    else { hasNonFinite = true; nonFinite += b }
  }

  private def hugeState: ReproDouble = {
    if (huge == null) huge = new ReproDouble(levels)
    huge
  }

  /** Add a whole batch through the vectorized kernel (RSUM SIMD); the
    * resulting state is bit-identical to adding the values one by one.
    * Non-finite and huge values are routed through the scalar path.
    */
  def addBatch(values: Array[Double], from: Int, len: Int, scratch: RsumBatchD): Unit = {
    require(scratch.levels == levels, "scratch lane width mismatch")
    var inDomain = true
    var i = from
    val end = from + len
    while (i < end) {
      // !(a < T) catches huge, ±Inf and NaN in one test
      if (!(Math.abs(values(i)) < ReproDouble.HugeThreshold)) { inDomain = false; i = end }
      else i += 1
    }
    if (inDomain) e1 = scratch.run(values, from, len, s, c, 0, e1)
    else { // rare path: route per value
      var j = from
      while (j < end) { add(values(j)); j += 1 }
    }
  }

  /** The paper's `operator+=(repro<double,L>)`. `o` is left untouched. */
  def merge(o: ReproDouble): Unit = {
    require(o.levels == levels, s"cannot merge repro<double,${o.levels}> into repro<double,$levels>")
    if (o.hasNonFinite) { hasNonFinite = true; nonFinite += o.nonFinite }
    if (o.huge != null && !o.huge.isEmpty) hugeState.merge(o.huge)
    if (o.e1 == RsumD.EMPTY) return
    // RsumD.merge consumes its B argument (demote/renormalize in place);
    // keep the public API side-effect free on `o` by merging a copy when
    // a lossy demote of `o` would be needed.
    if (e1 != RsumD.EMPTY && e1 > o.e1) {
      val sb = o.s.clone(); val cb = o.c.clone()
      e1 = RsumD.merge(s, c, 0, e1, sb, cb, 0, o.e1, levels)
    } else {
      // content-preserving normalization of `o` is acceptable; demotion of
      // `o` cannot happen on this branch
      e1 = RsumD.merge(s, c, 0, e1, o.s, o.c, 0, o.e1, levels)
    }
  }

  /** Finalized sum (deterministic function of the canonical state). */
  def value: Double = {
    if (hasNonFinite) return nonFinite
    val base = RsumD.eval(s, c, 0, levels, e1)
    if (huge == null || huge.isEmpty) base
    else Math.scalb(huge.value, ReproDouble.HugeScaleLog) + base
  }

  def copy(): ReproDouble =
    new ReproDouble(levels, s.clone(), c.clone(), e1, nonFinite, hasNonFinite,
                    if (huge == null) null else huge.copy())

  def reset(): Unit = {
    e1 = RsumD.EMPTY
    nonFinite = 0.0
    hasNonFinite = false
    huge = null
    java.util.Arrays.fill(s, 0.0)
    java.util.Arrays.fill(c, 0L)
  }

  /** Bitwise state equality — the reproducibility criterion used in tests.
    * Both states are normalized first (normalization is content-preserving).
    */
  def bitEquals(o: ReproDouble): Boolean = {
    if (levels != o.levels) return false
    if (e1 != RsumD.EMPTY) RsumD.propagate(s, c, 0, levels, e1)
    if (o.e1 != RsumD.EMPTY) RsumD.propagate(o.s, o.c, 0, levels, o.e1)
    val hugeEq = (huge == null || huge.isEmpty) && (o.huge == null || o.huge.isEmpty) ||
      (huge != null && o.huge != null && huge.bitEquals(o.huge))
    e1 == o.e1 && hasNonFinite == o.hasNonFinite && hugeEq &&
    java.lang.Double.doubleToRawLongBits(nonFinite) == java.lang.Double.doubleToRawLongBits(o.nonFinite) &&
    s.indices.forall(i =>
      java.lang.Double.doubleToRawLongBits(s(i)) == java.lang.Double.doubleToRawLongBits(o.s(i))) &&
    java.util.Arrays.equals(c, o.c)
  }

  /** Binary image (for Spark aggregation-buffer shipping). */
  def serialize(): Array[Byte] = {
    val hugeImg: Array[Byte] =
      if (huge == null || huge.isEmpty) Array.emptyByteArray else huge.serialize()
    val bb = ByteBuffer.allocate(ReproDouble.baseByteSize(levels) + 4 + hugeImg.length)
    bb.putInt(levels).putInt(e1)
    bb.put(if (hasNonFinite) 1.toByte else 0.toByte)
    bb.putDouble(nonFinite)
    var l = 0
    while (l < levels) { bb.putDouble(s(l)); l += 1 }
    l = 0
    while (l < levels) { bb.putLong(c(l)); l += 1 }
    bb.putInt(hugeImg.length).put(hugeImg)
    bb.array()
  }
}

object ReproDouble {
  /** |b| >= 2^987 needs an out-of-range extractor and is routed to the
    * scaled state.
    */
  val HugeThreshold: Double = java.lang.Math.scalb(1.0, 987)
  val HugeScaleLog: Int     = 600
  val HugeScaleDown: Double = java.lang.Math.scalb(1.0, -HugeScaleLog)

  private[core] def baseByteSize(levels: Int): Int = 4 + 4 + 1 + 8 + 16 * levels

  def deserialize(bytes: Array[Byte]): ReproDouble = deserialize(ByteBuffer.wrap(bytes))

  private def deserialize(bb: ByteBuffer): ReproDouble = {
    val levels = bb.getInt
    val st = new ReproDouble(levels)
    st.e1 = bb.getInt
    st.hasNonFinite = bb.get() != 0
    st.nonFinite = bb.getDouble
    var l = 0
    while (l < levels) { st.s(l) = bb.getDouble; l += 1 }
    l = 0
    while (l < levels) { st.c(l) = bb.getLong; l += 1 }
    val hugeLen = bb.getInt
    if (hugeLen > 0) {
      val img = new Array[Byte](hugeLen)
      bb.get(img)
      st.huge = ReproDouble.deserialize(img)
    }
    st
  }

  /** Convenience: reproducible sum of an array (scalar path). */
  def sum(values: Array[Double], levels: Int): Double = {
    val st = new ReproDouble(levels)
    var i = 0
    while (i < values.length) { st.add(values(i)); i += 1 }
    st.value
  }

  /** Convenience: reproducible sum of an array (batched path). */
  def sumBatched(values: Array[Double], levels: Int): Double = {
    val st = new ReproDouble(levels)
    st.addBatch(values, 0, values.length, new RsumBatchD(levels))
    st.value
  }
}
