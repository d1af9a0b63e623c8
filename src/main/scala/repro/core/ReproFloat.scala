package repro.core

import java.nio.ByteBuffer

/** The paper's `repro<float,L>` data type — binary32 mirror of
  * [[ReproDouble]]; see that class for semantics. Values with |b| >= 2^120
  * would need an out-of-range extractor (`E(b) + M - W + 2 > 127`) and are
  * routed to a second state over the exactly-scaled domain `b * 2^-60`.
  */
final class ReproFloat private (val levels: Int,
                                private[core] val s: Array[Float],
                                private[core] val c: Array[Long],
                                private[core] var e1: Int,
                                private[core] var nonFinite: Float,
                                private[core] var hasNonFinite: Boolean,
                                private[core] var huge: ReproFloat)
    extends Serializable {

  def this(levels: Int) =
    this(levels, new Array[Float](levels), new Array[Long](levels),
         RsumF.EMPTY, 0.0f, false, null)

  require(levels >= 1 && levels <= 16, s"levels must be in [1,16], got $levels")

  def isEmpty: Boolean =
    e1 == RsumF.EMPTY && !hasNonFinite && (huge == null || huge.isEmpty)

  def add(b: Float): Unit = {
    val a = Math.abs(b)
    if (a < ReproFloat.HugeThreshold) e1 = RsumF.add(s, c, 0, levels, e1, b)
    else if (java.lang.Float.isFinite(b)) hugeState.add(b * ReproFloat.HugeScaleDown)
    else { hasNonFinite = true; nonFinite += b }
  }

  private def hugeState: ReproFloat = {
    if (huge == null) huge = new ReproFloat(levels)
    huge
  }

  def addBatch(values: Array[Float], from: Int, len: Int, scratch: RsumBatchF): Unit = {
    require(scratch.levels == levels, "scratch lane width mismatch")
    var inDomain = true
    var i = from
    val end = from + len
    while (i < end) {
      if (!(Math.abs(values(i)) < ReproFloat.HugeThreshold)) { inDomain = false; i = end }
      else i += 1
    }
    if (inDomain) e1 = scratch.run(values, from, len, s, c, 0, e1)
    else {
      var j = from
      while (j < end) { add(values(j)); j += 1 }
    }
  }

  def merge(o: ReproFloat): Unit = {
    require(o.levels == levels, s"cannot merge repro<float,${o.levels}> into repro<float,$levels>")
    if (o.hasNonFinite) { hasNonFinite = true; nonFinite += o.nonFinite }
    if (o.huge != null && !o.huge.isEmpty) hugeState.merge(o.huge)
    if (o.e1 == RsumF.EMPTY) return
    if (e1 != RsumF.EMPTY && e1 > o.e1) {
      val sb = o.s.clone(); val cb = o.c.clone()
      e1 = RsumF.merge(s, c, 0, e1, sb, cb, 0, o.e1, levels)
    } else {
      e1 = RsumF.merge(s, c, 0, e1, o.s, o.c, 0, o.e1, levels)
    }
  }

  def value: Float = {
    if (hasNonFinite) return nonFinite
    val base = RsumF.eval(s, c, 0, levels, e1)
    if (huge == null || huge.isEmpty) base
    else Math.scalb(huge.value, ReproFloat.HugeScaleLog) + base
  }

  def copy(): ReproFloat =
    new ReproFloat(levels, s.clone(), c.clone(), e1, nonFinite, hasNonFinite,
                   if (huge == null) null else huge.copy())

  def reset(): Unit = {
    e1 = RsumF.EMPTY
    nonFinite = 0.0f
    hasNonFinite = false
    huge = null
    java.util.Arrays.fill(s, 0.0f)
    java.util.Arrays.fill(c, 0L)
  }

  def bitEquals(o: ReproFloat): Boolean = {
    if (levels != o.levels) return false
    if (e1 != RsumF.EMPTY) RsumF.propagate(s, c, 0, levels, e1)
    if (o.e1 != RsumF.EMPTY) RsumF.propagate(o.s, o.c, 0, levels, o.e1)
    val hugeEq = (huge == null || huge.isEmpty) && (o.huge == null || o.huge.isEmpty) ||
      (huge != null && o.huge != null && huge.bitEquals(o.huge))
    e1 == o.e1 && hasNonFinite == o.hasNonFinite && hugeEq &&
    java.lang.Float.floatToRawIntBits(nonFinite) == java.lang.Float.floatToRawIntBits(o.nonFinite) &&
    s.indices.forall(i =>
      java.lang.Float.floatToRawIntBits(s(i)) == java.lang.Float.floatToRawIntBits(o.s(i))) &&
    java.util.Arrays.equals(c, o.c)
  }

  def serialize(): Array[Byte] = {
    val hugeImg: Array[Byte] =
      if (huge == null || huge.isEmpty) Array.emptyByteArray else huge.serialize()
    val bb = ByteBuffer.allocate(ReproFloat.baseByteSize(levels) + 4 + hugeImg.length)
    bb.putInt(levels).putInt(e1)
    bb.put(if (hasNonFinite) 1.toByte else 0.toByte)
    bb.putFloat(nonFinite)
    var l = 0
    while (l < levels) { bb.putFloat(s(l)); l += 1 }
    l = 0
    while (l < levels) { bb.putLong(c(l)); l += 1 }
    bb.putInt(hugeImg.length).put(hugeImg)
    bb.array()
  }
}

object ReproFloat {
  val HugeThreshold: Float = java.lang.Math.scalb(1.0f, 120)
  val HugeScaleLog: Int    = 60
  val HugeScaleDown: Float = java.lang.Math.scalb(1.0f, -HugeScaleLog)

  private[core] def baseByteSize(levels: Int): Int = 4 + 4 + 1 + 4 + 12 * levels

  def deserialize(bytes: Array[Byte]): ReproFloat = deserialize(ByteBuffer.wrap(bytes))

  private def deserialize(bb: ByteBuffer): ReproFloat = {
    val levels = bb.getInt
    val st = new ReproFloat(levels)
    st.e1 = bb.getInt
    st.hasNonFinite = bb.get() != 0
    st.nonFinite = bb.getFloat
    var l = 0
    while (l < levels) { st.s(l) = bb.getFloat; l += 1 }
    l = 0
    while (l < levels) { st.c(l) = bb.getLong; l += 1 }
    val hugeLen = bb.getInt
    if (hugeLen > 0) {
      val img = new Array[Byte](hugeLen)
      bb.get(img)
      st.huge = ReproFloat.deserialize(img)
    }
    st
  }

  def sum(values: Array[Float], levels: Int): Float = {
    val st = new ReproFloat(levels)
    var i = 0
    while (i < values.length) { st.add(values(i)); i += 1 }
    st.value
  }

  def sumBatched(values: Array[Float], levels: Int): Float = {
    val st = new ReproFloat(levels)
    st.addBatch(values, 0, values.length, new RsumBatchF(levels))
    st.value
  }
}
