package repro.exec

import repro.core._

/** Hash aggregation kernels (paper's HASHAGGREGATION, §IV/§V): open
  * addressing with identity hashing — the paper's choice, realistic for
  * column stores with dense domain-encoded keys. One specialized workspace
  * class per accumulator data type, so the cost differences between
  * built-in, DECIMAL, `repro<T,L>` and summation-buffer aggregates are
  * those of the accumulators, not of megamorphic dispatch.
  *
  * A workspace is allocated ONCE per operator invocation and reused across
  * partitions via `reset()` (the paper's operators do the same; per-
  * partition allocation would dominate the run time and wreck the cache
  * footprint the experiments study).
  *
  * `aggregate` accumulates `keys/values(from until to)` probing from
  * `(key >>> shift) & (cap-1)` — after `d` partitioning levels the low
  * `8*d` key bits are constant within a partition, so `shift = 8*d`
  * spreads the probe sequence. `emit` finalizes the table into
  * `outKeys/outVals` at `outPos` and returns the new cursor.
  */
object HashAgg {
  /** Smallest power of two >= 2*x (load factor <= 0.5). */
  def capacityFor(x: Int): Int = {
    var cap = 16
    while (cap < 2 * x) cap <<= 1
    cap
  }
}

/** Built-in double accumulator — the non-reproducible baseline. */
final class PlainDTable(val cap: Int) {
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val slotSum = new Array[Double](cap)
  reset()

  def reset(): Unit = java.util.Arrays.fill(slotKey, -1)

  def aggregate(keys: Array[Int], values: Array[Double], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      if (slotKey(h) != k) { slotKey(h) = k; slotSum(h) = values(i) }
      else slotSum(h) += values(i)
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) { outKeys(p) = slotKey(i); outVals(p) = slotSum(i); p += 1 }
      i += 1
    }
    p
  }
}

/** Built-in float accumulator. */
final class PlainFTable(val cap: Int) {
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val slotSum = new Array[Float](cap)
  reset()

  def reset(): Unit = java.util.Arrays.fill(slotKey, -1)

  def aggregate(keys: Array[Int], values: Array[Float], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      if (slotKey(h) != k) { slotKey(h) = k; slotSum(h) = values(i) }
      else slotSum(h) += values(i)
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) { outKeys(p) = slotKey(i); outVals(p) = slotSum(i).toDouble; p += 1 }
      i += 1
    }
    p
  }
}

/** DECIMAL(19) reference: 64-bit integer accumulation of values scaled by
  * 10^4 (the paper implements DECIMAL(p) as built-in integers).
  */
final class Dec64Table(val cap: Int) {
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val slotSum = new Array[Long](cap)
  reset()

  def reset(): Unit = java.util.Arrays.fill(slotKey, -1)

  def aggregate(keys: Array[Int], values: Array[Double], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      val v = Math.round(values(i) * 10000.0)
      if (slotKey(h) != k) { slotKey(h) = k; slotSum(h) = v }
      else slotSum(h) += v
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) { outKeys(p) = slotKey(i); outVals(p) = slotSum(i) / 10000.0; p += 1 }
      i += 1
    }
    p
  }
}

/** `repro<double,L>` WITHOUT summation buffers (§IV): the state lives
  * inline in the table (struct-of-arrays), `operator+=(double)` per row.
  */
final class ReproDTable(val cap: Int, val levels: Int) {
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val s = new Array[Double](cap * levels)
  private val c = new Array[Long](cap * levels)
  private val e1 = new Array[Int](cap)
  reset()

  def reset(): Unit = {
    java.util.Arrays.fill(slotKey, -1)
    java.util.Arrays.fill(e1, RsumD.EMPTY)
  }

  def aggregate(keys: Array[Int], values: Array[Double], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      slotKey(h) = k
      e1(h) = RsumD.add(s, c, h * levels, levels, e1(h), values(i))
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) {
        outKeys(p) = slotKey(i)
        outVals(p) = RsumD.eval(s, c, i * levels, levels, e1(i))
        p += 1
      }
      i += 1
    }
    p
  }
}

/** `repro<float,L>` WITHOUT summation buffers. */
final class ReproFTable(val cap: Int, val levels: Int) {
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val s = new Array[Float](cap * levels)
  private val c = new Array[Long](cap * levels)
  private val e1 = new Array[Int](cap)
  reset()

  def reset(): Unit = {
    java.util.Arrays.fill(slotKey, -1)
    java.util.Arrays.fill(e1, RsumF.EMPTY)
  }

  def aggregate(keys: Array[Int], values: Array[Float], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      slotKey(h) = k
      e1(h) = RsumF.add(s, c, h * levels, levels, e1(h), values(i))
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) {
        outKeys(p) = slotKey(i)
        outVals(p) = RsumF.eval(s, c, i * levels, levels, e1(i)).toDouble
        p += 1
      }
      i += 1
    }
    p
  }
}

/** `repro<double,L>` WITH summation buffers (§V-A, Fig. 5): each slot is
  * the repro state + a `bsz`-value buffer + its fill offset; values are
  * appended per row and flushed through the vectorized kernel when full.
  */
final class BufDTable(val cap: Int, val levels: Int, val bsz: Int) {
  require(bsz >= 1, s"bsz must be >= 1, got $bsz")
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val s = new Array[Double](cap * levels)
  private val c = new Array[Long](cap * levels)
  private val e1 = new Array[Int](cap)
  private val buf = new Array[Double](cap * bsz)
  private val next = new Array[Int](cap)
  private val scratch = new RsumBatchD(levels)
  reset()

  def reset(): Unit = {
    java.util.Arrays.fill(slotKey, -1)
    java.util.Arrays.fill(e1, RsumD.EMPTY)
    java.util.Arrays.fill(next, 0)
  }

  def aggregate(keys: Array[Int], values: Array[Double], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      slotKey(h) = k
      val n = next(h)
      buf(h * bsz + n) = values(i)
      if (n + 1 == bsz) {
        e1(h) = scratch.run(buf, h * bsz, bsz, s, c, h * levels, e1(h))
        next(h) = 0
      } else next(h) = n + 1
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) {
        val n = next(i)
        var e = e1(i)
        if (n > 0) e = scratch.run(buf, i * bsz, n, s, c, i * levels, e)
        outKeys(p) = slotKey(i)
        outVals(p) = RsumD.eval(s, c, i * levels, levels, e)
        p += 1
      }
      i += 1
    }
    p
  }
}

/** `repro<float,L>` WITH summation buffers. */
final class BufFTable(val cap: Int, val levels: Int, val bsz: Int) {
  require(bsz >= 1, s"bsz must be >= 1, got $bsz")
  private val mask = cap - 1
  private val slotKey = new Array[Int](cap)
  private val s = new Array[Float](cap * levels)
  private val c = new Array[Long](cap * levels)
  private val e1 = new Array[Int](cap)
  private val buf = new Array[Float](cap * bsz)
  private val next = new Array[Int](cap)
  private val scratch = new RsumBatchF(levels)
  reset()

  def reset(): Unit = {
    java.util.Arrays.fill(slotKey, -1)
    java.util.Arrays.fill(e1, RsumF.EMPTY)
    java.util.Arrays.fill(next, 0)
  }

  def aggregate(keys: Array[Int], values: Array[Float], from: Int, to: Int, shift: Int): Unit = {
    var i = from
    while (i < to) {
      val k = keys(i)
      var h = (k >>> shift) & mask
      while (slotKey(h) != k && slotKey(h) != -1) h = (h + 1) & mask
      slotKey(h) = k
      val n = next(h)
      buf(h * bsz + n) = values(i)
      if (n + 1 == bsz) {
        e1(h) = scratch.run(buf, h * bsz, bsz, s, c, h * levels, e1(h))
        next(h) = 0
      } else next(h) = n + 1
      i += 1
    }
  }

  def emit(outKeys: Array[Int], outVals: Array[Double], outPos: Int): Int = {
    var p = outPos
    var i = 0
    while (i < cap) {
      if (slotKey(i) != -1) {
        val n = next(i)
        var e = e1(i)
        if (n > 0) e = scratch.run(buf, i * bsz, n, s, c, i * levels, e)
        outKeys(p) = slotKey(i)
        outVals(p) = RsumF.eval(s, c, i * levels, levels, e).toDouble
        p += 1
      }
      i += 1
    }
    p
  }
}
