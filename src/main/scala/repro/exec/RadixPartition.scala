package repro.exec

/** Radix partitioning on the group key (paper §V-B): fan-out f=256 per
  * level, `d` levels giving `F = 256^d` partitions. Keys are dense group
  * ids, and the paper uses identity hashing, so the partition function is
  * simply the low `8*d` bits of the key.
  *
  * Implemented as `d` stable LSD counting-sort passes over the whole input
  * (histogram + scatter), which matches the cost structure of the paper's
  * "zero or more levels of partitioning": each level streams all records
  * once. After the passes the records are ordered by partition id
  * `key & (F-1)` and `offsets` delimits the partitions.
  */
object RadixPartition {

  /** One stable scatter pass on byte `(key >>> shift) & 255`. */
  def pass(keysIn: Array[Int], valsIn: Array[Double],
           keysOut: Array[Int], valsOut: Array[Double], shift: Int): Unit = {
    val n = keysIn.length
    val hist = new Array[Int](257)
    var i = 0
    while (i < n) { hist(((keysIn(i) >>> shift) & 255) + 1) += 1; i += 1 }
    i = 0
    while (i < 256) { hist(i + 1) += hist(i); i += 1 }
    i = 0
    while (i < n) {
      val b = (keysIn(i) >>> shift) & 255
      val pos = hist(b)
      hist(b) = pos + 1
      keysOut(pos) = keysIn(i)
      valsOut(pos) = valsIn(i)
      i += 1
    }
  }

  /** Float-valued variant of [[pass]]. */
  def passF(keysIn: Array[Int], valsIn: Array[Float],
            keysOut: Array[Int], valsOut: Array[Float], shift: Int): Unit = {
    val n = keysIn.length
    val hist = new Array[Int](257)
    var i = 0
    while (i < n) { hist(((keysIn(i) >>> shift) & 255) + 1) += 1; i += 1 }
    i = 0
    while (i < 256) { hist(i + 1) += hist(i); i += 1 }
    i = 0
    while (i < n) {
      val b = (keysIn(i) >>> shift) & 255
      val pos = hist(b)
      hist(b) = pos + 1
      keysOut(pos) = keysIn(i)
      valsOut(pos) = valsIn(i)
      i += 1
    }
  }

  /** Result of a `d`-level partitioning: permuted key/value arrays plus the
    * `256^d + 1` partition boundaries (partition `p` holds the records with
    * `key & (256^d - 1) == p`, at `keys(offsets(p) until offsets(p+1))`).
    */
  final case class PartitionedD(keys: Array[Int], values: Array[Double], offsets: Array[Int])
  final case class PartitionedF(keys: Array[Int], values: Array[Float], offsets: Array[Int])

  /** `d` levels of partitioning of double-valued records; `d == 0` is a
    * no-op forward (paper: "PARALLELPARTITION is a no-op that forwards its
    * input" when F=1).
    */
  def partition(keys: Array[Int], values: Array[Double], d: Int): PartitionedD = {
    require(d >= 0 && d <= 3, s"partition depth must be in [0,3], got $d")
    val n = keys.length
    if (d == 0) return PartitionedD(keys, values, Array(0, n))
    var kIn = keys.clone(); var vIn = values.clone()
    var kOut = new Array[Int](n); var vOut = new Array[Double](n)
    var level = 0
    while (level < d) {
      pass(kIn, vIn, kOut, vOut, 8 * level)
      val tk = kIn; kIn = kOut; kOut = tk
      val tv = vIn; vIn = vOut; vOut = tv
      level += 1
    }
    PartitionedD(kIn, vIn, offsets(kIn, d))
  }

  /** `d` levels of partitioning of float-valued records. */
  def partitionF(keys: Array[Int], values: Array[Float], d: Int): PartitionedF = {
    require(d >= 0 && d <= 3, s"partition depth must be in [0,3], got $d")
    val n = keys.length
    if (d == 0) return PartitionedF(keys, values, Array(0, n))
    var kIn = keys.clone(); var vIn = values.clone()
    var kOut = new Array[Int](n); var vOut = new Array[Float](n)
    var level = 0
    while (level < d) {
      passF(kIn, vIn, kOut, vOut, 8 * level)
      val tk = kIn; kIn = kOut; kOut = tk
      val tv = vIn; vIn = vOut; vOut = tv
      level += 1
    }
    PartitionedF(kIn, vIn, offsets(kIn, d))
  }

  private def offsets(sortedKeys: Array[Int], d: Int): Array[Int] = {
    val fanout = 1 << (8 * d)
    val mask = fanout - 1
    val off = new Array[Int](fanout + 1)
    var i = 0
    while (i < sortedKeys.length) { off((sortedKeys(i) & mask) + 1) += 1; i += 1 }
    i = 0
    while (i < fanout) { off(i + 1) += off(i); i += 1 }
    off
  }
}
