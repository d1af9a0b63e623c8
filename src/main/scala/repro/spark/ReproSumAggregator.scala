package repro.spark

import java.nio.ByteBuffer

import org.apache.spark.sql.{Encoder, Encoders, SparkSession, functions}
import org.apache.spark.sql.expressions.Aggregator

import repro.core.ReproDouble

/** Stable-API variant of the reproducible SUM: an
  * `org.apache.spark.sql.expressions.Aggregator` usable through
  * `functions.udaf` from the DataFrame/Dataset layer without touching
  * Catalyst internals. The buffer is the serialized repro state (plus a
  * non-null count), so the merge tree Spark chooses cannot affect the
  * result.
  *
  * This path pays encoder/serialization costs per row; it exists for API
  * parity and tests — the Catalyst expression [[ReproSum]] is the
  * performance-relevant integration.
  */
final class ReproSumAggregator(levels: Int)
    extends Aggregator[java.lang.Double, Array[Byte], java.lang.Double] {

  private def pack(count: Long, st: ReproDouble): Array[Byte] = {
    val inner = st.serialize()
    ByteBuffer.allocate(8 + inner.length).putLong(count).put(inner).array()
  }

  private def unpack(b: Array[Byte]): (Long, ReproDouble) = {
    val bb = ByteBuffer.wrap(b)
    val count = bb.getLong
    val rest = new Array[Byte](b.length - 8)
    bb.get(rest)
    (count, ReproDouble.deserialize(rest))
  }

  override def zero: Array[Byte] = pack(0L, new ReproDouble(levels))

  override def reduce(b: Array[Byte], a: java.lang.Double): Array[Byte] = {
    if (a == null) b
    else {
      val (count, st) = unpack(b)
      st.add(a.doubleValue())
      pack(count + 1, st)
    }
  }

  override def merge(b1: Array[Byte], b2: Array[Byte]): Array[Byte] = {
    val (c1, s1) = unpack(b1)
    val (c2, s2) = unpack(b2)
    s1.merge(s2)
    pack(c1 + c2, s1)
  }

  override def finish(reduction: Array[Byte]): java.lang.Double = {
    val (count, st) = unpack(reduction)
    if (count == 0) null else java.lang.Double.valueOf(st.value)
  }

  override def bufferEncoder: Encoder[Array[Byte]] = Encoders.BINARY
  override def outputEncoder: Encoder[java.lang.Double] = Encoders.DOUBLE
}

object ReproSumAggregator {
  /** Registers `rsum_agg(x)` (L=2) as a UDAF in the session. */
  def register(spark: SparkSession, levels: Int = 2): Unit =
    spark.udf.register("rsum_agg", functions.udaf(new ReproSumAggregator(levels), Encoders.DOUBLE))
}
