package repro.exec

import org.scalatest.funsuite.AnyFunSuite
import repro.SynthData
import repro.core.ExactSum.bits
import scala.util.Random

class RadixPartitionSpec extends AnyFunSuite {

  test("d=0 is a no-op forward") {
    val keys = SynthData.localUniformKeys(1000, 64, 1)
    val vals = SynthData.localUniformValues(1000, 2)
    val p = RadixPartition.partition(keys, vals, 0)
    assert(p.keys.sameElements(keys) && p.values.sameElements(vals))
    assert(p.offsets.sameElements(Array(0, 1000)))
  }

  for (d <- 1 to 2) {
    test(s"d=$d: output is a permutation of the input") {
      val n = 10000
      val keys = SynthData.localUniformKeys(n, 5000, 3)
      val vals = SynthData.localUniformValues(n, 4)
      val p = RadixPartition.partition(keys, vals, d)
      val inPairs  = keys.zip(vals).sorted
      val outPairs = p.keys.zip(p.values).sorted
      assert(inPairs.sameElements(outPairs))
    }

    test(s"d=$d: every record lands in the partition of its low bits, boundaries consistent") {
      val n = 10000
      val fanout = 1 << (8 * d)
      val keys = SynthData.localUniformKeys(n, 70000, 5)
      val vals = SynthData.localUniformValues(n, 6)
      val p = RadixPartition.partition(keys, vals, d)
      assert(p.offsets.length == fanout + 1)
      assert(p.offsets(0) == 0 && p.offsets(fanout) == n)
      for (part <- 0 until fanout; i <- p.offsets(part) until p.offsets(part + 1))
        assert((p.keys(i) & (fanout - 1)) == part)
    }

    test(s"d=$d: partitioning is stable within a partition") {
      // stability matters for determinism of downstream iteration order
      val keys = Array(5, 5, 5, 5, 5)
      val vals = Array(1.0, 2.0, 3.0, 4.0, 5.0)
      val p = RadixPartition.partition(keys, vals, d)
      assert(p.values.sameElements(vals))
    }
  }

  test("float variant partitions identically to the double variant") {
    val n = 5000
    val keys = SynthData.localUniformKeys(n, 3000, 7)
    val vals = SynthData.localUniformValues(n, 8)
    val pd = RadixPartition.partition(keys, vals, 1)
    val pf = RadixPartition.partitionF(keys, SynthData.toFloats(vals), 1)
    assert(pd.keys.sameElements(pf.keys))
    assert(pd.offsets.sameElements(pf.offsets))
  }
}

class HashAggSpec extends AnyFunSuite {

  /** Order-insensitive reference: exact per-group sums via BigDecimal. */
  private def reference(keys: Array[Int], vals: Array[Double]): Map[Int, BigDecimal] =
    keys.zip(vals).groupBy(_._1).map { case (k, kvs) =>
      k -> kvs.foldLeft(BigDecimal(0))((a, kv) => a + BigDecimal(kv._2))
    }

  private def checkClose(got: (Array[Int], Array[Double]), ref: Map[Int, BigDecimal],
                         tol: Double): Unit = {
    val m = got._1.zip(got._2).toMap
    assert(m.keySet == ref.keySet, "group key sets differ")
    for ((k, exp) <- ref)
      assert((exp - BigDecimal(m(k))).abs.toDouble <= tol, s"group $k: got ${m(k)} exp $exp")
  }

  val kinds: Seq[AggKind] = Seq(
    AggKind.PlainD, AggKind.Dec64,
    AggKind.ReproD(1), AggKind.ReproD(2), AggKind.ReproD(3), AggKind.ReproD(4),
    AggKind.BufD(2, 16), AggKind.BufD(2, 256), AggKind.BufD(4, 64))

  for (kind <- kinds; d <- 0 to 2) {
    test(s"${kind.name}, d=$d: correct group sums (uniform values)") {
      val n = 20000; val g = 700
      val keys = SynthData.localUniformKeys(n, g, 11)
      val vals = SynthData.localUniformValues(n, 12)
      val got = PartitionAndAggregate.run(keys, vals, g, d, kind)
      // L=1 keeps only the top W bits per group (Eq. 6 allows ~2^-13 per
      // value at this magnitude); deeper levels are near-exact here
      val tol = kind match {
        case AggKind.Dec64        => 0.01 * n
        case AggKind.ReproD(1)    => (n.toDouble / g) * math.pow(2.0, -13) * 4
        case _                    => 1e-6
      }
      checkClose(got, reference(keys, vals), tol)
    }
  }

  val floatKinds: Seq[AggKind] = Seq(
    AggKind.PlainF, AggKind.ReproF(1), AggKind.ReproF(2), AggKind.ReproF(4),
    AggKind.BufF(2, 16), AggKind.BufF(3, 128))

  for (kind <- floatKinds; d <- 0 to 1) {
    test(s"${kind.name}, d=$d: correct group sums (uniform values)") {
      val n = 20000; val g = 700
      val keys = SynthData.localUniformKeys(n, g, 13)
      val vals = SynthData.toFloats(SynthData.localUniformValues(n, 14))
      val got = PartitionAndAggregate.runF(keys, vals, g, d, kind)
      val ref = keys.zip(vals).groupBy(_._1).map { case (k, kvs) =>
        k -> kvs.foldLeft(BigDecimal(0))((a, kv) => a + BigDecimal(kv._2.toDouble))
      }
      val m = got._1.zip(got._2).toMap
      assert(m.keySet == ref.keySet)
      for ((k, exp) <- ref)
        assert((exp - BigDecimal(m(k))).abs.toDouble <= 0.5, s"group $k")
    }
  }

  test("single-group input aggregates to the full sum") {
    val vals = SynthData.localUniformValues(5000, 15)
    val got = PartitionAndAggregate.run(Array.fill(5000)(0), vals, 1, 0, AggKind.ReproD(2))
    assert(got._1.sameElements(Array(0)))
    assert(math.abs(got._2(0) - vals.sum) < 1e-6)
  }

  test("all-distinct input emits one row per record") {
    val n = 4096
    val keys = Array.range(0, n)
    val vals = SynthData.localUniformValues(n, 16)
    for (kind <- Seq(AggKind.PlainD, AggKind.ReproD(2), AggKind.BufD(2, 8)); d <- 0 to 1) {
      val got = PartitionAndAggregate.run(keys, vals, n, d, kind)
      assert(got._1.length == n, s"${kind.name}, d=$d")
      val m = got._1.zip(got._2).toMap
      for (i <- 0 until n) assert(m(i) == vals(i), s"${kind.name}, d=$d, key $i")
    }
  }

  test("empty input emits no rows") {
    for (kind <- Seq(AggKind.PlainD, AggKind.ReproD(2), AggKind.BufD(2, 8))) {
      val got = PartitionAndAggregate.run(new Array[Int](0), new Array[Double](0), 1, 0, kind)
      assert(got._1.isEmpty && got._2.isEmpty)
    }
  }

  // ------------------------------------------------- bit-reproducibility

  for (l <- 1 to 4) {
    test(s"repro<double,$l>: identical result bits across permutations and depths") {
      val n = 30000; val g = 1000
      val keys = SynthData.localUniformKeys(n, g, 21)
      val vals = SynthData.localMixedValues(n, 22)
      val ref = PartitionAndAggregate.run(keys, vals, g, 0, AggKind.ReproD(l))
      val refMap = ref._1.zip(ref._2.map(bits)).toMap
      val r = new Random(23)
      for (trial <- 1 to 3; d <- 0 to 2) {
        val perm = r.shuffle(keys.indices.toList).toArray
        val pk = perm.map(keys); val pv = perm.map(vals)
        val got = PartitionAndAggregate.run(pk, pv, g, d, AggKind.ReproD(l))
        val gotMap = got._1.zip(got._2.map(bits)).toMap
        assert(gotMap == refMap, s"trial=$trial d=$d")
      }
    }
  }

  test("repro buffered: identical result bits across permutations, depths and buffer sizes") {
    val n = 30000; val g = 1000
    val keys = SynthData.localUniformKeys(n, g, 31)
    val vals = SynthData.localMixedValues(n, 32)
    val ref = PartitionAndAggregate.run(keys, vals, g, 0, AggKind.ReproD(2))
    val refMap = ref._1.zip(ref._2.map(bits)).toMap
    val r = new Random(33)
    for (bsz <- Seq(1, 8, 64, 1024); d <- 0 to 2) {
      val perm = r.shuffle(keys.indices.toList).toArray
      val pk = perm.map(keys); val pv = perm.map(vals)
      val got = PartitionAndAggregate.run(pk, pv, g, d, AggKind.BufD(2, bsz))
      val gotMap = got._1.zip(got._2.map(bits)).toMap
      assert(gotMap == refMap, s"bsz=$bsz d=$d")
    }
  }

  test("plain double aggregation is NOT permutation-stable on adversarial data (sanity)") {
    val n = 30000; val g = 4
    val keys = SynthData.localUniformKeys(n, g, 41)
    val vals = SynthData.localMixedValues(n, 42)
    val ref = PartitionAndAggregate.run(keys, vals, g, 0, AggKind.PlainD)
    val refMap = ref._1.zip(ref._2.map(bits)).toMap
    val r = new Random(43)
    val anyDiff = (1 to 5).exists { _ =>
      val perm = r.shuffle(keys.indices.toList).toArray
      val got = PartitionAndAggregate.run(perm.map(keys), perm.map(vals), g, 0, AggKind.PlainD)
      got._1.zip(got._2.map(bits)).toMap != refMap
    }
    assert(anyDiff, "expected plain double group sums to differ across permutations")
  }

  // ----------------------------------------------------------- tuning model

  test("Eq.4 buffer-size model: monotone in groups, clamped to [8, BszMax]") {
    import PartitionAndAggregate.bszFor
    assert(bszFor(1, 1, 8) == PartitionAndAggregate.BszMax)
    assert(bszFor(1 << 24, 1, 8) == 8)
    assert(bszFor(1 << 14, 1, 8) == (PartitionAndAggregate.CacheBytes / ((1 << 14) * 8)))
    assert(bszFor(1 << 14, 256, 8) >= bszFor(1 << 14, 1, 8))
    val sizes = Seq(1 << 6, 1 << 10, 1 << 14, 1 << 18).map(g => bszFor(g, 1, 8))
    assert(sizes == sizes.sorted.reverse)
  }

  test("depth model matches the offline-tuned thresholds") {
    import PartitionAndAggregate.depthFor
    assert(depthFor(1 << 6) == 0)
    assert(depthFor((1 << 15) - 1) == 0)
    assert(depthFor(1 << 15) == 1)
    assert(depthFor(1 << 21) == 1)
    assert(depthFor(1 << 22) == 2)
    // ordering vs built-ins: buffered repro partitions earlier
    assert(TableIIIDepthCheck.builtinThreshold > (1 << 15))
  }
}

/** Indirection so the exec-layer spec can check the relative ordering of
  * the two depth models without depending on the tables package directly.
  */
object TableIIIDepthCheck {
  def builtinThreshold: Int = {
    var g = 1
    while (repro.tables.TableIII.builtinDepthFor(g) == 0) g <<= 1
    g
  }
}

class SortAggSpec extends AnyFunSuite {

  test("sorted aggregation computes correct sums") {
    val n = 5000; val g = 100
    val keys = SynthData.localUniformKeys(n, g, 51)
    val vals = SynthData.localUniformValues(n, 52)
    val (gk, gv) = SortAgg.run(keys, vals)
    val ref = keys.zip(vals).groupBy(_._1)
    assert(gk.length == ref.size)
    val m = gk.zip(gv).toMap
    for ((k, kvs) <- ref)
      assert(math.abs(m(k) - kvs.map(_._2).sum) < 1e-6)
  }

  test("sorted aggregation is bit-reproducible across permutations (by construction)") {
    val n = 5000; val g = 20
    val keys = SynthData.localUniformKeys(n, g, 53)
    val vals = SynthData.localMixedValues(n, 54)
    val ref = SortAgg.run(keys, vals)
    val refMap = ref._1.zip(ref._2.map(bits)).toMap
    val r = new Random(55)
    for (_ <- 1 to 5) {
      val perm = r.shuffle(keys.indices.toList).toArray
      val got = SortAgg.run(perm.map(keys), perm.map(vals))
      assert(got._1.zip(got._2.map(bits)).toMap == refMap)
    }
  }

  test("sorted aggregation emits keys in ascending order") {
    val keys = Array(3, 1, 2, 1, 3, 0)
    val vals = Array(1.0, 2.0, 3.0, 4.0, 5.0, 6.0)
    val (gk, gv) = SortAgg.run(keys, vals)
    assert(gk.sameElements(Array(0, 1, 2, 3)))
    assert(gv.sameElements(Array(6.0, 6.0, 3.0, 6.0)))
  }
}
