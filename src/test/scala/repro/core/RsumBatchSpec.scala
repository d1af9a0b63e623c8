package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The batched ("SIMD") kernel must be bit-identical to the scalar path on
  * the same multiset of values — that is what lets summation buffers keep
  * the reproducibility guarantee (paper §V-A).
  */
class RsumBatchSpec extends AnyFunSuite {
  import ExactSum._

  private def scalarState(vals: Array[Double], l: Int): ReproDouble = {
    val st = new ReproDouble(l); vals.foreach(st.add); st
  }

  private def batchState(vals: Array[Double], l: Int, chunk: Int): ReproDouble = {
    val st = new ReproDouble(l)
    val scratch = new RsumBatchD(l)
    var i = 0
    while (i < vals.length) {
      val len = math.min(chunk, vals.length - i)
      st.addBatch(vals, i, len, scratch)
      i += len
    }
    st
  }

  val gens: Seq[(String, Int => Array[Double])] = Seq(
    ("U[1,2)", n => uniformVals(n, 211)),
    ("Exp(1)", n => expVals(n, 212)),
    ("mixed-magnitude", n => mixedMagnitudeVals(n, 213)))

  for (l <- 1 to 4; (name, gen) <- gens) {
    test(s"L=$l, $name: batch == scalar bitwise (single call)") {
      val vals = gen(20000)
      assert(batchState(vals, l, vals.length).bitEquals(scalarState(vals, l)))
    }
  }

  for (l <- Seq(1, 2, 4); chunk <- Seq(1, 3, 7, 64, 255, 4096, 4097)) {
    test(s"L=$l, chunk=$chunk: chunked batch == scalar bitwise") {
      val vals = mixedMagnitudeVals(10000, 221 + l)
      assert(batchState(vals, l, chunk).bitEquals(scalarState(vals, l)),
             s"chunk=$chunk differs from scalar")
    }
  }

  test("batch handles sizes around the V*NB tile boundary") {
    val nb = FpD.V * FpD.NB
    for (n <- Seq(nb - 1, nb, nb + 1, 2 * nb - 3, 2 * nb, 2 * nb + 5)) {
      val vals = uniformVals(n, 231)
      assert(batchState(vals, 2, n).bitEquals(scalarState(vals, 2)), s"n=$n")
    }
  }

  test("batch handles sizes around the lane width V") {
    for (n <- 0 to 2 * FpD.V + 1) {
      val vals = expVals(math.max(n, 1), 241).take(n)
      assert(batchState(vals, 2, math.max(n, 1)).bitEquals(scalarState(vals, 2)), s"n=$n")
    }
  }

  test("batch with zeros only leaves the state empty") {
    val vals = Array.fill(100)(0.0)
    val st = batchState(vals, 2, 100)
    assert(st.isEmpty && st.value == 0.0)
  }

  test("batch with leading zeros then values matches scalar") {
    val vals = Array.fill(50)(0.0) ++ uniformVals(50, 251)
    assert(batchState(vals, 2, 100).bitEquals(scalarState(vals, 2)))
  }

  test("batch with a huge magnitude jump mid-block (demote inside batch)") {
    val vals = uniformVals(1000, 261) ++ Array(1e200) ++ uniformVals(1000, 262)
    for (l <- 1 to 4)
      assert(batchState(vals, l, vals.length).bitEquals(scalarState(vals, l)), s"L=$l")
  }

  test("batch routes non-finite values like the scalar path") {
    val vals = uniformVals(100, 271) ++ Array(Double.PositiveInfinity) ++ uniformVals(10, 272)
    val a = batchState(vals, 2, vals.length)
    val b = scalarState(vals, 2)
    assert(bits(a.value) == bits(b.value))
    assert(a.value == Double.PositiveInfinity)
  }

  test("batch routes huge (|b| >= 2^987) values like the scalar path") {
    val vals = uniformVals(100, 281) ++ Array(1.6e308, -2e300) ++ uniformVals(10, 282)
    val a = batchState(vals, 3, vals.length)
    val b = scalarState(vals, 3)
    assert(a.bitEquals(b))
  }

  test("interleaving scalar adds and batch calls matches pure scalar") {
    val vals = mixedMagnitudeVals(5000, 291)
    val r = new Random(292)
    val st = new ReproDouble(2)
    val scratch = new RsumBatchD(2)
    var i = 0
    while (i < vals.length) {
      if (r.nextBoolean()) { st.add(vals(i)); i += 1 }
      else {
        val len = math.min(1 + r.nextInt(300), vals.length - i)
        st.addBatch(vals, i, len, scratch)
        i += len
      }
    }
    assert(st.bitEquals(scalarState(vals, 2)))
  }

  test("scratch object is reusable across states without contamination") {
    val scratch = new RsumBatchD(2)
    val a = uniformVals(500, 301)
    val b = expVals(500, 302)
    val sa = new ReproDouble(2); sa.addBatch(a, 0, a.length, scratch)
    val sb = new ReproDouble(2); sb.addBatch(b, 0, b.length, scratch)
    assert(sa.bitEquals(scalarState(a, 2)))
    assert(sb.bitEquals(scalarState(b, 2)))
  }

  test("empty batch call is a no-op") {
    val st = new ReproDouble(2)
    st.addBatch(new Array[Double](0), 0, 0, new RsumBatchD(2))
    assert(st.isEmpty)
    st.add(5.0)
    st.addBatch(new Array[Double](10), 3, 0, new RsumBatchD(2))
    assert(st.value == 5.0)
  }
}

/** Summation buffers must also be bit-identical to the unbuffered paths. */
class BufferedReproSpec extends AnyFunSuite {
  import ExactSum._

  for (l <- 1 to 4; bsz <- Seq(0, 1, 16, 256, 1024)) {
    test(s"L=$l, bsz=$bsz: buffered == unbuffered bitwise") {
      val vals = mixedMagnitudeVals(5000, 311 + l)
      val buf = new BufferedReproDouble(l, bsz)
      vals.foreach(buf.add)
      val ref = { val st = new ReproDouble(l); vals.foreach(st.add); st }
      assert(bits(buf.value) == bits(ref.value))
      buf.flush()
      assert(buf.state.bitEquals(ref))
    }
  }

  test("buffered value is idempotent (flush-at-eval)") {
    val buf = new BufferedReproDouble(2, 64)
    (1 to 100).foreach(i => buf.add(i.toDouble))
    assert(buf.value == 5050.0)
    assert(buf.value == 5050.0)
    buf.add(1.0)
    assert(buf.value == 5051.0)
  }

  test("buffered merge == sequential bitwise, across buffer sizes") {
    val vals = mixedMagnitudeVals(4000, 321)
    val ref = { val st = new ReproDouble(2); vals.foreach(st.add); st }
    val r = new Random(322)
    val parts = Array(new BufferedReproDouble(2, 7), new BufferedReproDouble(2, 64),
                      new BufferedReproDouble(2, 0), new BufferedReproDouble(2, 1024))
    vals.foreach(v => parts(r.nextInt(parts.length)).add(v))
    val acc = new BufferedReproDouble(2, 128)
    parts.foreach(acc.merge)
    acc.flush()
    assert(acc.state.bitEquals(ref))
  }

  test("buffered serialization flushes and round-trips") {
    val buf = new BufferedReproDouble(3, 100)
    (1 to 57).foreach(i => buf.add(i * 0.25))
    val back = BufferedReproDouble.deserialize(buf.serialize())
    assert(bits(back.value) == bits(buf.value))
  }

  test("empty buffered state") {
    val buf = new BufferedReproDouble(2, 8)
    assert(buf.isEmpty && buf.value == 0.0)
    val back = BufferedReproDouble.deserialize(buf.serialize())
    assert(back.isEmpty)
  }
}
