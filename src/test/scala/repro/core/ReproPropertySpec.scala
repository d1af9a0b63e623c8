package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** ScalaCheck-generator-driven property tests for the algebraic laws that
  * make GROUPBY reproducible: permutation-invariance of `add`, and
  * commutativity / associativity / identity of `merge` — all at the level
  * of state *bits*, not approximate values. Generators are sampled with
  * deterministic seeds (the scalatestplus bridge artifact is not available
  * offline, so we drive Gen directly).
  */
class ReproPropertySpec extends AnyFunSuite {
  import ExactSum.bits

  private val params = Gen.Parameters.default

  private def sample[A](g: Gen[A], seed: Long): A =
    g.apply(params, Seed(seed)).getOrElse(sample(g, seed + 1))

  // finite doubles across many binades, including negatives and zeros
  private val valueGen: Gen[Double] = Gen.oneOf(
    Gen.choose(-1e3, 1e3),
    Gen.choose(-1.0, 1.0).map(_ * 1e-12),
    Gen.choose(-1.0, 1.0).map(_ * 1e12),
    Gen.const(0.0),
    Gen.choose(1, 1000).map(_.toDouble))
  private val valuesGen: Gen[List[Double]] =
    Gen.choose(0, 300).flatMap(n => Gen.listOfN(n, valueGen))
  private val levelsGen: Gen[Int] = Gen.choose(1, 4)

  private val Trials = 120

  private def stateOf(vals: Seq[Double], l: Int): ReproDouble = {
    val st = new ReproDouble(l)
    vals.foreach(st.add)
    st
  }

  private def forAllCases(testBody: (List[Double], Int, Long) => Unit): Unit =
    for (t <- 1 to Trials) {
      val vals = sample(valuesGen, 10000L + t)
      val l = sample(levelsGen, 20000L + t)
      testBody(vals, l, t.toLong)
    }

  test("property: value bits are invariant under input reversal") {
    forAllCases { (vals, l, _) =>
      assert(bits(stateOf(vals, l).value) == bits(stateOf(vals.reverse, l).value))
    }
  }

  test("property: value bits are invariant under sorting the input") {
    forAllCases { (vals, l, _) =>
      assert(bits(stateOf(vals, l).value) == bits(stateOf(vals.sorted, l).value))
    }
  }

  test("property: merge is commutative on state bits") {
    forAllCases { (a, l, t) =>
      val b = sample(valuesGen, 30000L + t)
      val ab = stateOf(a, l); ab.merge(stateOf(b, l))
      val ba = stateOf(b, l); ba.merge(stateOf(a, l))
      assert(ab.bitEquals(ba))
    }
  }

  test("property: merge is associative on state bits") {
    forAllCases { (a, l, t) =>
      val b = sample(valuesGen, 40000L + t)
      val c = sample(valuesGen, 50000L + t)
      val left = stateOf(a, l)
      left.merge(stateOf(b, l)); left.merge(stateOf(c, l))
      val bc = stateOf(b, l); bc.merge(stateOf(c, l))
      val right = stateOf(a, l); right.merge(bc)
      assert(left.bitEquals(right))
    }
  }

  test("property: the empty state is a two-sided merge identity") {
    forAllCases { (vals, l, _) =>
      val a = stateOf(vals, l); a.merge(new ReproDouble(l))
      val b = new ReproDouble(l); b.merge(stateOf(vals, l))
      assert(a.bitEquals(stateOf(vals, l)) && b.bitEquals(stateOf(vals, l)))
    }
  }

  test("property: merge equals sequential accumulation (split anywhere)") {
    forAllCases { (vals, l, t) =>
      val k = if (vals.isEmpty) 0 else (t % (vals.size + 1)).toInt
      val (x, y) = vals.splitAt(k)
      val merged = stateOf(x, l)
      merged.merge(stateOf(y, l))
      assert(merged.bitEquals(stateOf(vals, l)))
    }
  }

  test("property: batched accumulation equals scalar accumulation bitwise") {
    forAllCases { (vals, l, t) =>
      val chunk = 1 + (t % 64).toInt
      val arr = vals.toArray
      val st = new ReproDouble(l)
      val scratch = new RsumBatchD(l)
      var i = 0
      while (i < arr.length) {
        val len = math.min(chunk, arr.length - i)
        st.addBatch(arr, i, len, scratch)
        i += len
      }
      assert(st.bitEquals(stateOf(vals, l)))
    }
  }

  test("property: serialization round-trips state bits") {
    forAllCases { (vals, l, _) =>
      val st = stateOf(vals, l)
      assert(ReproDouble.deserialize(st.serialize()).bitEquals(st))
    }
  }

  test("property: accuracy within the Eq.6 bound plus final-rounding slack") {
    forAllCases { (vals, l, _) =>
      if (vals.nonEmpty) {
        val got = stateOf(vals, l).value
        val ex = vals.foldLeft(BigDecimal(0))((a, v) => a + BigDecimal(v))
        val mx = vals.map(math.abs).max
        val bound = vals.size.toDouble * math.pow(2.0, (1 - l) * FpD.W - 1) * mx +
          2 * l * Math.ulp(math.abs(got) + mx)
        assert((ex - BigDecimal(got)).abs.toDouble <= bound)
      }
    }
  }

  test("property: float type has the same permutation/merge laws") {
    val floatsGen = Gen.choose(0, 200).flatMap(n => Gen.listOfN(n, Gen.choose(-1e4f, 1e4f)))
    for (t <- 1 to Trials) {
      val vals = sample(floatsGen, 60000L + t)
      val l = sample(levelsGen, 70000L + t)
      val fwd = new ReproFloat(l); vals.foreach(fwd.add)
      val rev = new ReproFloat(l); vals.reverse.foreach(rev.add)
      assert(fwd.bitEquals(rev))
      val half = vals.size / 2
      val a = new ReproFloat(l); vals.take(half).foreach(a.add)
      val b = new ReproFloat(l); vals.drop(half).foreach(b.add)
      a.merge(b)
      assert(a.bitEquals(fwd))
    }
  }
}
