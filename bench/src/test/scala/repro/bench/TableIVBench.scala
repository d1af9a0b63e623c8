package repro.bench

import repro.SparkSpec
import repro.tables.TableIV

/** Reproduces Table IV: end-to-end TPC-H Q1 in Spark SQL (standing in for
  * MonetDB) with the four aggregate configurations. Shape claims from the
  * paper: unbuffered repro costs noticeably more than buffered; buffered
  * brings the end-to-end overhead down to a few percent; sorting the input
  * is catastrophically slower than either.
  */
class TableIVBench extends SparkSpec {

  lazy val res: TableIV.Result = TableIV.run(spark)

  private def total(name: String): Double = res.variants.find(_.name == name).get.total

  test("render Table IV (paper vs ours)") {
    println(res.render(TableIV.PaperValues))
    println(f"absolute: double total ${res.doubleTotalNs / 1e6}%.1f ms, other ${res.otherNsAbs / 1e6}%.1f ms")
  }

  test("buffered repro has (near-)lowest overhead among reproducible variants") {
    assert(total("repro<d,4> with buffer") <= total("repro<d,4> no buffer") * 1.10,
      "buffered should not cost more than unbuffered end-to-end")
  }

  test("reproducible variants stay within a moderate factor of native doubles") {
    assert(total("repro<d,4> with buffer") <= 250.0,
      s"buffered total ${total("repro<d,4> with buffer")} should be within 2.5x of native")
    assert(total("repro<d,4> no buffer") <= 400.0)
  }

  test("sorting the input is far more expensive than the numeric solution") {
    assert(total("double (sorted)") >= 1.5 * total("double"),
      s"sorted total ${total("double (sorted)")} should dominate native 100")
    assert(total("double (sorted)") >= 1.3 * total("repro<d,4> with buffer"))
  }

  test("all Q1 variants return the same result (within fp tolerance)") {
    import repro.tables.TpchQ1
    repro.spark.ReproFunctions.register(spark)
    val li = repro.SynthData.lineitem(spark, 0.01)
    li.createOrReplaceTempView("lineitem")
    TpchQ1.registerSorted(spark)
    val a = TpchQ1.double(spark).collect()
    val b = TpchQ1.reproNoBuffer(spark).collect()
    val c = TpchQ1.reproBuffered(spark).collect()
    val d = TpchQ1.sortedDouble(spark).collect()
    assert(a.length == b.length && a.length == c.length && a.length == d.length)
    for (i <- a.indices; col <- 2 until 9) {
      val ref = a(i).getDouble(col)
      val tol = math.max(1e-6, math.abs(ref) * 1e-9)
      for ((other, nm) <- Seq(b -> "noBuffer", c -> "buffered", d -> "sorted"))
        assert(math.abs(other(i).getDouble(col) - ref) <= tol, s"row $i col $col ($nm)")
    }
  }
}
