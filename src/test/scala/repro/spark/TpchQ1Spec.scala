package repro.spark

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.ExactSum.bits
import repro.tables.TpchQ1

class TpchQ1Spec extends SparkSpec {

  private lazy val lineitem: DataFrame = {
    ReproFunctions.register(spark)
    val li = SynthData.lineitem(spark, 0.005).cache()
    li.createOrReplaceTempView("lineitem")
    li.count()
    li
  }

  test("Q1 (native doubles) matches the DuckDB oracle on integer-rounded sums") {
    lineitem
    val got = spark.sql(
      s"""SELECT l_returnflag, l_linestatus,
         |  round(sum(l_quantity)) AS sum_qty,
         |  round(sum(l_extendedprice * (1 - l_discount))) AS sum_disc_price,
         |  count(*) AS count_order
         |FROM lineitem WHERE l_shipdate <= DATE '${TpchQ1.Cutoff}'
         |GROUP BY l_returnflag, l_linestatus""".stripMargin)
    Oracle.assertEquivalent(got,
      s"""SELECT l_returnflag, l_linestatus,
         |  round(sum(CAST(l_quantity AS DOUBLE))) AS sum_qty,
         |  round(sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)))) AS sum_disc_price,
         |  count(*) AS count_order
         |FROM lineitem WHERE CAST(l_shipdate AS DATE) <= DATE '${TpchQ1.Cutoff}'
         |GROUP BY l_returnflag, l_linestatus""".stripMargin,
      "lineitem" -> lineitem)
  }

  test("Q1 with rsum matches the DuckDB oracle on integer-rounded sums") {
    lineitem
    val got = spark.sql(
      s"""SELECT l_returnflag, l_linestatus,
         |  round(rsum(l_quantity, 3)) AS sum_qty,
         |  round(rsum_buffered(l_extendedprice * (1 - l_discount), 3, 256)) AS sum_disc_price,
         |  count(*) AS count_order
         |FROM lineitem WHERE l_shipdate <= DATE '${TpchQ1.Cutoff}'
         |GROUP BY l_returnflag, l_linestatus""".stripMargin)
    Oracle.assertEquivalent(got,
      s"""SELECT l_returnflag, l_linestatus,
         |  round(sum(CAST(l_quantity AS DOUBLE))) AS sum_qty,
         |  round(sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)))) AS sum_disc_price,
         |  count(*) AS count_order
         |FROM lineitem WHERE CAST(l_shipdate AS DATE) <= DATE '${TpchQ1.Cutoff}'
         |GROUP BY l_returnflag, l_linestatus""".stripMargin,
      "lineitem" -> lineitem)
  }

  test("all four Q1 variants agree within floating-point tolerance") {
    lineitem
    TpchQ1.registerSorted(spark)
    val a = TpchQ1.double(spark).collect()
    val b = TpchQ1.reproNoBuffer(spark, 4).collect()
    val c = TpchQ1.reproBuffered(spark, 4, 256).collect()
    val d = TpchQ1.sortedDouble(spark).collect()
    assert(a.nonEmpty && a.length == b.length && a.length == c.length && a.length == d.length)
    for (i <- a.indices) {
      assert(a(i).getString(0) == b(i).getString(0) && a(i).getString(1) == b(i).getString(1))
      for (col <- 2 until 9) {
        val ref = a(i).getDouble(col)
        val tol = math.max(1e-6, math.abs(ref) * 1e-9)
        assert(math.abs(b(i).getDouble(col) - ref) <= tol, s"noBuffer row $i col $col")
        assert(math.abs(c(i).getDouble(col) - ref) <= tol, s"buffered row $i col $col")
        assert(math.abs(d(i).getDouble(col) - ref) <= tol, s"sorted row $i col $col")
      }
      assert(a(i).getLong(9) == b(i).getLong(9))
    }
  }

  test("Q1 rsum results are bit-stable across input repartitionings") {
    lineitem
    def runQ1(parts: Int): Seq[Long] = {
      val li = if (parts == 0) lineitem else lineitem.repartition(parts)
      li.createOrReplaceTempView("lineitem")
      val rows = TpchQ1.reproNoBuffer(spark, 2).collect()
      li.createOrReplaceTempView("lineitem") // leave view in place
      rows.flatMap(r => (2 until 9).map(c => bits(r.getDouble(c)))).toSeq
    }
    val ref = runQ1(0)
    for (p <- Seq(1, 3, 17)) assert(runQ1(p) == ref, s"repartition($p)")
    lineitem.createOrReplaceTempView("lineitem")
  }

  test("Q1 'other' proxy returns the same groups as the full query") {
    lineitem
    val full = TpchQ1.double(spark).collect().map(r => (r.getString(0), r.getString(1), r.getLong(9)))
    val other = TpchQ1.otherOnly(spark).collect().map(r => (r.getString(0), r.getString(1), r.getLong(2)))
    assert(full.toSeq == other.toSeq)
  }
}
