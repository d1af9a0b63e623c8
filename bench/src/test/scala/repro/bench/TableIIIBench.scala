package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableIII

/** Reproduces Table III: geometric-mean slowdown of PartitionAndAggregate
  * with summation buffers on `repro<T,L>` vs built-in T. The paper reports
  * 1.88-2.41; on the JVM the absolute ratios shift, but the shape must
  * hold: a small-constant-factor overhead that grows with L, with double
  * paying somewhat more than float in the partitioned regimes.
  */
class TableIIIBench extends AnyFunSuite {

  lazy val res: TableIII.Result = TableIII.run()

  private def geo(name: String): Double = res.types.find(_.name == name).get.geomean

  test("render Table III (paper vs ours)") {
    println(res.render(TableIII.PaperValues))
    println("baseline ns/element: " + res.baselineNs.toSeq.sortBy(_.toString)
      .map { case ((t, g), ns) => f"$t/g=$g:$ns%.1f" }.mkString("  "))
  }

  test("reproducibility costs a small constant factor (all geomeans in [1, 10])") {
    for (t <- res.types)
      assert(t.geomean >= 0.9 && t.geomean <= 10.0, s"${t.name}: ${t.geomean}")
  }

  test("slowdown grows with the number of levels L (per scalar type)") {
    for (scalar <- Seq("double", "float")) {
      val g = (1 to 4).map(l => geo(s"repro<$scalar,$l>"))
      assert(g(3) >= g(0) * 0.95, s"$scalar: L=4 (${g(3)}) should cost at least L=1 (${g(0)})")
      // weak monotonicity within noise
      for (i <- 0 until 3)
        assert(g(i + 1) >= g(i) * 0.85, s"$scalar: L=${i + 2} (${g(i + 1)}) << L=${i + 1} (${g(i)})")
    }
  }

  test("per-group-count slowdowns stay bounded (no pathological blowup)") {
    for (t <- res.types; (g, s) <- t.perGroupSlowdown)
      assert(s >= 0.5 && s <= 20.0, s"${t.name} groups=$g slowdown=$s")
  }
}
