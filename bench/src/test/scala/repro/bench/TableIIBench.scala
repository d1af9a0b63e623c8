package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableII

/** Reproduces Table II: error bounds of conventional vs RSUM summation.
  * The bounds are analytic (Eqs. 5-6 evaluated on the generated data), so
  * they should land within a small factor of the paper's numbers; the
  * measured errors confirm the bound ordering.
  */
class TableIIBench extends AnyFunSuite {

  lazy val res: TableII.Result = TableII.run()

  test("render Table II (paper vs ours)") {
    println(res.render(TableII.PaperValues))
  }

  test("our evaluated bounds are within 3x of the paper's") {
    for {
      row <- res.rows
      ((n, d), cell) <- row.cells
      paper <- TableII.PaperValues.get((row.algo, n, d))
    } {
      val ratio = cell.bound / paper
      assert(ratio > 1.0 / 3 && ratio < 3.0,
        s"${row.algo} n=$n $d: bound ${cell.bound} vs paper $paper")
    }
  }

  test("bound ordering matches the paper: L=1 >> conventional > L=2 > L=3") {
    for (n <- res.ns; d <- res.dists) {
      def b(a: String) = res.rows.find(_.algo == a).get.cells((n, d)).bound
      assert(b("RSUM (L=1)") > 100 * b("Conventional"), s"n=$n $d")
      assert(b("Conventional") > b("RSUM (L=2)") / 100, s"n=$n $d") // comparable magnitude
      assert(b("RSUM (L=2)") > b("RSUM (L=3)") * 1e6, s"n=$n $d")
    }
  }

  test("measured errors respect the bounds and the paper's 'comparable accuracy' claim") {
    for (n <- res.ns; d <- res.dists) {
      def cell(a: String) = res.rows.find(_.algo == a).get.cells((n, d))
      // measured error never exceeds its bound (modulo final rounding)
      for (a <- Seq("RSUM (L=1)", "RSUM (L=2)", "RSUM (L=3)"))
        assert(cell(a).measured <= cell(a).bound + 1e-9 * n, s"$a n=$n $d")
      // L=2 realized accuracy is comparable to conventional (within 100x)
      assert(cell("RSUM (L=2)").measured <= 100 * (cell("Conventional").measured + 1e-10),
        s"n=$n $d")
      // L=3 is at least as accurate as L=2
      assert(cell("RSUM (L=3)").measured <= cell("RSUM (L=2)").measured + 1e-12, s"n=$n $d")
    }
  }
}
