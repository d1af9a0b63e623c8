package repro.jobs

import repro.tables.TableIII

/** spark-submit entrypoint reproducing Table III (geomean slowdown of
  * summation buffers). Operator-level kernels, driver-side.
  *
  * Usage: spark-submit --class repro.jobs.TableIIIJob <jar> [log2n]
  */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val n = 1 << (if (args.nonEmpty) args(0).toInt else 22)
    val res = TableIII.run(TableIII.Config(n = n))
    println(res.render(TableIII.PaperValues))
  }
}
