package repro.jobs

import repro.tables.TableII

/** spark-submit entrypoint reproducing Table II (summation error bounds).
  * Pure driver-side computation — no cluster work needed.
  *
  * Usage: spark-submit --class repro.jobs.TableIIJob <jar> [seed]
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val seed = if (args.nonEmpty) args(0).toLong else 7L
    val res = TableII.run(seed)
    println(res.render(TableII.PaperValues))
  }
}
