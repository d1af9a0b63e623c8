package repro.jobs

import repro.tables.{Fig4, Fig6}

/** spark-submit entrypoint for the supporting micro-benchmarks (Fig. 4:
  * unbuffered repro slowdown at 16 groups; Fig. 6: RSUM chunk-size
  * crossover).
  *
  * Usage: spark-submit --class repro.jobs.FiguresJob <jar> [log2n]
  */
object FiguresJob {
  def main(args: Array[String]): Unit = {
    val n = 1 << (if (args.nonEmpty) args(0).toInt else 22)
    println(Fig4.run(n).render)
    println()
    println(Fig6.run(n).render)
  }
}

/** Offline depth tuning (the paper's Fig. 9 / §V-C procedure): prints
  * ns/element per partitioning depth so the `depthFor` thresholds can be
  * validated for the machine at hand.
  *
  * Usage: spark-submit --class repro.jobs.Fig9Job <jar> [log2n]
  */
object Fig9Job {
  def main(args: Array[String]): Unit = {
    val n = 1 << (if (args.nonEmpty) args(0).toInt else 22)
    println(repro.tables.Fig9.run(n).render)
  }
}
