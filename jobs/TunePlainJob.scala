package repro.jobs

/** Offline depth tuning for the BUILT-IN double baseline (the §V-C
  * procedure applied to the comparison type of Table III): prints
  * ns/element per partitioning depth, from which
  * `TableIII.builtinDepthFor`'s thresholds were read off.
  *
  * Usage: spark-submit --class repro.jobs.TunePlainJob <jar>
  */
object TunePlainJob {
  def main(args: Array[String]): Unit =
    println(repro.tables.Fig9.run(buffered = false).render)
}
