package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tables.TableIV

/** spark-submit entrypoint reproducing Table IV (end-to-end TPC-H Q1).
  *
  * Usage: spark-submit --class repro.jobs.TableIVJob <jar> [sf]
  */
object TableIVJob {
  def main(args: Array[String]): Unit = {
    val sf = if (args.nonEmpty) args(0).toDouble else 0.1
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("tableIV")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val res = TableIV.run(spark, TableIV.Config(sf = sf))
      println(res.render(TableIV.PaperValues))
    } finally spark.stop()
  }
}
