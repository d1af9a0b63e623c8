package repro.tables

import repro.SynthData
import repro.exec.{AggKind, PartitionAndAggregate}

/** Fig. 9 (paper §VI-D): PARTITIONANDAGGREGATE with different amounts of
  * partitioning on `repro<double,2>` with summation buffers. Each depth
  * uses the Eq. 4 buffer size for its fan-out. The cross-over points of
  * the three curves are the offline-tuned depth thresholds used by
  * `PartitionAndAggregate.depthFor` (the paper determines them the same
  * way, §V-C).
  */
object Fig9 {

  final case class Row(groups: Int, nsByDepth: Seq[Double]) {
    def best: Int = nsByDepth.indexOf(nsByDepth.min)
  }
  final case class Result(rows: Seq[Row]) {
    def render: String = {
      val sb = new StringBuilder
      sb ++= "Fig. 9: ns/element of PartitionAndAggregate(repro<double,2>+buf) by depth d\n"
      sb ++= f"${"groups"}%8s | ${"d=0"}%8s | ${"d=1"}%8s | ${"d=2"}%8s | best\n"
      sb ++= "-" * 48 + "\n"
      rows.foreach { r =>
        sb ++= f"2^${(math.log(r.groups) / math.log(2)).round}%-6d | ${r.nsByDepth(0)}%8.2f | ${r.nsByDepth(1)}%8.2f | ${r.nsByDepth(2)}%8.2f | d=${r.best}\n"
      }
      sb.result()
    }
  }

  def run(n: Int = 1 << 22,
          groupCounts: Seq[Int] = Seq(1 << 4, 1 << 8, 1 << 10, 1 << 12, 1 << 14, 1 << 16, 1 << 18, 1 << 20),
          levels: Int = 2, warmup: Int = 1, reps: Int = 3,
          buffered: Boolean = true): Result = {
    import Timing._
    val vals = SynthData.localUniformValues(n, 901)
    val rows = groupCounts.map { g =>
      val keys = SynthData.localUniformKeys(n, g, 900 + g)
      val times = (0 to 2).map { d =>
        val kind =
          if (buffered) AggKind.BufD(levels, PartitionAndAggregate.bszFor(g, 1 << (8 * d), 8))
          else AggKind.PlainD
        nsPerElement(n, warmup, reps) {
          PartitionAndAggregate.run(keys, vals, g, d, kind)._2.sum
        }
      }
      Row(g, times)
    }
    Result(rows)
  }
}
