package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.dataflow.Engine
import repro.sched.FriesScheduler
import repro.workflows.W2

/** Table 7: number of data channels between all workers vs between MCS
  * workers for the reconfiguration {J1, J4} of W2, as the per-operator
  * worker count grows. This is a purely structural property of the
  * parallel dataflow G* (Section 7.2), so the reproduction is exact:
  * SRC has one worker, J1..J4 and SINK have p workers, every edge between
  * them re-partitions (p×p channels), giving p + 4p² channels in total and
  * 3p² between the MCS operators {J1, J2, J3, J4}.
  */
object Table7 {

  final case class Row(p: Int, totalChannels: Int, mcsChannels: Int,
      paperTotal: Int, paperMcs: Int)

  val paper: Seq[(Int, Int, Int)] = Seq(
    (1, 5, 3), (4, 68, 48), (12, 588, 432), (20, 1620, 1200), (40, 6440, 4800))

  def run(spark: SparkSession, sf: Double = 0.001): Seq[Row] = {
    val in = W2.inputs(spark, sf)
    paper.map { case (p, pTotal, pMcs) =>
      val df = W2.dataflow(in, W2.Params(p = p))
      val engine = new Engine(df, logEnabled = false) // built, never started
      val plans = new FriesScheduler().plan(df, Set("J1", "J4"))
      val mcsOps = plans.flatMap(_.mcsOps).toSet
      Row(p, engine.channelPairs.size, engine.channelsBetween(mcsOps), pTotal, pMcs)
    }
  }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "Table 7: data channels, all workers vs MCS workers (W2, reconfig {J1,J4})\n"
    sb ++= f"${"workers/op"}%10s ${"total(ours)"}%12s ${"MCS(ours)"}%10s " +
      f"${"total(paper)"}%13s ${"MCS(paper)"}%11s\n"
    rows.foreach { r =>
      sb ++= f"${r.p}%10d ${r.totalChannels}%12d ${r.mcsChannels}%10d " +
        f"${r.paperTotal}%13d ${r.paperMcs}%11d\n"
    }
    sb.result()
  }
}
