package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.data.{Payments, Rows}
import repro.dataflow.Reconfiguration
import repro.sched.{EpochScheduler, FriesScheduler}
import repro.workflows.W4

/** Table 5: reconfiguration delay in workflow W4 (dataset 2, one-to-many
  * unnest U2 feeding two slow inference operators), Fries vs Epoch.
  *
  * Shape targets from the paper: (1) Fries ≤ Epoch everywhere; (2) {F1,U2}
  * is near-instant for both (targets sit before the backlog); (3) {FD1} is
  * slow even under Fries (the marker must cross FD1's backlogged input
  * channels from head U2); (4) {F2}'s MCS spans U2→FD1/FD2→F2, making it
  * the slowest Fries row, close to its Epoch delay.
  */
object Table5 {

  final case class PaperRow(ops: Seq[String], paperMcs: String, paperLongestPath: Int,
      paperFriesMs: Double, paperEpochMs: Double)

  final case class Row(paper: PaperRow, mcs: String, longestPath: Int,
      friesMs: Double, epochMs: Double)

  val paperRows: Seq[PaperRow] = Seq(
    PaperRow(Seq("F1", "U2"), "{F1,U2}", 1, 69, 151),
    PaperRow(Seq("FD1"), "{U2,FD1}", 1, 47892, 131103),
    PaperRow(Seq("F2"), "{U2,FD1,FD2,F2}", 5, 221353, 236153),
  )

  def run(spark: SparkSession, sf: Double = 0.02, p: Int = 2, warmupMs: Long = 1500): Seq[Row] = {
    val users = Rows.toMaps(Payments.paymentsByUser(spark, sf, nUsers = 600))
    val prm = W4.Params(p = p, window = 10, fdCostNanos = 1_200_000L,
      loop = true, srcCap = 24, preCap = 4, unnestCap = 384, midCap = 64)
    val df = W4.dataflow(users, prm)
    paperRows.map { pr =>
      val r = Reconfiguration.dummy(pr.ops: _*)
      val fries = Harness.measureDelay(df, r, new FriesScheduler(), warmupMs)
      val epoch = Harness.measureDelay(df, r, new EpochScheduler(), warmupMs)
      Row(pr, Harness.componentsString(fries.plans),
        fries.plans.map(_.longestPathLength).max, fries.delayMillis, epoch.delayMillis)
    }
  }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "Table 5: reconfiguration delay in W4 (one-to-many unnest), Fries vs Epoch\n"
    sb ++= f"${"reconfig ops"}%-10s ${"MCS (ours)"}%-22s ${"L(ours)"}%7s ${"L(paper)"}%8s " +
      f"${"Fries ms"}%10s ${"Epoch ms"}%10s ${"paper Fries"}%12s ${"paper Epoch"}%12s\n"
    rows.foreach { r =>
      sb ++= f"${r.paper.ops.mkString(",")}%-10s ${r.mcs}%-22s ${r.longestPath}%7d " +
        f"${r.paper.paperLongestPath}%8d ${Harness.fmtMs(r.friesMs)}%10s " +
        f"${Harness.fmtMs(r.epochMs)}%10s ${Harness.fmtMs(r.paper.paperFriesMs)}%12s " +
        f"${Harness.fmtMs(r.paper.paperEpochMs)}%12s\n"
    }
    sb.result()
  }
}
