package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.data.{Payments, Rows}
import repro.dataflow.Reconfiguration
import repro.sched.FriesScheduler
import repro.workflows.W5

/** Table 6: effect of MCS pruning (Section 6.3) on the reconfiguration
  * delay in workflow W5 (Replicate + Self-Join), Fries with vs without the
  * pruning step.
  *
  * Shape targets: when a rule applies ({FD4}, {F3}, {F4} via edge-wise
  * one-to-one; {E1} via uniqueness) the pruned MCS collapses to the target
  * operator alone and the delay drops by orders of magnitude; {FD3,FD4}
  * cannot be pruned and both delays match.
  */
object Table6 {

  final case class PaperRow(ops: Seq[String], paperMcsPruned: String,
      paperMcsUnpruned: String, paperPrunedMs: Double, paperUnprunedMs: Double)

  final case class Row(paper: PaperRow, mcsPruned: String, mcsUnpruned: String,
      prunedMs: Double, unprunedMs: Double)

  val paperRows: Seq[PaperRow] = Seq(
    PaperRow(Seq("FD4"), "{FD4}", "{RE,F4,FD4}", 158, 450149),
    PaperRow(Seq("F3"), "{F3}", "{RE,FD3,S1,F3}", 94, 383781),
    PaperRow(Seq("F4"), "{F4}", "{RE,F4}", 10, 446),
    PaperRow(Seq("FD3", "FD4"), "{RE,FD3,F4,FD4}", "{RE,FD3,F4,FD4}", 661892, 663460),
    PaperRow(Seq("E1"), "{E1}", "{RE,FD3,S1,F3,F4,FD4,SJ,E1}", 85, 1122686),
  )

  def run(spark: SparkSession, sf: Double = 0.02, p: Int = 2, warmupMs: Long = 1500): Seq[Row] = {
    val rows = Rows.toMaps(Payments.payments(spark, sf))
    val prm = W5.Params(p = p, window = 10, fdCostNanos = 1_200_000L,
      loop = true, srcCap = 64, branchCap = 256, midCap = 64)
    val df = W5.dataflow(rows, prm)
    paperRows.map { pr =>
      val r = Reconfiguration.dummy(pr.ops: _*)
      val pruned = Harness.measureDelay(df, r, new FriesScheduler(pruning = true), warmupMs)
      val unpruned = Harness.measureDelay(df, r, new FriesScheduler(pruning = false), warmupMs)
      Row(pr, Harness.componentsString(pruned.plans), Harness.componentsString(unpruned.plans),
        pruned.delayMillis, unpruned.delayMillis)
    }
  }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "Table 6: effect of MCS pruning on delay in W5 (Fries with/without pruning)\n"
    sb ++= f"${"reconfig"}%-9s ${"MCS pruned"}%-20s ${"MCS unpruned"}%-32s " +
      f"${"pruned ms"}%10s ${"unpruned ms"}%12s ${"paper pruned"}%13s ${"paper unpruned"}%15s\n"
    rows.foreach { r =>
      sb ++= f"${r.paper.ops.mkString(",")}%-9s ${r.mcsPruned}%-20s ${r.mcsUnpruned}%-32s " +
        f"${Harness.fmtMs(r.prunedMs)}%10s ${Harness.fmtMs(r.unprunedMs)}%12s " +
        f"${Harness.fmtMs(r.paper.paperPrunedMs)}%13s ${Harness.fmtMs(r.paper.paperUnprunedMs)}%15s\n"
    }
    sb.result()
  }
}
