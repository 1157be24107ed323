package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.dataflow.{Dataflow, Reconfiguration}
import repro.sched.{EpochScheduler, FriesScheduler}
import repro.workflows.{W2, W3}

/** Table 4 of the paper: reconfiguration operators, MCS components, and
  * reconfiguration delay of the Fries vs the Epoch scheduler on W2 and W3
  * (dataset 3 / TPC-DS).
  *
  * The substrate differences are documented in EXPERIMENTS.md: the paper
  * ran 40 workers per operator on a 10-machine Flink cluster over TPC-DS
  * SF=100; this harness runs the in-process engine with a few workers per
  * operator over TPC-DS-lite, with per-tuple join costs and bounded
  * channels producing the in-flight backlog that separates the two
  * schedulers. Absolute delays differ; the shape (Fries ≪ Epoch, Fries
  * delay growing with the MCS longest path) is the reproduction target.
  */
object Table4 {

  final case class PaperRow(
      workflow: String,
      ops: Seq[String],
      paperMcs: String,
      paperLongestPath: Int,
      paperFriesMs: Double,
      paperEpochMs: Double)

  final case class Row(
      paper: PaperRow,
      mcs: String,
      longestPath: Int,
      friesMs: Double,
      epochMs: Double)

  val paperRows: Seq[PaperRow] = Seq(
    PaperRow("W2", Seq("J1"), "{J1}", 0, 46, 11432),
    PaperRow("W2", Seq("J2"), "{J2}", 0, 44, 11709),
    PaperRow("W2", Seq("J1", "J3"), "{J1,J2,J3}", 2, 1664, 12339),
    PaperRow("W2", Seq("J1", "J4"), "{J1,J2,J3,J4}", 3, 1702, 12361),
    PaperRow("W2", Seq("J3", "J4"), "{J3,J4}", 1, 387, 13767),
    PaperRow("W3", Seq("J5"), "{J5}", 0, 87, 4127),
    PaperRow("W3", Seq("J5", "J6"), "{J5} {J6}", 0, 127, 8352),
    PaperRow("W3", Seq("J5", "J6", "J7", "J8"), "{J5,J6,J7,U1,J8}", 3, 447, 19608),
    PaperRow("W3", Seq("J5", "J6", "J7", "J9"), "{J5,J6,J7,U1,J8,J9}", 4, 526, 19717),
    PaperRow("W3", Seq("J7", "J8", "J9"), "{J7,U1,J8,J9}", 3, 1340, 20532),
  )

  /** Benchmark parameterization: per-stage costs ramp up so every stage is
    * slower than its producer and all queues saturate (the all-choke-point
    * regime of Section 8.2); filters are widened to pass-through so the
    * backlog is uniform.
    */
  def w2Dataflow(spark: SparkSession, sf: Double, p: Int): Dataflow = {
    val in = W2.inputs(spark, sf)
    val prm = W2.Params(p = p, joinCostNanos = 400_000L, priceLo = 0.0, priceHi = 10.0,
      dateLoSk = 1, dateWindowDays = 3000, loop = true, srcCap = 2048, midCap = 64)
    // Per-join cost ramp: rebuild with increasing costs via a cost map.
    val base = W2.dataflow(in, prm)
    val costs = Map("J1" -> 400_000L, "J2" -> 600_000L, "J3" -> 800_000L, "J4" -> 1_000_000L)
    withCosts(base, costs)
  }

  def w3Dataflow(spark: SparkSession, sf: Double, p: Int): Dataflow = {
    val in = W3.inputs(spark, sf)
    val prm = W3.Params(p = p, joinCostNanos = 500_000L, mgrMax = 100, year = -1,
      loop = true, srcCap = 768, midCap = 64)
    val base = W3.dataflow(in, prm)
    val costs = Map("J5" -> 500_000L, "J6" -> 500_000L, "J7" -> 500_000L,
      "U1" -> 100_000L, "U2" -> 100_000L, "J8" -> 800_000L, "J9" -> 1_000_000L)
    withCosts(base, costs)
  }

  /** Wrap operator logics with per-operator simulated costs. */
  private def withCosts(df: Dataflow, costs: Map[String, Long]): Dataflow =
    df.copy(ops = df.ops.map { op =>
      costs.get(op.name) match {
        case Some(c) =>
          val inner = op.logic
          op.copy(logic = i => new repro.dataflow.OpLogic {
            private val l = inner(i)
            override val costNanos: Long = c
            override def process(t: repro.dataflow.DTuple) = l.process(t)
            override def onFinish() = l.onFinish()
            override def state: Any = l.state
          })
        case None => op
      }
    })

  def run(spark: SparkSession, sf: Double = 0.02, p: Int = 3, warmupMs: Long = 1500): Seq[Row] = {
    val w2 = w2Dataflow(spark, sf, p)
    val w3 = w3Dataflow(spark, sf, p)
    paperRows.map { pr =>
      val df = if (pr.workflow == "W2") w2 else w3
      val r = Reconfiguration.dummy(pr.ops: _*)
      val fries = Harness.measureDelay(df, r, new FriesScheduler(), warmupMs)
      val epoch = Harness.measureDelay(df, r, new EpochScheduler(), warmupMs)
      Row(pr, Harness.componentsString(fries.plans),
        fries.plans.map(_.longestPathLength).max, fries.delayMillis, epoch.delayMillis)
    }
  }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "Table 4: reconfiguration delay, Fries vs Epoch (W2, W3)\n"
    sb ++= f"${"wf"}%-3s ${"reconfig ops"}%-17s ${"MCS (ours)"}%-30s ${"L(ours)"}%7s ${"L(paper)"}%8s " +
      f"${"Fries ms"}%10s ${"Epoch ms"}%10s ${"paper Fries"}%12s ${"paper Epoch"}%12s\n"
    rows.foreach { r =>
      sb ++= f"${r.paper.workflow}%-3s ${r.paper.ops.mkString(",")}%-17s ${r.mcs}%-30s " +
        f"${r.longestPath}%7d ${r.paper.paperLongestPath}%8d " +
        f"${Harness.fmtMs(r.friesMs)}%10s ${Harness.fmtMs(r.epochMs)}%10s " +
        f"${Harness.fmtMs(r.paper.paperFriesMs)}%12s ${Harness.fmtMs(r.paper.paperEpochMs)}%12s\n"
    }
    sb.result()
  }
}
