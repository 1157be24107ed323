package repro.experiments

import repro.dataflow.{Dataflow, Engine, Reconfiguration}
import repro.sched.{ReconfigOutcome, ReconfigScheduler}

/** Shared machinery for the table-reproduction harnesses: run a dataflow
  * on an infinite (looping) stream, let backpressure build the in-flight
  * backlog, execute one reconfiguration with the given scheduler, measure
  * its delay, and tear the execution down.
  */
object Harness {

  /** One timed reconfiguration on a fresh engine. The schedule log is
    * disabled so the data path carries no bookkeeping (the delay being
    * measured is the scheduler's, not the audit's).
    */
  def measureDelay(
      df: Dataflow,
      r: Reconfiguration,
      scheduler: ReconfigScheduler,
      warmupMs: Long,
      timeoutMs: Long = 180_000): ReconfigOutcome = {
    val engine = new Engine(df, logEnabled = false)
    engine.start()
    Thread.sleep(warmupMs)
    try scheduler.execute(engine, r, timeoutMs)
    finally engine.shutdownNow()
  }

  /** Render MCS components as the paper does: ops of each component in
    * braces, heads first and bolded with `*`.
    */
  def componentsString(plans: Vector[repro.core.ReconfigPlan[String]]): String =
    plans.flatMap(_.components).map { c =>
      val heads = c.heads.toSeq.sorted.map("*" + _)
      val rest = (c.ops -- c.heads).toSeq.sorted
      (heads ++ rest).mkString("{", ",", "}")
    }.mkString(" ")

  def fmtMs(ms: Double): String = f"$ms%,.0f"
}
