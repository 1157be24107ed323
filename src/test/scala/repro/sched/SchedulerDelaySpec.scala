package repro.sched

import org.scalatest.funsuite.AnyFunSuite
import repro.dataflow._
import repro.testutil.TestData
import repro.workflows.Logics._

/** Sanity checks for the delay claim (Sections 3.2 / 5.3): with an
  * in-flight backlog ahead of a slow operator, the Fries FCM reaches the
  * target without draining the backlog while the epoch marker must drain
  * it first.
  */
class SchedulerDelaySpec extends AnyFunSuite {

  private def backloggedChain(costNanos: Long, cap: Int): Dataflow =
    Dataflow(
      sources = Vector(SourceSpec("SRC", () => TestData.payments(5000).iterator, loop = true)),
      ops = Vector(
        Operator("SLOW", 1, _ => new Pass(costNanos)),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "SLOW", capacity = cap),
        EdgeSpec("SLOW", "SINK", capacity = cap)))

  private def measure(scheduler: ReconfigScheduler): Double = {
    val engine = new Engine(backloggedChain(1_000_000L, 512), logEnabled = false)
    engine.start()
    Thread.sleep(400) // let the 512-tuple backlog build
    try scheduler.execute(engine, Reconfiguration.dummy("SLOW"), 60_000).delayMillis
    finally engine.shutdownNow()
  }

  test("Fries delay is far below the epoch delay on a backlogged operator") {
    val fries = measure(new FriesScheduler())
    val epoch = measure(new EpochScheduler())
    info(f"fries=$fries%.1fms epoch=$epoch%.1fms")
    // Epoch must drain ~512 tuples x 1ms; Fries sends the FCM directly.
    assert(fries < 100, s"Fries delay $fries ms unexpectedly high")
    assert(epoch > 300, s"Epoch delay $epoch ms unexpectedly low — no backlog?")
    assert(fries * 3 < epoch)
  }

  test("naive FCM delay is as low as Fries on a single-operator reconfiguration") {
    val naive = measure(new NaiveFcmScheduler())
    assert(naive < 100)
  }

  test("Fries delay grows with the component's longest path") {
    def chain3(cap: Int): Dataflow = Dataflow(
      sources = Vector(SourceSpec("SRC", () => TestData.payments(5000).iterator, loop = true)),
      ops = Vector(
        Operator("A", 1, _ => new Pass(400_000L)),
        Operator("B", 1, _ => new Pass(600_000L)),
        Operator("C", 1, _ => new Pass(800_000L)),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", capacity = cap), EdgeSpec("A", "B", capacity = cap),
        EdgeSpec("B", "C", capacity = cap), EdgeSpec("C", "SINK", capacity = cap)))
    def measureOps(ops: Seq[String]): Double = {
      val engine = new Engine(chain3(256), logEnabled = false)
      engine.start()
      Thread.sleep(400)
      try new FriesScheduler().execute(engine, Reconfiguration.dummy(ops: _*), 60_000).delayMillis
      finally engine.shutdownNow()
    }
    val single = measureOps(Seq("A"))
    val span = measureOps(Seq("A", "C")) // MCS {A,B,C}, marker crosses two backlogs
    info(f"single=$single%.1fms span=$span%.1fms")
    assert(single < 100)
    assert(span > single)
  }
}
