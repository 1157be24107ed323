package repro.ft

import org.scalatest.funsuite.AnyFunSuite
import repro.dataflow._
import repro.sched.FriesScheduler
import repro.testutil.TestData
import repro.workflows.FigOne
import repro.workflows.Logics._

/** Section 7.3: checkpoint-based and logging-based fault tolerance under
  * Fries reconfigurations.
  */
class FaultToleranceSpec extends AnyFunSuite {

  private val prm = FigOne.Params(fmCostNanos = 200_000L, loop = true, cap = 64)
  private def figFlow = FigOne.dataflow(TestData.payments(2000), prm)

  test("an aligned checkpoint completes and captures every worker") {
    val engine = new Engine(figFlow)
    val coord = new CheckpointCoordinator(engine)
    engine.start()
    try {
      Thread.sleep(100)
      val id = coord.trigger().get
      assert(coord.awaitCompleted(id, 30_000))
      val snap = coord.completed(id)
      assert(snap.keySet.map(_.op) == Set("FC", "FM", "MC", "SINK"))
      assert(snap.values.forall(_.version == 0))
    } finally engine.shutdownNow()
  }

  test("checkpoint captures operator state (per-key windows)") {
    val engine = new Engine(figFlow)
    val coord = new CheckpointCoordinator(engine)
    engine.start()
    try {
      Thread.sleep(200)
      val id = coord.trigger().get
      assert(coord.awaitCompleted(id, 30_000))
      val fmState = coord.completed(id)(WorkerId("FM", 0)).state
        .asInstanceOf[Map[Any, Vector[Double]]]
      assert(fmState.nonEmpty)
      fmState.values.foreach(q => assert(q.nonEmpty && q.size <= 10))
    } finally engine.shutdownNow()
  }

  test("a reconfiguration request blocks new checkpoints until head FCMs are out") {
    val engine = new Engine(figFlow)
    val coord = new CheckpointCoordinator(engine)
    engine.start()
    try {
      coord.onReconfigRequested()
      assert(coord.isBlocked)
      assert(coord.trigger().isEmpty)
      coord.onHeadFcmsDelivered()
      assert(!coord.isBlocked)
      assert(coord.trigger().nonEmpty)
    } finally engine.shutdownNow()
  }

  test("in-flight checkpoints are canceled by a reconfiguration request") {
    val engine = new Engine(figFlow)
    val coord = new CheckpointCoordinator(engine)
    engine.start()
    try {
      Thread.sleep(100)
      val id = coord.trigger().get
      // Cancel before the backlogged markers can finish alignment.
      coord.onReconfigRequested()
      coord.onHeadFcmsDelivered()
      assert(!coord.awaitCompleted(id, 1_500), s"canceled checkpoint $id completed")
    } finally engine.shutdownNow()
  }

  test("checkpoints completed around a Fries reconfiguration are version-consistent") {
    (1 to 3).foreach { round =>
      val engine = new Engine(figFlow)
      val coord = new CheckpointCoordinator(engine)
      val scheduler = new FriesScheduler(checkpoint = Some(coord))
      engine.start()
      try {
        Thread.sleep(100)
        val before = coord.trigger()
        Thread.sleep(20L * round)
        scheduler.execute(engine, FigOne.reconfiguration(prm), 30_000)
        val after = coord.trigger()
        Thread.sleep(300)
        // Every checkpoint that committed must be all-old or all-new.
        coord.completed.keys.foreach { id =>
          assert(coord.isConsistent(id, Set("FM", "MC")),
            s"round $round: checkpoint $id mixed configurations")
        }
        (before.toSeq ++ after.toSeq).foreach(id => coord.awaitCompleted(id, 5_000))
        coord.completed.keys.foreach(id => assert(coord.isConsistent(id, Set("FM", "MC"))))
      } finally engine.shutdownNow()
    }
  }

  test("post-reconfiguration checkpoint captures the new configuration") {
    val engine = new Engine(figFlow)
    val coord = new CheckpointCoordinator(engine)
    val scheduler = new FriesScheduler(checkpoint = Some(coord))
    engine.start()
    try {
      Thread.sleep(100)
      scheduler.execute(engine, FigOne.reconfiguration(prm), 30_000)
      val id = coord.trigger().get
      assert(coord.awaitCompleted(id, 30_000))
      val versions = coord.completed(id).collect {
        case (w, r) if w.op == "FM" || w.op == "MC" => r.version
      }.toSet
      assert(versions == Set(1))
    } finally engine.shutdownNow()
  }

  // ------------------------------------------------- logging-based (replay)
  test("recorded worker executions replay deterministically, including the FCM point") {
    val recorder = new ReplayRecorder
    val rows = TestData.payments(800)
    val df = FigOne.dataflow(rows, prm.copy(loop = false))
    val engine = new Engine(df, recorder = Some(recorder))
    engine.start()
    Thread.sleep(60)
    new FriesScheduler().execute(engine, FigOne.reconfiguration(prm), 30_000)
    engine.awaitCompletion(60_000)

    for (op <- Seq("FC", "FM", "MC"); w = WorkerId(op, 0)) {
      val events = recorder.eventsOf(w)
      assert(events.nonEmpty, s"no events recorded for $w")
      val operator = df.opByName(op)
      assert(Replay.reproduces(operator, 0, events), s"$w replay diverged")
    }
    // FM and MC must have an Apply event in their logs (the reconfiguration).
    Seq("FM", "MC").foreach { op =>
      val applies = recorder.eventsOf(WorkerId(op, 0)).count(_.isInstanceOf[ReplayEvent.Apply])
      assert(applies == 1, s"$op recorded $applies applies")
    }
  }

  test("replay reproduces the final state and version") {
    val recorder = new ReplayRecorder
    val rows = TestData.payments(500)
    val df = FigOne.dataflow(rows, prm.copy(loop = false))
    val engine = new Engine(df, recorder = Some(recorder))
    engine.start()
    Thread.sleep(50)
    new FriesScheduler().execute(engine, FigOne.reconfiguration(prm), 30_000)
    engine.awaitCompletion(60_000)

    val w = WorkerId("FM", 0)
    val result = Replay.replayWorker(df.opByName("FM"), 0, recorder.eventsOf(w))
    assert(result.finalVersion == engine.workers(w).currentVersion)
    assert(result.finalState == engine.logicOf(w).state)
  }

  test("replay of a cost-free worker with no reconfiguration is trivially faithful") {
    val recorder = new ReplayRecorder
    val rows = TestData.simpleRows(200)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("A", 1, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(EdgeSpec("SRC", "A"), EdgeSpec("A", "SINK")))
    val engine = new Engine(df, recorder = Some(recorder))
    engine.start()
    engine.awaitCompletion(30_000)
    assert(Replay.reproduces(df.opByName("A"), 0, recorder.eventsOf(WorkerId("A", 0))))
  }
}
