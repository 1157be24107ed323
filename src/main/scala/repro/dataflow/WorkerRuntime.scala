package repro.dataflow

import java.util.concurrent.ConcurrentLinkedQueue
import java.util.concurrent.locks.LockSupport
import scala.collection.mutable

/** One worker of an operator: a thread that drains its control queue
  * between data messages (so FCMs bypass data, Definition 4.1), performs
  * epoch-marker alignment (Section 3.1), and applies function updates.
  */
final class WorkerRuntime(
    val id: WorkerId,
    val op: Operator,
    val inputs: Vector[Channel],
    val outPorts: Vector[OutPort],
    engine: Engine)
    extends Runnable {

  val control = new ConcurrentLinkedQueue[ControlMsg]

  // All mutable state below is touched only by this worker's thread.
  private var logic: OpLogic = op.logic(id.idx)
  private var version: Int = 0
  // Multi-version mode (Section 4.1's FCM multi-version scheduler): version
  // label -> logic; the tuple's tag picks the configuration.
  private var multiVersion = false
  private val versions = new java.util.TreeMap[Int, OpLogic]()

  private final case class AlignState(ctx: MarkerCtx, expected: Set[Int],
      arrived: mutable.Set[Int])
  private val aligning = mutable.Map.empty[Long, AlignState]
  private val blocked = mutable.Set.empty[Int]
  private val eosChannels = mutable.Set.empty[Int]
  private var finished = false

  /** Read-only access for tests; safe after `awaitCompletion` or for
    * CollectLogic (which is internally concurrent).
    */
  def currentLogicForInspection: OpLogic = logic
  def currentVersion: Int = version

  override def run(): Unit =
    try {
      var rr = 0
      val n = inputs.size
      while (!finished) {
        // parkNanos returns silently on interrupt: surface it so
        // shutdownNow() terminates the thread promptly.
        if (Thread.currentThread().isInterrupted) throw new InterruptedException
        drainControl()
        var polled: Msg = null
        var chIdx = -1
        var i = 0
        while (i < n && polled == null) {
          val idx = (rr + i) % n
          if (!blocked(idx) && !eosChannels(idx)) {
            val m = inputs(idx).q.poll()
            if (m != null) { polled = m; chIdx = idx }
          }
          i += 1
        }
        rr = if (n == 0) 0 else (rr + 1) % n
        if (polled == null) {
          if (eosChannels.size == n) finish()
          else LockSupport.parkNanos(20_000)
        } else handle(chIdx, polled)
      }
    } catch {
      case _: InterruptedException => () // shutdownNow
    }

  private def drainControl(): Unit = {
    var c = control.poll()
    while (c != null) {
      handleControl(c)
      c = control.poll()
    }
  }

  private def handleControl(c: ControlMsg): Unit = c match {
    case ControlMsg.ApplyUpdate(rid, update, latch) =>
      applyUpdate(rid, update, latch)

    case ControlMsg.StartComponentMarker(ctx) =>
      // Fries, Algorithm 2 lines 4-6: this worker is a head of an MCS
      // component. Apply own update (if reconfigured) and start the marker.
      ctx.updates.get(id.op).foreach(u => applyUpdate(ctx.id, u, ctx.latch))
      forwardMarker(ctx)

    case ControlMsg.InstallVersion(rid, v, update, latch) =>
      if (!multiVersion) { multiVersion = true; versions.put(version, logic) }
      versions.put(v, update(logic))
      engine.log.update(id, v)
      engine.recordApplied(rid, id)
      latch.countDown()

    case ControlMsg.InjectMarker(_) | ControlMsg.BumpVersion(_) | ControlMsg.StopSource =>
      throw new IllegalArgumentException(s"source-only control message $c sent to worker $id")
  }

  private def applyUpdate(rid: Long, update: FunctionUpdate, latch: java.util.concurrent.CountDownLatch): Unit = {
    if (update ne FunctionUpdate.identity) logic = update(logic)
    version += 1
    engine.log.update(id, version)
    engine.replayRecorder.foreach(_.recordApply(id, update))
    engine.recordApplied(rid, id)
    latch.countDown()
  }

  private def handle(chIdx: Int, m: Msg): Unit = m match {
    case Msg.Data(t) => processData(t)
    case Msg.Marker(ctx) => onMarker(chIdx, ctx)
    case Msg.Eos =>
      eosChannels += chIdx
      // Markers can no longer arrive on an EOS'd channel: complete any
      // alignment that was still waiting for it (prevents shutdown hangs).
      aligning.values.toVector.foreach(checkAlignment)
      if (eosChannels.size == inputs.size) finish()
  }

  private def processData(t: DTuple): Unit = {
    val (use, verUsed) =
      if (multiVersion) { val e = versions.floorEntry(t.ver); (e.getValue, e.getKey) }
      else (logic, version)
    if (use.costNanos > 0) spin(use.costNanos)
    val outputs = use.process(t)
    engine.log.data(t.txnId, id, verUsed)
    engine.replayRecorder.foreach(_.recordProcess(id, t, outputs))
    outputs.foreach { case (values, port) =>
      outPorts(port).send(DTuple(t.txnId, t.ver, values))
    }
  }

  /** Simulated processing cost. Park for coarse sleeps; spin below ~100µs
    * where parkNanos is too imprecise.
    */
  private def spin(nanos: Long): Unit =
    if (nanos >= 100_000L) LockSupport.parkNanos(nanos)
    else {
      val end = System.nanoTime() + nanos
      while (System.nanoTime() < end) {}
    }

  // --------------------------------------------------------- marker logic
  private def onMarker(chIdx: Int, ctx: MarkerCtx): Unit = {
    if (!ctx.participantOps(id.op)) return // not for us; drop
    val st = aligning.getOrElseUpdate(ctx.id, {
      val expected = inputs.indices.filter(i => ctx.participantOps(inputs(i).from.op)).toSet
      AlignState(ctx, expected, mutable.Set.empty)
    })
    st.arrived += chIdx
    blocked += chIdx // aligned-barrier: stop draining this channel
    checkAlignment(st)
  }

  private def checkAlignment(st: AlignState): Unit = {
    val outstanding = st.expected.diff(st.arrived).diff(eosChannels)
    if (outstanding.isEmpty && aligning.contains(st.ctx.id)) {
      aligning -= st.ctx.id
      st.ctx.kind match {
        case MarkerKind.Reconfig =>
          st.ctx.updates.get(id.op).foreach(u => applyUpdate(st.ctx.id, u, st.ctx.latch))
        case MarkerKind.Checkpoint =>
          engine.checkpointReporter(CheckpointReport(st.ctx.checkpointId, id, logic.state, version))
          st.ctx.latch.countDown()
      }
      forwardMarker(st.ctx)
      // Unblock; a channel stays blocked if another in-flight alignment
      // already received its marker on it.
      blocked.clear()
      aligning.values.foreach(a => blocked ++= a.arrived)
    }
  }

  /** Send the marker downstream, but only into the participating operators
    * (for Fries: the MCS component; for the epoch scheduler: everyone).
    */
  private def forwardMarker(ctx: MarkerCtx): Unit =
    outPorts.foreach { p =>
      if (ctx.participantOps(p.edge.to)) p.sendAll(Msg.Marker(ctx))
    }

  private def finish(): Unit = {
    if (!finished) {
      finished = true
      logic.onFinish().foreach { case (values, port) =>
        outPorts(port).send(DTuple(-1L, version, values))
      }
      outPorts.foreach(_.sendAll(Msg.Eos))
    }
  }
}
