package repro.dataflow

import java.util.concurrent.CountDownLatch

/** Identifies one worker of an operator in the parallel dataflow G*
  * (Section 7.2).
  */
final case class WorkerId(op: String, idx: Int) {
  override def toString: String = s"$op#$idx"
}

/** What a marker is synchronizing. */
sealed trait MarkerKind
object MarkerKind {

  /** Epoch marker carrying (part of) a reconfiguration — used both by the
    * epoch-based scheduler (through the whole dataflow) and by Fries
    * (within one MCS component).
    */
  case object Reconfig extends MarkerKind

  /** Aligned-checkpoint marker (Section 7.3). */
  case object Checkpoint extends MarkerKind
}

/** Context attached to an epoch marker. Mirrors the paper's Flink
  * implementation (Section 8.1): "the checkpoint barrier also included C
  * and the reconfiguration operators in C" — workers learn from the marker
  * which downstream operators are in the component and which must apply
  * the update.
  *
  * @param id             unique marker/reconfiguration id
  * @param participantOps operators (and sources) that align and forward
  *                       this marker; for the epoch scheduler this is every
  *                       vertex, for Fries one MCS component
  * @param updates        function updates keyed by logical operator name
  * @param latch          counted down once per applied update (per worker)
  *                       and, for checkpoints, once per snapshot
  */
final case class MarkerCtx(
    id: Long,
    kind: MarkerKind,
    participantOps: Set[String],
    updates: Map[String, FunctionUpdate],
    latch: CountDownLatch,
    checkpointId: Long = -1L)

/** Messages traveling on data channels, in FIFO order. */
sealed trait Msg
object Msg {
  final case class Data(t: DTuple) extends Msg
  final case class Marker(ctx: MarkerCtx) extends Msg
  case object Eos extends Msg
}

/** Fast control messages (Definition 4.1): delivered on a per-worker
  * control queue that the worker drains between data messages, so they are
  * never blocked behind buffered data.
  */
sealed trait ControlMsg
object ControlMsg {

  /** Naive-scheduler FCM: apply the update immediately after the current
    * tuple (Section 4.1).
    */
  final case class ApplyUpdate(reconfigId: Long, update: FunctionUpdate, latch: CountDownLatch)
      extends ControlMsg

  /** Fries FCM to a head worker of an MCS component: apply own update if
    * any, then start propagating the epoch marker within the component
    * (Algorithm 2, lines 4–6).
    */
  final case class StartComponentMarker(ctx: MarkerCtx) extends ControlMsg

  /** Epoch/checkpoint scheduler: ask a source worker to emit a marker into
    * the data stream.
    */
  final case class InjectMarker(ctx: MarkerCtx) extends ControlMsg

  /** Multi-version scheduler: install an additional configuration version
    * side-by-side with the current one (Section 4.1).
    */
  final case class InstallVersion(reconfigId: Long, version: Int, update: FunctionUpdate,
      latch: CountDownLatch) extends ControlMsg

  /** Multi-version scheduler: source starts tagging tuples with `version`. */
  final case class BumpVersion(version: Int) extends ControlMsg

  /** Ask a source worker to stop emitting and send end-of-stream. */
  case object StopSource extends ControlMsg
}
