package repro.ft

import java.util.concurrent.{ConcurrentHashMap, CountDownLatch, TimeUnit}
import java.util.concurrent.atomic.AtomicLong
import scala.jdk.CollectionConverters._
import repro.dataflow._

/** Checkpoint-based fault tolerance under Fries (Section 7.3).
  *
  * Aligned checkpoints (epoch-marker based, as in Flink) are coordinated
  * here. Because Fries FCMs overtake data, a checkpoint whose markers are
  * in flight when a reconfiguration arrives could capture a mix of old and
  * new configurations (the Figure 7 race). The paper's fix, implemented
  * here: when a reconfiguration request arrives the coordinator *cancels*
  * all in-flight checkpoints and *blocks* new ones until every head
  * operator of each MCS component has received its FCM; subsequent markers
  * are then guaranteed to trail the FCMs, so completed checkpoints only
  * ever contain fully old or fully new configurations.
  *
  * Worker states and config versions are snapshot; source offsets are not
  * (a deliberate simplification — replaying a source from an offset is
  * orthogonal to the consistency property under study).
  */
final class CheckpointCoordinator(engine: Engine) {

  private final class Pending(val id: Long, val expected: Int) {
    val reports = new ConcurrentHashMap[WorkerId, CheckpointReport]
    @volatile var canceled = false
    val done = new CountDownLatch(1)
  }

  private val idGen = new AtomicLong(0)
  private val pending = new ConcurrentHashMap[Long, Pending]
  private val completedMap = new ConcurrentHashMap[Long, Map[WorkerId, CheckpointReport]]
  @volatile private var blockedForReconfig = false

  engine.checkpointReporter = onReport

  private val totalWorkers: Int = engine.df.ops.map(_.parallelism).sum

  /** Start an aligned checkpoint; returns its id, or None while checkpoints
    * are blocked by an in-flight reconfiguration.
    */
  def trigger(): Option[Long] = synchronized {
    if (blockedForReconfig) None
    else {
      val id = idGen.getAndIncrement()
      pending.put(id, new Pending(id, totalWorkers))
      val allOps = (engine.df.sources.map(_.name) ++ engine.df.ops.map(_.name)).toSet
      val ctx = MarkerCtx(
        id = -1000 - id, // marker ids share the reconfig-id space; keep disjoint
        kind = MarkerKind.Checkpoint,
        participantOps = allOps,
        updates = Map.empty,
        latch = new CountDownLatch(totalWorkers),
        checkpointId = id)
      engine.sourceRuntimes.keys.foreach(engine.sendControl(_, ControlMsg.InjectMarker(ctx)))
      Some(id)
    }
  }

  private def onReport(r: CheckpointReport): Unit = {
    val p = pending.get(r.checkpointId)
    if (p != null && !p.canceled) {
      p.reports.put(r.worker, r)
      if (p.reports.size == p.expected) {
        // Re-check cancellation at completion: a cancel racing with the last
        // report must win, otherwise an inconsistent snapshot could commit.
        synchronized {
          if (!p.canceled && pending.remove(r.checkpointId) != null) {
            completedMap.put(r.checkpointId, p.reports.asScala.toMap)
            p.done.countDown()
          }
        }
      }
    }
  }

  /** Reconfiguration arrived: cancel in-flight checkpoints and block new
    * ones (Section 7.3, "Checkpoint-based fault tolerance").
    */
  def onReconfigRequested(): Unit = synchronized {
    pending.values.asScala.foreach(_.canceled = true)
    pending.clear()
    blockedForReconfig = true
  }

  /** All head FCMs of the reconfiguration have been handed to their
    * workers' control queues: new checkpoints may start again.
    */
  def onHeadFcmsDelivered(): Unit = synchronized { blockedForReconfig = false }

  def isBlocked: Boolean = blockedForReconfig

  def awaitCompleted(id: Long, timeoutMs: Long): Boolean = {
    val p = pending.get(id)
    if (p == null) completedMap.containsKey(id)
    else p.done.await(timeoutMs, TimeUnit.MILLISECONDS) && completedMap.containsKey(id)
  }

  /** Committed (completed, never-canceled) checkpoints. */
  def completed: Map[Long, Map[WorkerId, CheckpointReport]] = completedMap.asScala.toMap

  /** A completed checkpoint is consistent w.r.t. a reconfiguration iff all
    * workers of the reconfigured operators were captured at the same config
    * version (all-old or all-new).
    */
  def isConsistent(id: Long, reconfigOps: Set[String]): Boolean =
    completedMap.asScala.get(id).exists { reports =>
      reports.collect { case (w, r) if reconfigOps(w.op) => r.version }.toSet.sizeIs <= 1
    }
}
