package repro.dataflow

import java.util.concurrent.ConcurrentLinkedQueue
import java.util.concurrent.atomic.AtomicLong
import repro.txn.VersionAudit
import scala.jdk.CollectionConverters._

/** Execution-wide schedule log used by the consistency audit
  * (`repro.txn.VersionAudit`). Each worker appends one record per data
  * operation (with the config version it used) and per function-update
  * operation. Appends are lock-free; the global sequence number gives a
  * linearization for debugging, while correctness of the audit only relies
  * on per-worker-thread ordering.
  *
  * Logging is disabled in delay benchmarks to keep the data path cheap —
  * the Fries scheduler itself has no bookkeeping on the data path before a
  * reconfiguration arrives (Section 1.1).
  */
final class ScheduleLog(val enabled: Boolean) {

  sealed trait Entry { def seq: Long }
  final case class DataEntry(seq: Long, txn: Long, worker: WorkerId, version: Int) extends Entry
  final case class UpdateEntry(seq: Long, worker: WorkerId, newVersion: Int) extends Entry

  private val seq = new AtomicLong(0)
  private val buf = new ConcurrentLinkedQueue[Entry]

  def data(txn: Long, worker: WorkerId, version: Int): Unit =
    if (enabled) buf.add(DataEntry(seq.getAndIncrement(), txn, worker, version))

  def update(worker: WorkerId, newVersion: Int): Unit =
    if (enabled) buf.add(UpdateEntry(seq.getAndIncrement(), worker, newVersion))

  def entries: Vector[Entry] = buf.asScala.toVector.sortBy(_.seq)

  /** Data operations in audit form. */
  def dataRecords: Seq[VersionAudit.DataRecord] =
    entries.collect { case DataEntry(_, txn, w, v) =>
      VersionAudit.DataRecord(txn, w.op, w.toString, v)
    }

  def clear(): Unit = buf.clear()
}
