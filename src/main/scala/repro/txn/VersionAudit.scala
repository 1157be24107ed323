package repro.txn

/** Consistency audit over an execution's schedule log.
  *
  * The engine records, for every data operation at a worker, the
  * configuration version the worker used (versions increment on every
  * applied function update). For a single reconfiguration this is an exact
  * encoding of conflict-serializability: the recorded schedule is
  * conflict-serializable iff no data transaction was processed with two
  * different configuration versions at the reconfiguration target workers
  * (Section 4.2; see `Serializability` for the abstract formulation).
  */
object VersionAudit {

  /** One recorded data operation: transaction `txn` processed at worker
    * `worker` (format `op#idx`) of logical operator `op`, using config
    * version `version`.
    */
  final case class DataRecord(txn: Long, op: String, worker: String, version: Int)

  /** A consistency violation: transaction `txn` observed multiple config
    * versions across the reconfiguration operators.
    */
  final case class Violation(txn: Long, versionsSeen: Map[String, Set[Int]])

  /** Audits the log against a reconfiguration of `reconfigOps` (logical
    * operator names). Only records at those operators participate in
    * conflicts (Definition 4.6).
    */
  def check(records: Seq[DataRecord], reconfigOps: Set[String]): Seq[Violation] =
    records
      .filter(r => reconfigOps(r.op))
      .groupBy(_.txn)
      .iterator
      .collect {
        case (txn, rs) if rs.map(_.version).distinct.sizeIs > 1 =>
          Violation(txn, rs.groupBy(_.worker).view.mapValues(_.map(_.version).toSet).toMap)
      }
      .toSeq
      .sortBy(_.txn)

  def isConflictSerializable(records: Seq[DataRecord], reconfigOps: Set[String]): Boolean =
    check(records, reconfigOps).isEmpty
}
