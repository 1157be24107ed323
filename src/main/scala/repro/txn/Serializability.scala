package repro.txn

/** The transactional model of Section 4.2 of the Fries paper.
  *
  * The processing of one source tuple by every operator it touches is a
  * *data transaction*; a reconfiguration is one *function-update
  * transaction*. A data operation `φ(t, o)` conflicts with a function-update
  * operation `μ(o')` iff `o == o'`. A schedule (an interleaving of the
  * operations) is consistent iff it is conflict-serializable
  * (Definition 4.9).
  */
object Serializability {

  /** One operation in a schedule. `op` identifies the operator — at the
    * logical level an operator name, at the physical level a worker id
    * (Section 7.2 maps μ(o) to a μ per worker, and conflicts are between
    * operations on the same worker vertex of the parallel dataflow G*).
    */
  sealed trait Event { def op: String }

  /** Data operation φ(t, o): transaction `txn` processed at operator `op`. */
  final case class DataOp(txn: String, op: String) extends Event

  /** Function-update operation μ(o) of the (single) update transaction. */
  final case class UpdateOp(op: String) extends Event

  /** Checks conflict-serializability of a totally ordered schedule that
    * contains at most one function-update transaction (the setting of the
    * paper; Definition 4.7 note).
    *
    * With a single update transaction U the precedence graph can only have
    * cycles of the form T → U → T, so the schedule is conflict-serializable
    * iff no data transaction T has one conflicting data operation before a
    * μ(o) of U and another conflicting data operation after a μ(o') of U.
    */
  def isConflictSerializable(schedule: Seq[Event]): Boolean =
    violations(schedule).isEmpty

  /** The data transactions that conflict with the update transaction in
    * both directions — empty iff the schedule is conflict-serializable.
    */
  def violations(schedule: Seq[Event]): Set[String] = {
    val updatePos: Map[String, Int] = schedule.zipWithIndex.collect {
      case (UpdateOp(o), i) => o -> i
    }.toMap
    require(
      schedule.collect { case UpdateOp(o) => o }.sizeIs == updatePos.size,
      "at most one μ(o) per operator (single update transaction)")

    // txn -> (has a conflicting φ before its μ, has one after)
    val before = scala.collection.mutable.Set.empty[String]
    val after = scala.collection.mutable.Set.empty[String]
    schedule.zipWithIndex.foreach {
      case (DataOp(t, o), i) =>
        updatePos.get(o).foreach { u =>
          if (i < u) before += t else after += t
        }
      case _ => ()
    }
    before.toSet.intersect(after.toSet)
  }
}
