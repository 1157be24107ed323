package repro.txn

import org.scalatest.funsuite.AnyFunSuite
import repro.txn.VersionAudit._

class VersionAuditSpec extends AnyFunSuite {

  private def rec(txn: Long, op: String, worker: Int, ver: Int) =
    DataRecord(txn, op, s"$op#$worker", ver)

  test("uniform versions across reconfig ops: consistent") {
    val recs = Seq(rec(1, "FM", 0, 0), rec(1, "MC", 0, 0), rec(2, "FM", 0, 1), rec(2, "MC", 0, 1))
    assert(isConflictSerializable(recs, Set("FM", "MC")))
  }

  test("mixed versions within one transaction: violation") {
    val recs = Seq(rec(1, "FM", 0, 0), rec(1, "MC", 0, 1))
    val vs = check(recs, Set("FM", "MC"))
    assert(vs.map(_.txn) == Seq(1L))
  }

  test("mixed versions at the same operator (one-to-many case): violation") {
    val recs = Seq(rec(1, "FMX", 0, 0), rec(1, "FMX", 0, 1))
    assert(!isConflictSerializable(recs, Set("FMX")))
  }

  test("versions at non-reconfig operators are ignored") {
    val recs = Seq(rec(1, "FC", 0, 0), rec(1, "FM", 0, 1), rec(1, "MC", 0, 1))
    assert(isConflictSerializable(recs, Set("FM", "MC")))
  }

  test("mixed versions across different transactions are fine") {
    val recs = Seq(rec(1, "FM", 0, 0), rec(2, "FM", 0, 1))
    assert(isConflictSerializable(recs, Set("FM")))
  }

  test("violation reports the versions seen per worker") {
    val recs = Seq(rec(5, "FM", 0, 0), rec(5, "FM", 1, 1))
    val v = check(recs, Set("FM")).head
    assert(v.versionsSeen == Map("FM#0" -> Set(0), "FM#1" -> Set(1)))
  }

  test("empty log is consistent") {
    assert(isConflictSerializable(Nil, Set("FM")))
  }
}
