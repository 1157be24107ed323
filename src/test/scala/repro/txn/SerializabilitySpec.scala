package repro.txn

import org.scalatest.funsuite.AnyFunSuite
import repro.txn.Serializability._

class SerializabilitySpec extends AnyFunSuite {

  // The Section 4.2 running example: data transaction T1 over FC, FM, MC;
  // update transaction T2 = {μ(FM), μ(MC)}.
  private def d(t: String, o: String) = DataOp(t, o)
  private def u(o: String) = UpdateOp(o)

  test("paper S1 is conflict-serializable") {
    val s1 = Seq(d("t", "FC"), u("FM"), d("t", "FM"), u("MC"), d("t", "MC"))
    assert(isConflictSerializable(s1))
  }

  test("paper S2 (serial) is conflict-serializable") {
    val s2 = Seq(u("FM"), u("MC"), d("t", "FC"), d("t", "FM"), d("t", "MC"))
    assert(isConflictSerializable(s2))
  }

  test("paper S3 is NOT conflict-serializable") {
    val s3 = Seq(d("t", "FC"), d("t", "FM"), u("FM"), u("MC"), d("t", "MC"))
    assert(!isConflictSerializable(s3))
    assert(violations(s3) == Set("t"))
  }

  test("all-before schedule is serializable") {
    val s = Seq(d("t", "FM"), d("t", "MC"), u("FM"), u("MC"))
    assert(isConflictSerializable(s))
  }

  test("operations on non-reconfigured operators never conflict") {
    val s = Seq(d("t", "FC"), u("FM"), d("t", "FC"), d("t2", "FC"))
    assert(isConflictSerializable(s))
  }

  test("two transactions on opposite sides are fine") {
    val s = Seq(d("t1", "FM"), d("t1", "MC"), u("FM"), u("MC"), d("t2", "FM"), d("t2", "MC"))
    assert(isConflictSerializable(s))
  }

  test("paper S4 (Figure 6 example) is conflict-serializable") {
    val s4 = Seq(d("t1", "X"), u("C"), d("t1", "C"), d("t2", "X"), u("D"), d("t2", "D"))
    assert(isConflictSerializable(s4))
  }

  test("paper S5 (Figure 8 example) is NOT conflict-serializable") {
    // t5 processed by FMX before μ(FMX), t6 (same transaction) after.
    val s5 = Seq(d("t", "FC"), d("t", "J"), d("t", "SP"), d("t", "SP"), d("t", "SP"),
      d("t", "FMX"), u("FMX"), d("t", "FMX"), d("t", "FMY"),
      d("t", "U"), d("t", "U"), d("t", "U"))
    assert(!isConflictSerializable(s5))
  }

  test("one-to-many: same transaction twice at an operator on the same side is fine") {
    val s = Seq(d("t", "FMX"), d("t", "FMX"), u("FMX"))
    assert(isConflictSerializable(s))
  }

  test("duplicate μ(o) is rejected (single update transaction)") {
    assertThrows[IllegalArgumentException](
      isConflictSerializable(Seq(u("FM"), u("FM"))))
  }

  test("EBR property: every epoch-split schedule is serializable (Lemma 4.10)") {
    // Tuples before the marker do all their ops before every μ; after, after.
    val rng = new scala.util.Random(3)
    (1 to 50).foreach { _ =>
      val ops = Seq("A", "B", "C")
      val nBefore = rng.nextInt(4); val nAfter = rng.nextInt(4)
      val before = (1 to nBefore).flatMap(i => ops.map(o => d(s"b$i", o)))
      val after = (1 to nAfter).flatMap(i => ops.map(o => d(s"a$i", o)))
      val s = rng.shuffle(before) ++ Seq(u("B"), u("C")) ++ rng.shuffle(after)
      assert(isConflictSerializable(s))
    }
  }
}
