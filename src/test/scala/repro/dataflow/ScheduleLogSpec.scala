package repro.dataflow

import org.scalatest.funsuite.AnyFunSuite

class ScheduleLogSpec extends AnyFunSuite {

  test("records data and update entries with a global sequence") {
    val log = new ScheduleLog(true)
    log.data(1, WorkerId("A", 0), 0)
    log.update(WorkerId("A", 0), 1)
    log.data(1, WorkerId("A", 0), 1)
    val es = log.entries
    assert(es.map(_.seq) == Vector(0L, 1L, 2L))
    assert(es.collect { case log.DataEntry(_, _, _, v) => v } == Vector(0, 1))
  }

  test("dataRecords expose the audit view") {
    val log = new ScheduleLog(true)
    log.data(42, WorkerId("FM", 1), 0)
    val r = log.dataRecords.head
    assert(r.txn == 42 && r.op == "FM" && r.worker == "FM#1" && r.version == 0)
  }

  test("disabled log records nothing (zero data-path bookkeeping)") {
    val log = new ScheduleLog(false)
    log.data(1, WorkerId("A", 0), 0)
    log.update(WorkerId("A", 0), 1)
    assert(log.entries.isEmpty)
  }

  test("clear empties the log") {
    val log = new ScheduleLog(true)
    log.data(1, WorkerId("A", 0), 0)
    log.clear()
    assert(log.entries.isEmpty)
  }
}
