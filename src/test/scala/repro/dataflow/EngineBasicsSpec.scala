package repro.dataflow

import org.scalatest.funsuite.AnyFunSuite
import repro.testutil.TestData
import repro.workflows.Logics._

class EngineBasicsSpec extends AnyFunSuite {

  private def runToCompletion(df: Dataflow, capacity: Int = 256): Engine = {
    val engine = new Engine(df, defaultCapacity = capacity)
    engine.start()
    engine.awaitCompletion(60_000)
    engine
  }

  private def simpleChain(rows: Vector[Map[String, Any]], p: Int = 1,
      partition: Partition = Partition.RoundRobin): Dataflow =
    Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("A", p, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", partition),
        EdgeSpec("A", "SINK", Partition.RoundRobin)))

  test("pass-through chain delivers every tuple exactly once") {
    val rows = TestData.simpleRows(500)
    val engine = runToCompletion(simpleChain(rows))
    val out = engine.collected("SINK")
    assert(out.size == 500)
    assert(out.map(_.long("k")).sorted == (0L until 500L))
  }

  test("tuple values are preserved") {
    val rows = TestData.simpleRows(10)
    val engine = runToCompletion(simpleChain(rows))
    assert(engine.collected("SINK").map(_.values).toSet == rows.toSet)
  }

  test("transaction ids are unique per source tuple and inherited") {
    val rows = TestData.simpleRows(100)
    val engine = runToCompletion(simpleChain(rows))
    val txns = engine.collected("SINK").map(_.txnId)
    assert(txns.distinct.size == 100)
  }

  test("multi-worker operator still delivers everything once") {
    val rows = TestData.simpleRows(1000)
    val engine = runToCompletion(simpleChain(rows, p = 4, Partition.Hash("k")))
    assert(engine.collected("SINK").size == 1000)
  }

  test("hash partitioning sends a key always to the same worker") {
    val rows = TestData.simpleRows(400).map(r => r + ("k" -> (r("k").asInstanceOf[Long] % 7)))
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("A", 3, i => new MapFilter(m => Some(m + ("worker" -> i)))),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", Partition.Hash("k")),
        EdgeSpec("A", "SINK", Partition.RoundRobin)))
    val out = runToCompletion(df).collected("SINK")
    val byKey = out.groupBy(_.long("k")).view.mapValues(_.map(_.values("worker")).toSet)
    byKey.foreach { case (k, workers) => assert(workers.size == 1, s"key $k on $workers") }
  }

  test("broadcast partitioning delivers each tuple to every downstream worker") {
    val rows = TestData.simpleRows(50)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("A", 3, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", Partition.Broadcast),
        EdgeSpec("A", "SINK", Partition.RoundRobin)))
    assert(runToCompletion(df).collected("SINK").size == 150)
  }

  test("forward partitioning requires equal parallelism") {
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => Iterator.empty)),
      ops = Vector(
        Operator("A", 2, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", Partition.Forward),
        EdgeSpec("A", "SINK", Partition.RoundRobin)))
    assertThrows[IllegalArgumentException](new Engine(df))
  }

  test("forward partitioning pins worker i to worker i") {
    val rows = TestData.simpleRows(100)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("A", 2, i => new MapFilter(m => Some(m + ("wa" -> i)))),
        Operator("B", 2, i => new MapFilter(m => Some(m + ("wb" -> i)))),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", Partition.RoundRobin),
        EdgeSpec("A", "B", Partition.Forward),
        EdgeSpec("B", "SINK", Partition.RoundRobin)))
    val out = runToCompletion(df).collected("SINK")
    out.foreach(t => assert(t.values("wa") == t.values("wb")))
  }

  test("round-robin roughly balances") {
    val rows = TestData.simpleRows(300)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("A", 3, i => new MapFilter(m => Some(m + ("worker" -> i)))),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", Partition.RoundRobin),
        EdgeSpec("A", "SINK", Partition.RoundRobin)))
    val counts = runToCompletion(df).collected("SINK").groupBy(_.values("worker")).map(_._2.size)
    assert(counts.size == 3)
    counts.foreach(c => assert(c == 100))
  }

  test("a one-to-many unnest multiplies tuples and keeps the txn id") {
    val rows = TestData.usersWithPayments(nUsers = 10, perUser = 5)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("UN", 1, _ => new Unnest("p_list")),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "UN", Partition.RoundRobin),
        EdgeSpec("UN", "SINK", Partition.RoundRobin)))
    val out = runToCompletion(df).collected("SINK")
    assert(out.size == 50)
    assert(out.groupBy(_.txnId).values.forall(_.size == 5))
  }

  test("replicate emits one copy per port") {
    val rows = TestData.simpleRows(20)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("RE", 1, _ => new Replicate(2)),
        Operator("L", 1, _ => new MapFilter(m => Some(m + ("side" -> "l")))),
        Operator("R", 1, _ => new MapFilter(m => Some(m + ("side" -> "r")))),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "RE", Partition.RoundRobin),
        EdgeSpec("RE", "L", Partition.RoundRobin),
        EdgeSpec("RE", "R", Partition.RoundRobin),
        EdgeSpec("L", "SINK", Partition.RoundRobin),
        EdgeSpec("R", "SINK", Partition.RoundRobin)))
    val out = runToCompletion(df).collected("SINK")
    assert(out.size == 40)
    assert(out.count(_.values("side") == "l") == 20)
  }

  test("self-join fuses replicated twins back to one tuple per txn") {
    val rows = TestData.simpleRows(50)
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("RE", 1, _ => new Replicate(2)),
        Operator("L", 1, _ => new MapFilter(m => Some(m + ("l" -> 1)))),
        Operator("R", 1, _ => new MapFilter(m => Some(m + ("r" -> 1)))),
        Operator("SJ", 2, _ => new SelfJoin("k")),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "RE", Partition.RoundRobin),
        EdgeSpec("RE", "L", Partition.RoundRobin),
        EdgeSpec("RE", "R", Partition.RoundRobin),
        EdgeSpec("L", "SJ", Partition.Hash("k")),
        EdgeSpec("R", "SJ", Partition.Hash("k")),
        EdgeSpec("SJ", "SINK", Partition.RoundRobin)))
    val out = runToCompletion(df).collected("SINK")
    assert(out.size == 50)
    out.foreach { t =>
      assert(t.values("l") == 1 && t.values("r") == 1, s"missing twin in ${t.values}")
    }
  }

  test("blocking aggregation emits at end of stream") {
    val rows = TestData.simpleRows(100).map(r => r + ("k" -> (r("k").asInstanceOf[Long] % 4)))
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => rows.iterator)),
      ops = Vector(
        Operator("AGG", 1, _ => new CountByKey("k"), blocking = true),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "AGG", Partition.RoundRobin),
        EdgeSpec("AGG", "SINK", Partition.RoundRobin)))
    val out = runToCompletion(df).collected("SINK")
    assert(out.size == 4)
    assert(out.map(t => t.long("k") -> t.values("count")).toMap ==
      Map(0L -> 25L, 1L -> 25L, 2L -> 25L, 3L -> 25L))
  }

  test("rate-limited source paces emission") {
    val rows = TestData.simpleRows(100)
    val df = simpleChain(rows).copy(sources =
      Vector(SourceSpec("SRC", () => rows.iterator, ratePerSec = 500)))
    val t0 = System.nanoTime()
    runToCompletion(df)
    val elapsedMs = (System.nanoTime() - t0) / 1e6
    assert(elapsedMs >= 150, s"100 tuples at 500/s finished in ${elapsedMs}ms")
  }

  test("looping source stops on request and the engine drains") {
    val rows = TestData.simpleRows(50)
    val df = simpleChain(rows).copy(sources =
      Vector(SourceSpec("SRC", () => rows.iterator, loop = true)))
    val engine = new Engine(df, defaultCapacity = 64)
    engine.start()
    Thread.sleep(100)
    engine.stopSources()
    engine.awaitCompletion(30_000)
    assert(engine.collected("SINK").size >= 50)
  }

  test("shutdownNow terminates a running engine") {
    val rows = TestData.simpleRows(50)
    val df = simpleChain(rows).copy(sources =
      Vector(SourceSpec("SRC", () => rows.iterator, loop = true)))
    val engine = new Engine(df, defaultCapacity = 16)
    engine.start()
    Thread.sleep(50)
    engine.shutdownNow() // must not hang
  }

  test("schedule log records one data entry per processed tuple") {
    val rows = TestData.simpleRows(30)
    val engine = runToCompletion(simpleChain(rows))
    val dataEntries = engine.log.dataRecords
    // 30 at A + 30 at SINK
    assert(dataEntries.size == 60)
    assert(dataEntries.forall(_.version == 0))
  }

  test("source with more than one out-edge is rejected") {
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => Iterator.empty)),
      ops = Vector(
        Operator("A", 1, _ => new Pass),
        Operator("B", 1, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A"), EdgeSpec("SRC", "B"),
        EdgeSpec("A", "SINK"), EdgeSpec("B", "SINK")))
    assertThrows[IllegalArgumentException](new Engine(df))
  }

  test("DTuple typed accessors") {
    val t = DTuple(1, 0, Map("l" -> 5L, "i" -> 3, "s" -> "7", "d" -> 2.5))
    assert(t.long("l") == 5L && t.long("i") == 3L && t.long("s") == 7L)
    assert(t.double("d") == 2.5 && t.double("l") == 5.0)
    assert(t.str("s") == "7")
  }

  test("channel accounting matches the physical topology") {
    val df = Dataflow(
      sources = Vector(SourceSpec("SRC", () => Iterator.empty)),
      ops = Vector(
        Operator("A", 3, _ => new Pass),
        Operator("B", 2, _ => new Pass),
        Operator("SINK", 1, _ => new CollectLogic)),
      edges = Vector(
        EdgeSpec("SRC", "A", Partition.Hash("k")),
        EdgeSpec("A", "B", Partition.Hash("k")),
        EdgeSpec("B", "SINK", Partition.Hash("k"))))
    val engine = new Engine(df)
    assert(engine.channelPairs.size == 3 + 6 + 2)
    assert(engine.channelsBetween(Set("A", "B")) == 6)
  }
}
