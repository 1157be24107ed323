package repro.testutil

import scala.util.Random

/** Pure-Scala deterministic row generators for engine-only tests (the
  * Spark-generated datasets are exercised in the workflow/data suites; the
  * engine suites stay Spark-free so they run in milliseconds).
  */
object TestData {

  def payments(n: Int, nUsers: Int = 20, nMerchants: Int = 10, seed: Long = 1): Vector[Map[String, Any]] = {
    val rng = new Random(seed)
    (0 until n).map { i =>
      Map[String, Any](
        "p_id" -> i.toLong,
        "p_user" -> (rng.nextInt(nUsers) + 1).toLong,
        "p_merchant" -> (rng.nextInt(nMerchants) + 1).toLong,
        "p_amount" -> math.rint(rng.nextDouble() * 50000) / 100.0)
    }.toVector
  }

  /** Dataset-2 style rows: one row per user with a payment list. */
  def usersWithPayments(nUsers: Int, perUser: Int, nMerchants: Int = 10,
      seed: Long = 2): Vector[Map[String, Any]] = {
    val rng = new Random(seed)
    var pid = 0L
    (1 to nUsers).map { u =>
      val list = (1 to perUser).map { _ =>
        pid += 1
        Map[String, Any](
          "p_id" -> pid,
          "p_merchant" -> (rng.nextInt(nMerchants) + 1).toLong,
          "p_amount" -> math.rint(rng.nextDouble() * 50000) / 100.0)
      }.toVector
      Map[String, Any]("p_user" -> u.toLong, "p_list" -> list)
    }.toVector
  }

  def simpleRows(n: Int): Vector[Map[String, Any]] =
    (0 until n).map(i => Map[String, Any]("k" -> i.toLong, "v" -> i.toDouble)).toVector
}
