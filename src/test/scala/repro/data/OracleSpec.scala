package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** The oracle must catch wrong results, not just bless identical ones. */
class OracleSpec extends SparkSpec {

  private lazy val p = Payments.payments(spark, 0.002)

  test("oracle accepts an equivalent query") {
    val agg = p.groupBy("p_chip").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(agg,
      "SELECT p_chip, count(*) AS cnt FROM payments GROUP BY p_chip",
      "payments" -> p)
  }

  test("oracle rejects a result with wrong values") {
    val wrong = p.groupBy("p_chip").agg((count(lit(1)) + 1) as "cnt")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT p_chip, count(*) AS cnt FROM payments GROUP BY p_chip",
        "payments" -> p)
    }
  }

  test("oracle rejects a result with missing rows") {
    val missing = p.where(col("p_chip") =!= "chip")
      .groupBy("p_chip").agg(count(lit(1)) as "cnt")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(missing,
        "SELECT p_chip, count(*) AS cnt FROM payments GROUP BY p_chip",
        "payments" -> p)
    }
  }

  test("oracle rejects mismatched column sets") {
    val agg = p.groupBy("p_chip").agg(count(lit(1)) as "n")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(agg,
        "SELECT p_chip, count(*) AS cnt FROM payments GROUP BY p_chip",
        "payments" -> p)
    }
  }
}
