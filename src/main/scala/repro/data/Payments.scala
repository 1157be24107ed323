package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic substitute for the credit-card payment dataset of the paper
  * (dataset 1: 24M tuples, 12 attributes, from Padhi et al. [29] — not
  * redistributable), and its per-user aggregation (dataset 2).
  *
  * Deterministic in (sf, seed). SF=1 is scaled to 240K payments so that
  * unit tests (SF=0.01) and benchmarks (SF<=0.5) stay laptop-sized; the
  * schema keeps the attributes the paper's workflows touch (user, merchant,
  * amount, date, chip usage) plus filler attributes to reach a comparable
  * width.
  */
object Payments {
  private val NPaymentsPerSf = 240_000L
  private val NUsersPerSf = 2_000L
  private val NMerchantsPerSf = 500L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def users(sf: Double): Long = n(NUsersPerSf, sf)
  def merchants(sf: Double): Long = n(NMerchantsPerSf, sf)

  /** Dataset 1: the payment stream. `p_id` is a dense sequence and the
    * stream order key.
    *
    * @param nUsers override the user-domain size (0 = derive from sf);
    *               benchmarks use it to control payments-per-user, i.e.
    *               the unnest fan-out of dataset 2
    */
  def payments(spark: SparkSession, sf: Double = 0.01, seed: Long = 11,
      nUsers: Long = 0L): DataFrame = {
    import spark.implicits._
    val nU = if (nUsers > 0) nUsers else users(sf); val nM = merchants(sf)
    spark.range(n(NPaymentsPerSf, sf)).toDF("p_id").select(
      $"p_id",
      (rand(seed) * nU + 1).cast(LongType) as "p_user",
      (rand(seed + 1) * nM + 1).cast(LongType) as "p_merchant",
      round(rand(seed + 2) * 500 + 1, 2) as "p_amount",
      date_add(lit("2019-01-01").cast(DateType),
        (rand(seed + 3) * 730).cast("int")) as "p_date",
      element_at(array(lit("chip"), lit("swipe"), lit("online")),
        (rand(seed + 4) * 3 + 1).cast("int")) as "p_chip",
      (rand(seed + 5) * 100 + 5000).cast(IntegerType) as "p_mcc",
      (rand(seed + 6) * 900 + 100).cast(IntegerType) as "p_city",
      element_at(array(lit("CA"), lit("NY"), lit("TX"), lit("WA"), lit("IL")),
        (rand(seed + 7) * 5 + 1).cast("int")) as "p_state",
      (rand(seed + 8) * 90000 + 10000).cast(IntegerType) as "p_zip",
    )
  }

  /** Dataset 2: payments grouped per user — each record is a user plus the
    * ordered list of their payments, consumed by the one-to-many unnest
    * operator of workflow W4.
    */
  def paymentsByUser(spark: SparkSession, sf: Double = 0.01, seed: Long = 11,
      nUsers: Long = 0L): DataFrame = {
    val p = payments(spark, sf, seed, nUsers)
    p.groupBy(col("p_user"))
      .agg(sort_array(collect_list(struct(
        col("p_id"), col("p_merchant"), col("p_amount")))) as "p_list")
      .select(col("p_user"), col("p_list"))
  }
}
