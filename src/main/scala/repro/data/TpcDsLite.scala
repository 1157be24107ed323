package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** TPC-DS-lite: deterministic synthetic generators for the subset of the
  * TPC-DS schema touched by the paper's workflows W2 (query 40) and W3
  * (query 71) — dataset 3 of the paper (TPC-DS SF=100; here SF=1 is scaled
  * to ~1.4M catalog_sales rows so SF=0.01/0.1 stay test/bench sized).
  *
  * Foreign keys reference the corresponding dimension ranges so every probe
  * tuple finds its dimension row (primary-key/foreign-key joins — the
  * paper notes all joins in W2/W3 are one-to-one for this reason).
  */
object TpcDsLite {
  private val NCatalogPerSf = 1_440_000L
  private val NStorePerSf = 2_880_000L
  private val NWebPerSf = 710_000L
  private val NItemPerSf = 2_000L
  val NDates = 2557L // 1992-01-01 .. 1998-12-31
  val NWarehouses = 5L
  val NTimes = 1440L // one row per minute of day

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def items(sf: Double): Long = n(NItemPerSf, sf)

  def item(spark: SparkSession, sf: Double = 0.01, seed: Long = 21): DataFrame = {
    import spark.implicits._
    spark.range(1, items(sf) + 1).toDF("i_item_sk").select(
      $"i_item_sk",
      format_string("ITEM%07d", $"i_item_sk") as "i_item_id",
      round(rand(seed) * 2.0 + 0.5, 2) as "i_current_price",
      (rand(seed + 1) * 1000 + 1).cast(IntegerType) as "i_brand_id",
      format_string("BRAND%04d", (rand(seed + 1) * 1000 + 1).cast(IntegerType)) as "i_brand",
      (rand(seed + 2) * 100 + 1).cast(IntegerType) as "i_manager_id",
    )
  }

  def warehouse(spark: SparkSession, seed: Long = 22): DataFrame = {
    import spark.implicits._
    spark.range(1, NWarehouses + 1).toDF("w_warehouse_sk").select(
      $"w_warehouse_sk",
      format_string("Warehouse %d", $"w_warehouse_sk") as "w_warehouse_name",
      element_at(array(lit("CA"), lit("GA"), lit("NM"), lit("TN"), lit("WA")),
        ($"w_warehouse_sk" % 5 + 1).cast("int")) as "w_state",
    )
  }

  def dateDim(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.range(1, NDates + 1).toDF("d_date_sk").select(
      $"d_date_sk",
      date_add(lit("1992-01-01").cast(DateType), ($"d_date_sk" - 1).cast("int")) as "d_date",
    ).select(
      $"d_date_sk", $"d_date",
      month($"d_date") as "d_moy",
      year($"d_date") as "d_year",
    )
  }

  /** One row per minute of day; `t_meal_time` is breakfast for 6am–9am,
    * dinner for 5pm–8pm, null otherwise (as in TPC-DS query 71).
    */
  def timeDim(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.range(0, NTimes).toDF("t_time_sk").select(
      $"t_time_sk",
      ($"t_time_sk" / 60).cast(IntegerType) as "t_hour",
      ($"t_time_sk" % 60).cast(IntegerType) as "t_minute",
    ).select(
      $"t_time_sk", $"t_hour", $"t_minute",
      when($"t_hour" >= 6 && $"t_hour" <= 8, "breakfast")
        .when($"t_hour" >= 17 && $"t_hour" <= 19, "dinner")
        .otherwise(null) as "t_meal_time",
    )
  }

  private def sales(spark: SparkSession, prefix: String, rows: Long, sf: Double,
      seed: Long): DataFrame = {
    import spark.implicits._
    val nItem = items(sf)
    spark.range(rows).toDF("id").select(
      (rand(seed) * NDates + 1).cast(LongType) as s"${prefix}_sold_date_sk",
      (rand(seed + 1) * NTimes).cast(LongType) as s"${prefix}_sold_time_sk",
      (rand(seed + 2) * nItem + 1).cast(LongType) as s"${prefix}_item_sk",
      (rand(seed + 3) * NWarehouses + 1).cast(LongType) as s"${prefix}_warehouse_sk",
      ($"id" / 4 + 1).cast(LongType) as s"${prefix}_order_number",
      (rand(seed + 4) * 100 + 1).cast(IntegerType) as s"${prefix}_quantity",
      round(rand(seed + 5) * 300 + 1, 2) as s"${prefix}_sales_price",
    )
  }

  def catalogSales(spark: SparkSession, sf: Double = 0.01, seed: Long = 23): DataFrame =
    sales(spark, "cs", n(NCatalogPerSf, sf), sf, seed)

  def storeSales(spark: SparkSession, sf: Double = 0.01, seed: Long = 24): DataFrame =
    sales(spark, "ss", n(NStorePerSf, sf), sf, seed)

  def webSales(spark: SparkSession, sf: Double = 0.01, seed: Long = 25): DataFrame =
    sales(spark, "ws", n(NWebPerSf, sf), sf, seed)

  /** ~10% of catalog sales are returned; rows are a deterministic sample of
    * catalog_sales so the W2 left join on (order, item) actually matches.
    */
  def catalogReturns(spark: SparkSession, sf: Double = 0.01, seed: Long = 23): DataFrame = {
    import spark.implicits._
    catalogSales(spark, sf, seed)
      .where(pmod(hash($"cs_order_number", $"cs_item_sk"), lit(10)) === 0)
      // An order can list the same item twice; keep one return per
      // (order, item) so the W2 left join stays one-to-one.
      .dropDuplicates("cs_order_number", "cs_item_sk")
      .select(
        $"cs_order_number" as "cr_order_number",
        $"cs_item_sk" as "cr_item_sk",
        ($"cs_quantity" / 2 + 1).cast(IntegerType) as "cr_return_quantity",
        round($"cs_sales_price" * 0.5, 2) as "cr_refunded_cash",
      )
  }
}
