package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** TPC-DS-lite synthetic generator (DESIGN.md substitution #3).
  *
  * Snowflake schema with 4 fact tables and 6 dimensions. Facts scale
  * linearly with `sf`; dimensions scale with `√sf` (TPC-DS's sub-linear
  * domain scaling, §8.1.1). Deterministic in (sf, seed).
  */
object DsData {
  private val NStoreSalesPerSf   = 2_880_000L
  private val NCatalogSalesPerSf = 1_440_000L
  private val NWebSalesPerSf     =   720_000L
  private val NInventoryPerSf    =   500_000L
  private val NDates             = 2557L // 1998-01-01 .. 2004-12-31

  private def lin(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)
  private def dom(base: Long, sf: Double): Long = math.max(8L, (base * math.sqrt(sf)).toLong)

  def nItems(sf: Double): Long     = dom(18_000L, sf)
  def nCustomers(sf: Double): Long = dom(100_000L, sf)
  def nAddresses(sf: Double): Long = dom(50_000L, sf)
  def nStores(sf: Double): Long    = math.max(4L, (12L * math.sqrt(sf)).toLong.max(4L))
  def nWarehouses(sf: Double): Long = 5L

  def dateDim(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.range(1, NDates + 1).toDF("d_date_sk").select(
      $"d_date_sk",
      date_add(lit("1998-01-01").cast(DateType), ($"d_date_sk" - 1).cast("int")) as "d_date",
      (year(date_add(lit("1998-01-01").cast(DateType), ($"d_date_sk" - 1).cast("int")))) as "d_year",
      (month(date_add(lit("1998-01-01").cast(DateType), ($"d_date_sk" - 1).cast("int")))) as "d_moy",
      (quarter(date_add(lit("1998-01-01").cast(DateType), ($"d_date_sk" - 1).cast("int")))) as "d_qoy",
    )
  }

  def item(spark: SparkSession, sf: Double, seed: Long = 20): DataFrame = {
    import spark.implicits._
    spark.range(1, nItems(sf) + 1).toDF("i_item_sk").select(
      $"i_item_sk",
      concat(lit("ITEM_"), lpad($"i_item_sk".cast(StringType), 7, "0")) as "i_item_id",
      element_at(array((1 to 10).map(i => lit(s"Category_$i")): _*),
        (rand(seed) * 10 + 1).cast("int")) as "i_category",
      concat(lit("Brand_"), (rand(seed + 1) * 50 + 1).cast(IntegerType).cast(StringType)) as "i_brand",
      (rand(seed + 2) * 100 + 1).cast(IntegerType) as "i_manufact_id",
      round(rand(seed + 3) * 99 + 1, 2) as "i_current_price",
    )
  }

  def customer(spark: SparkSession, sf: Double, seed: Long = 21): DataFrame = {
    import spark.implicits._
    spark.range(1, nCustomers(sf) + 1).toDF("c_customer_sk").select(
      $"c_customer_sk",
      (rand(seed) * nAddresses(sf) + 1).cast(LongType) as "c_current_addr_sk",
      (rand(seed + 1) * 80 + 1930).cast(IntegerType)   as "c_birth_year",
    )
  }

  def customerAddress(spark: SparkSession, sf: Double, seed: Long = 22): DataFrame = {
    import spark.implicits._
    spark.range(1, nAddresses(sf) + 1).toDF("ca_address_sk").select(
      $"ca_address_sk",
      element_at(array((1 to 20).map(i => lit(f"ST$i%02d")): _*),
        (rand(seed) * 20 + 1).cast("int")) as "ca_state",
      (-(rand(seed + 1) * 4 + 5)).cast(IntegerType) as "ca_gmt_offset",
      concat(lit("Z"), lpad(((rand(seed + 2) * 100).cast(IntegerType)).cast(StringType), 3, "0")) as "ca_zip",
    )
  }

  def store(spark: SparkSession, sf: Double, seed: Long = 23): DataFrame = {
    import spark.implicits._
    spark.range(1, nStores(sf) + 1).toDF("s_store_sk").select(
      $"s_store_sk",
      concat(lit("Store_"), $"s_store_sk".cast(StringType)) as "s_store_name",
      element_at(array((1 to 10).map(i => lit(f"ST$i%02d")): _*),
        (rand(seed) * 10 + 1).cast("int")) as "s_state",
    )
  }

  def warehouse(spark: SparkSession, sf: Double, seed: Long = 24): DataFrame = {
    import spark.implicits._
    spark.range(1, nWarehouses(sf) + 1).toDF("w_warehouse_sk").select(
      $"w_warehouse_sk",
      element_at(array((1 to 5).map(i => lit(f"ST$i%02d")): _*),
        (rand(seed) * 5 + 1).cast("int")) as "w_state",
    )
  }

  def storeSales(spark: SparkSession, sf: Double, seed: Long = 30): DataFrame = {
    import spark.implicits._
    spark.range(lin(NStoreSalesPerSf, sf)).select(
      (rand(seed) * NDates + 1).cast(LongType)            as "ss_sold_date_sk",
      (rand(seed + 1) * nItems(sf) + 1).cast(LongType)    as "ss_item_sk",
      (rand(seed + 2) * nCustomers(sf) + 1).cast(LongType) as "ss_customer_sk",
      (rand(seed + 3) * nStores(sf) + 1).cast(LongType)   as "ss_store_sk",
      (rand(seed + 4) * 100 + 1).cast(IntegerType)        as "ss_quantity",
      round(rand(seed + 5) * 200, 2)                      as "ss_sales_price",
      round(rand(seed + 6) * 20000, 2)                    as "ss_ext_sales_price",
      round(rand(seed + 7) * 2000 - 500, 2)               as "ss_net_profit",
    )
  }

  def catalogSales(spark: SparkSession, sf: Double, seed: Long = 31): DataFrame = {
    import spark.implicits._
    spark.range(lin(NCatalogSalesPerSf, sf)).select(
      (rand(seed) * NDates + 1).cast(LongType)             as "cs_sold_date_sk",
      (rand(seed + 1) * nItems(sf) + 1).cast(LongType)     as "cs_item_sk",
      (rand(seed + 2) * nCustomers(sf) + 1).cast(LongType) as "cs_bill_customer_sk",
      (rand(seed + 3) * 100 + 1).cast(IntegerType)         as "cs_quantity",
      round(rand(seed + 4) * 20000, 2)                     as "cs_ext_sales_price",
      round(rand(seed + 5) * 1000, 2)                      as "cs_ext_discount_amt",
    )
  }

  def webSales(spark: SparkSession, sf: Double, seed: Long = 32): DataFrame = {
    import spark.implicits._
    spark.range(lin(NWebSalesPerSf, sf)).select(
      (rand(seed) * NDates + 1).cast(LongType)             as "ws_sold_date_sk",
      (rand(seed + 1) * nItems(sf) + 1).cast(LongType)     as "ws_item_sk",
      (rand(seed + 2) * nCustomers(sf) + 1).cast(LongType) as "ws_bill_customer_sk",
      (rand(seed + 3) * 100 + 1).cast(IntegerType)         as "ws_quantity",
      round(rand(seed + 4) * 20000, 2)                     as "ws_ext_sales_price",
    )
  }

  def inventory(spark: SparkSession, sf: Double, seed: Long = 33): DataFrame = {
    import spark.implicits._
    spark.range(lin(NInventoryPerSf, sf)).select(
      (rand(seed) * NDates + 1).cast(LongType)          as "inv_date_sk",
      (rand(seed + 1) * nItems(sf) + 1).cast(LongType)  as "inv_item_sk",
      (rand(seed + 2) * nWarehouses(sf) + 1).cast(LongType) as "inv_warehouse_sk",
      (rand(seed + 3) * 1000).cast(IntegerType)         as "inv_quantity_on_hand",
    )
  }

  /** All tables of the TPC-DS-lite schema at scale factor `sf`. */
  def tables(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "date_dim"         -> dateDim(spark),
    "item"             -> item(spark, sf),
    "customer"         -> customer(spark, sf),
    "customer_address" -> customerAddress(spark, sf),
    "store"            -> store(spark, sf),
    "warehouse"        -> warehouse(spark, sf),
    "store_sales"      -> storeSales(spark, sf),
    "catalog_sales"    -> catalogSales(spark, sf),
    "web_sales"        -> webSales(spark, sf),
    "inventory"        -> inventory(spark, sf),
  )
}
