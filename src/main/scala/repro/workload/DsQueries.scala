package repro.workload

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.workload.Q._

/** TPC-DS-lite workload (DESIGN.md substitutions #3/#4): 16 queries named
  * after the paper's TPC-DS picks, preserving each one's *shape* (join
  * pattern + aggregation class): 3 no-agg, 7 local, 4 global, 2 scalar
  * (one with a correlated per-group average).
  */
object DsQueries {

  val attrCols: Map[String, Seq[String]] = Map(
    "item"             -> Seq("i_item_sk", "i_item_id"),
    "date_dim"         -> Seq("d_date_sk"),
    "customer"         -> Seq("c_customer_sk", "c_current_addr_sk"),
    "customer_address" -> Seq("ca_address_sk", "ca_zip"),
    "store"            -> Seq("s_store_sk"),
    "warehouse"        -> Seq("w_warehouse_sk"),
    "store_sales"      -> Seq("ss_sold_date_sk", "ss_item_sk", "ss_customer_sk", "ss_store_sk"),
    "catalog_sales"    -> Seq("cs_sold_date_sk", "cs_item_sk", "cs_bill_customer_sk"),
    "web_sales"        -> Seq("ws_sold_date_sk", "ws_item_sk", "ws_bill_customer_sk"),
    "inventory"        -> Seq("inv_date_sk", "inv_item_sk", "inv_warehouse_sk"),
  )

  def workload(spark: SparkSession, sf: Double): Workload =
    Workload("tpcds", DsData.tables(spark, sf), attrCols, queries)

  // join attributes, per fact table
  private def itemkey(fact: String, col: String) =
    JoinAttr("itemkey", Map(fact -> col, "item" -> "i_item_sk"))
  private def datekey(fact: String, col: String) =
    JoinAttr("datekey", Map(fact -> col, "date_dim" -> "d_date_sk"))
  private def custkey(fact: String, col: String) =
    JoinAttr("dscustkey", Map(fact -> col, "customer" -> "c_customer_sk"))
  private val addrkey =
    JoinAttr("addrkey", Map("customer" -> "c_current_addr_sk", "customer_address" -> "ca_address_sk"))
  private val itemId = JoinAttr("i_item_id", Map("item" -> "i_item_id"))
  private val caZip  = JoinAttr("ca_zip", Map("customer_address" -> "ca_zip"))

  /** A fact ⋈ item ⋈ date_dim LA block grouped by i_item_id. */
  private def factItemDateLa(fact: String, itemCol: String, dateCol: String, priceCol: String,
      itemPred: Option[repro.tag.Tup => Boolean], datePred: repro.tag.Tup => Boolean,
      alias: String): QuerySpec =
    QuerySpec(
      relations = Seq(fact, "item", "date_dim"),
      joins = Seq(itemkey(fact, itemCol), datekey(fact, dateCol), itemId),
      tupleFilter = Map("date_dim" -> datePred) ++ itemPred.map("item" -> _),
      carry = Map(fact -> Seq(priceCol)),
      groupBy = Seq("i_item_id"),
      laAttr = Some("i_item_id"),
      aggs = Seq(AggSpec(AggFunc.Sum, dbl(_, priceCol), alias)),
      aggMode = AggMode.Local,
      rootRel = Some("item"))

  private def sumAgg(col: String, alias: String) = AggSpec(AggFunc.Sum, dbl(_, col), alias)

  val queries: Seq[BenchQuery] = Seq(

    // =================================================== no-agg (SPJ shape)
    BenchQuery("q37", "noagg",
      QuerySpec(
        relations = Seq("item", "inventory", "date_dim", "catalog_sales"),
        joins = Seq(
          JoinAttr("itemkey", Map("item" -> "i_item_sk", "inventory" -> "inv_item_sk",
            "catalog_sales" -> "cs_item_sk")),
          datekey("inventory", "inv_date_sk"), itemId),
        tupleFilter = Map(
          "item" -> (t => dbl(t, "i_current_price") >= 20 && dbl(t, "i_current_price") <= 40),
          "inventory" -> (t => lng(t, "inv_quantity_on_hand") >= 100 && lng(t, "inv_quantity_on_hand") <= 500),
          "date_dim" -> (t => lng(t, "d_moy") <= 2)),
        carry = Map("item" -> Seq("i_current_price")),
        groupBy = Seq("i_item_id"),
        laAttr = Some("i_item_id"),
        aggs = Seq(AggSpec(AggFunc.Max, dbl(_, "i_current_price"), "price")),
        aggMode = AggMode.Local,
        rootRel = Some("item")),
      """SELECT i_item_id, CAST(MAX(i_current_price) AS DOUBLE) AS price
        |FROM item, inventory, date_dim, catalog_sales
        |WHERE i_item_sk = inv_item_sk AND inv_date_sk = d_date_sk AND cs_item_sk = i_item_sk
        |  AND CAST(i_current_price AS DOUBLE) BETWEEN 20 AND 40
        |  AND inv_quantity_on_hand BETWEEN 100 AND 500 AND d_moy <= 2
        |GROUP BY i_item_id""".stripMargin),

    BenchQuery("q82", "noagg",
      QuerySpec(
        relations = Seq("item", "inventory", "date_dim", "store_sales"),
        joins = Seq(
          JoinAttr("itemkey", Map("item" -> "i_item_sk", "inventory" -> "inv_item_sk",
            "store_sales" -> "ss_item_sk")),
          datekey("inventory", "inv_date_sk"), itemId),
        tupleFilter = Map(
          "item" -> (t => dbl(t, "i_current_price") >= 60 && dbl(t, "i_current_price") <= 90),
          "inventory" -> (t => lng(t, "inv_quantity_on_hand") >= 100 && lng(t, "inv_quantity_on_hand") <= 500),
          "date_dim" -> (t => lng(t, "d_moy") <= 2)),
        carry = Map("item" -> Seq("i_current_price")),
        groupBy = Seq("i_item_id"),
        laAttr = Some("i_item_id"),
        aggs = Seq(AggSpec(AggFunc.Max, dbl(_, "i_current_price"), "price")),
        aggMode = AggMode.Local,
        rootRel = Some("item")),
      """SELECT i_item_id, CAST(MAX(i_current_price) AS DOUBLE) AS price
        |FROM item, inventory, date_dim, store_sales
        |WHERE i_item_sk = inv_item_sk AND inv_date_sk = d_date_sk AND ss_item_sk = i_item_sk
        |  AND CAST(i_current_price AS DOUBLE) BETWEEN 60 AND 90
        |  AND inv_quantity_on_hand BETWEEN 100 AND 500 AND d_moy <= 2
        |GROUP BY i_item_id""".stripMargin),

    BenchQuery("q84", "noagg",
      QuerySpec(
        relations = Seq("customer", "customer_address"),
        joins = Seq(addrkey),
        tupleFilter = Map("customer_address" -> (t => str(t, "ca_state") == "ST05")),
        carry = Map("customer" -> Seq("c_customer_sk", "c_birth_year")),
        aggMode = AggMode.NoAgg,
        rootRel = Some("customer")),
      """SELECT c_customer_sk, c_birth_year
        |FROM customer, customer_address
        |WHERE c_current_addr_sk = ca_address_sk AND ca_state = 'ST05'""".stripMargin),

    // ============================================================== local
    BenchQuery("q7", "local",
      QuerySpec(
        relations = Seq("store_sales", "item", "date_dim"),
        joins = Seq(itemkey("store_sales", "ss_item_sk"), datekey("store_sales", "ss_sold_date_sk"), itemId),
        tupleFilter = Map("date_dim" -> (t => lng(t, "d_year") == 2000)),
        carry = Map("store_sales" -> Seq("ss_quantity", "ss_sales_price")),
        groupBy = Seq("i_item_id"),
        laAttr = Some("i_item_id"),
        aggs = Seq(
          AggSpec(AggFunc.Avg, dbl(_, "ss_quantity"), "agg1"),
          AggSpec(AggFunc.Avg, dbl(_, "ss_sales_price"), "agg2")),
        aggMode = AggMode.Local,
        rootRel = Some("item")),
      """SELECT i_item_id, CAST(AVG(ss_quantity) AS DOUBLE) AS agg1,
        |  CAST(AVG(ss_sales_price) AS DOUBLE) AS agg2
        |FROM store_sales, item, date_dim
        |WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk AND d_year = 2000
        |GROUP BY i_item_id""".stripMargin),

    BenchQuery("q12", "local",
      factItemDateLa("web_sales", "ws_item_sk", "ws_sold_date_sk", "ws_ext_sales_price",
        Some(t => Set("Category_1", "Category_2", "Category_3")(str(t, "i_category"))),
        t => lng(t, "d_year") == 1999, "itemrevenue"),
      """SELECT i_item_id, CAST(SUM(ws_ext_sales_price) AS DOUBLE) AS itemrevenue
        |FROM web_sales, item, date_dim
        |WHERE ws_item_sk = i_item_sk AND ws_sold_date_sk = d_date_sk
        |  AND i_category IN ('Category_1', 'Category_2', 'Category_3') AND d_year = 1999
        |GROUP BY i_item_id""".stripMargin),

    BenchQuery("q15", "local",
      QuerySpec(
        relations = Seq("catalog_sales", "customer", "customer_address", "date_dim"),
        joins = Seq(custkey("catalog_sales", "cs_bill_customer_sk"), addrkey,
          datekey("catalog_sales", "cs_sold_date_sk"), caZip),
        tupleFilter = Map("date_dim" -> (t => lng(t, "d_qoy") == 1 && lng(t, "d_year") == 2001)),
        carry = Map("catalog_sales" -> Seq("cs_ext_sales_price")),
        groupBy = Seq("ca_zip"),
        laAttr = Some("ca_zip"),
        aggs = Seq(sumAgg("cs_ext_sales_price", "total_sales")),
        aggMode = AggMode.Local,
        rootRel = Some("customer_address")),
      """SELECT ca_zip, CAST(SUM(cs_ext_sales_price) AS DOUBLE) AS total_sales
        |FROM catalog_sales, customer, customer_address, date_dim
        |WHERE cs_bill_customer_sk = c_customer_sk AND c_current_addr_sk = ca_address_sk
        |  AND cs_sold_date_sk = d_date_sk AND d_qoy = 1 AND d_year = 2001
        |GROUP BY ca_zip""".stripMargin),

    BenchQuery("q20", "local",
      factItemDateLa("catalog_sales", "cs_item_sk", "cs_sold_date_sk", "cs_ext_sales_price",
        Some(t => Set("Category_4", "Category_5", "Category_6")(str(t, "i_category"))),
        t => lng(t, "d_moy") == 2, "itemrevenue"),
      """SELECT i_item_id, CAST(SUM(cs_ext_sales_price) AS DOUBLE) AS itemrevenue
        |FROM catalog_sales, item, date_dim
        |WHERE cs_item_sk = i_item_sk AND cs_sold_date_sk = d_date_sk
        |  AND i_category IN ('Category_4', 'Category_5', 'Category_6') AND d_moy = 2
        |GROUP BY i_item_id""".stripMargin),

    BenchQuery("q56", "local",
      QuerySpec( // outer shape: union of three fact blocks, re-grouped
        relations = Nil, joins = Nil,
        groupBy = Seq("i_item_id"),
        aggs = Seq(AggSpec(AggFunc.Sum, dbl(_, "total_sales"), "total_sales")),
        aggMode = AggMode.Local),
      """SELECT i_item_id, CAST(SUM(total_sales) AS DOUBLE) AS total_sales FROM (
        |  SELECT i_item_id, SUM(ss_ext_sales_price) AS total_sales
        |  FROM store_sales, item, date_dim
        |  WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk
        |    AND i_manufact_id <= 20 AND d_year = 2000 AND d_moy = 2 GROUP BY i_item_id
        |  UNION ALL
        |  SELECT i_item_id, SUM(cs_ext_sales_price) AS total_sales
        |  FROM catalog_sales, item, date_dim
        |  WHERE cs_item_sk = i_item_sk AND cs_sold_date_sk = d_date_sk
        |    AND i_manufact_id <= 20 AND d_year = 2000 AND d_moy = 2 GROUP BY i_item_id
        |  UNION ALL
        |  SELECT i_item_id, SUM(ws_ext_sales_price) AS total_sales
        |  FROM web_sales, item, date_dim
        |  WHERE ws_item_sk = i_item_sk AND ws_sold_date_sk = d_date_sk
        |    AND i_manufact_id <= 20 AND d_year = 2000 AND d_moy = 2 GROUP BY i_item_id
        |) x GROUP BY i_item_id""".stripMargin,
      blocks = Seq(
        ("store_sales", "ss_item_sk", "ss_sold_date_sk", "ss_ext_sales_price"),
        ("catalog_sales", "cs_item_sk", "cs_sold_date_sk", "cs_ext_sales_price"),
        ("web_sales", "ws_item_sk", "ws_sold_date_sk", "ws_ext_sales_price"),
      ).map { case (f, ic, dc, pc) =>
        factItemDateLa(f, ic, dc, pc,
          Some(t => lng(t, "i_manufact_id") <= 20),
          t => lng(t, "d_year") == 2000 && lng(t, "d_moy") == 2, "total_sales")
      }),

    BenchQuery("q60", "local",
      QuerySpec(
        relations = Nil, joins = Nil,
        groupBy = Seq("i_item_id"),
        aggs = Seq(AggSpec(AggFunc.Sum, dbl(_, "total_sales"), "total_sales")),
        aggMode = AggMode.Local),
      """SELECT i_item_id, CAST(SUM(total_sales) AS DOUBLE) AS total_sales FROM (
        |  SELECT i_item_id, SUM(ss_ext_sales_price) AS total_sales
        |  FROM store_sales, item, date_dim
        |  WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk
        |    AND i_category = 'Category_5' AND d_year = 1999 AND d_moy = 9 GROUP BY i_item_id
        |  UNION ALL
        |  SELECT i_item_id, SUM(cs_ext_sales_price) AS total_sales
        |  FROM catalog_sales, item, date_dim
        |  WHERE cs_item_sk = i_item_sk AND cs_sold_date_sk = d_date_sk
        |    AND i_category = 'Category_5' AND d_year = 1999 AND d_moy = 9 GROUP BY i_item_id
        |  UNION ALL
        |  SELECT i_item_id, SUM(ws_ext_sales_price) AS total_sales
        |  FROM web_sales, item, date_dim
        |  WHERE ws_item_sk = i_item_sk AND ws_sold_date_sk = d_date_sk
        |    AND i_category = 'Category_5' AND d_year = 1999 AND d_moy = 9 GROUP BY i_item_id
        |) x GROUP BY i_item_id""".stripMargin,
      blocks = Seq(
        ("store_sales", "ss_item_sk", "ss_sold_date_sk", "ss_ext_sales_price"),
        ("catalog_sales", "cs_item_sk", "cs_sold_date_sk", "cs_ext_sales_price"),
        ("web_sales", "ws_item_sk", "ws_sold_date_sk", "ws_ext_sales_price"),
      ).map { case (f, ic, dc, pc) =>
        factItemDateLa(f, ic, dc, pc,
          Some(t => str(t, "i_category") == "Category_5"),
          t => lng(t, "d_year") == 1999 && lng(t, "d_moy") == 9, "total_sales")
      }),

    BenchQuery("q98", "local",
      factItemDateLa("store_sales", "ss_item_sk", "ss_sold_date_sk", "ss_ext_sales_price",
        Some(t => Set("Category_7", "Category_8", "Category_9")(str(t, "i_category"))),
        t => lng(t, "d_moy") == 3, "itemrevenue"),
      """SELECT i_item_id, CAST(SUM(ss_ext_sales_price) AS DOUBLE) AS itemrevenue
        |FROM store_sales, item, date_dim
        |WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk
        |  AND i_category IN ('Category_7', 'Category_8', 'Category_9') AND d_moy = 3
        |GROUP BY i_item_id""".stripMargin),

    // ============================================================== global
    BenchQuery("q3", "global",
      QuerySpec(
        relations = Seq("store_sales", "item", "date_dim"),
        joins = Seq(itemkey("store_sales", "ss_item_sk"), datekey("store_sales", "ss_sold_date_sk")),
        tupleFilter = Map(
          "item" -> (t => lng(t, "i_manufact_id") == 50),
          "date_dim" -> (t => lng(t, "d_moy") == 11)),
        carry = Map("store_sales" -> Seq("ss_ext_sales_price"),
          "item" -> Seq("i_brand"), "date_dim" -> Seq("d_year")),
        groupBy = Seq("d_year", "i_brand"),
        aggs = Seq(sumAgg("ss_ext_sales_price", "sum_agg")),
        aggMode = AggMode.Global,
        rootRel = Some("store_sales")),
      """SELECT d_year, i_brand, CAST(SUM(ss_ext_sales_price) AS DOUBLE) AS sum_agg
        |FROM store_sales, item, date_dim
        |WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk
        |  AND i_manufact_id = 50 AND d_moy = 11
        |GROUP BY d_year, i_brand""".stripMargin),

    BenchQuery("q22", "global",
      QuerySpec(
        relations = Seq("inventory", "item", "date_dim"),
        joins = Seq(
          JoinAttr("itemkey", Map("inventory" -> "inv_item_sk", "item" -> "i_item_sk")),
          datekey("inventory", "inv_date_sk")),
        tupleFilter = Map("date_dim" -> (t => lng(t, "d_year") == 2001)),
        carry = Map("inventory" -> Seq("inv_quantity_on_hand"),
          "item" -> Seq("i_category", "i_brand")),
        groupBy = Seq("i_category", "i_brand"),
        aggs = Seq(AggSpec(AggFunc.Avg, dbl(_, "inv_quantity_on_hand"), "qoh")),
        aggMode = AggMode.Global,
        rootRel = Some("inventory")),
      """SELECT i_category, i_brand, CAST(AVG(inv_quantity_on_hand) AS DOUBLE) AS qoh
        |FROM inventory, item, date_dim
        |WHERE inv_item_sk = i_item_sk AND inv_date_sk = d_date_sk AND d_year = 2001
        |GROUP BY i_category, i_brand""".stripMargin),

    BenchQuery("q42", "global",
      QuerySpec(
        relations = Seq("store_sales", "item", "date_dim"),
        joins = Seq(itemkey("store_sales", "ss_item_sk"), datekey("store_sales", "ss_sold_date_sk")),
        tupleFilter = Map("date_dim" -> (t => lng(t, "d_moy") == 12 && lng(t, "d_year") == 2000)),
        carry = Map("store_sales" -> Seq("ss_ext_sales_price"),
          "item" -> Seq("i_category"), "date_dim" -> Seq("d_year")),
        groupBy = Seq("d_year", "i_category"),
        aggs = Seq(sumAgg("ss_ext_sales_price", "sum_agg")),
        aggMode = AggMode.Global,
        rootRel = Some("store_sales")),
      """SELECT d_year, i_category, CAST(SUM(ss_ext_sales_price) AS DOUBLE) AS sum_agg
        |FROM store_sales, item, date_dim
        |WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk
        |  AND d_moy = 12 AND d_year = 2000
        |GROUP BY d_year, i_category""".stripMargin),

    BenchQuery("q52", "global",
      QuerySpec(
        relations = Seq("store_sales", "item", "date_dim"),
        joins = Seq(itemkey("store_sales", "ss_item_sk"), datekey("store_sales", "ss_sold_date_sk")),
        tupleFilter = Map("date_dim" -> (t => lng(t, "d_moy") == 11 && lng(t, "d_year") == 1999)),
        carry = Map("store_sales" -> Seq("ss_ext_sales_price"),
          "item" -> Seq("i_brand"), "date_dim" -> Seq("d_year")),
        groupBy = Seq("d_year", "i_brand"),
        aggs = Seq(sumAgg("ss_ext_sales_price", "ext_price")),
        aggMode = AggMode.Global,
        rootRel = Some("store_sales")),
      """SELECT d_year, i_brand, CAST(SUM(ss_ext_sales_price) AS DOUBLE) AS ext_price
        |FROM store_sales, item, date_dim
        |WHERE ss_item_sk = i_item_sk AND ss_sold_date_sk = d_date_sk
        |  AND d_moy = 11 AND d_year = 1999
        |GROUP BY d_year, i_brand""".stripMargin),

    // ============================================== scalar (one correlated)
    BenchQuery("q32", "corr",
      QuerySpec(
        relations = Seq("catalog_sales", "item", "date_dim"),
        joins = Seq(itemkey("catalog_sales", "cs_item_sk"), datekey("catalog_sales", "cs_sold_date_sk")),
        tupleFilter = Map(
          "item" -> (t => lng(t, "i_manufact_id") <= 30),
          "date_dim" -> (t => lng(t, "d_year") == 2000)),
        carry = Map("catalog_sales" -> Seq("cs_ext_discount_amt")),
        aggs = Seq(sumAgg("cs_ext_discount_amt", "excess_discount")),
        aggMode = AggMode.Scalar,
        rootRel = Some("item"),
        correlated = Some(CorrelatedAvg("catalog_sales", "itemkey",
          dbl(_, "cs_ext_discount_amt"), 1.3, _ > _))),
      """SELECT CAST(SUM(cs_ext_discount_amt) AS DOUBLE) AS excess_discount
        |FROM catalog_sales, item, date_dim
        |WHERE i_item_sk = cs_item_sk AND d_date_sk = cs_sold_date_sk
        |  AND i_manufact_id <= 30 AND d_year = 2000
        |  AND CAST(cs_ext_discount_amt AS DOUBLE) > (
        |    SELECT 1.3 * AVG(CAST(cs2.cs_ext_discount_amt AS DOUBLE))
        |    FROM catalog_sales cs2 WHERE cs2.cs_item_sk = i_item_sk)""".stripMargin),

    BenchQuery("q94", "scalar",
      QuerySpec(
        relations = Seq("web_sales", "customer", "customer_address", "date_dim"),
        joins = Seq(custkey("web_sales", "ws_bill_customer_sk"), addrkey,
          datekey("web_sales", "ws_sold_date_sk")),
        tupleFilter = Map(
          "customer_address" -> (t => str(t, "ca_state") == "ST03"),
          "date_dim" -> (t => lng(t, "d_year") == 1999 && lng(t, "d_qoy") == 2)),
        carry = Map("web_sales" -> Seq("ws_ext_sales_price")),
        aggs = Seq(
          AggSpec(AggFunc.Count, _ => 1.0, "order_count"),
          sumAgg("ws_ext_sales_price", "total_price")),
        aggMode = AggMode.Scalar,
        rootRel = Some("web_sales")),
      """SELECT CAST(COUNT(*) AS DOUBLE) AS order_count,
        |  CAST(SUM(ws_ext_sales_price) AS DOUBLE) AS total_price
        |FROM web_sales, customer, customer_address, date_dim
        |WHERE ws_bill_customer_sk = c_customer_sk AND c_current_addr_sk = ca_address_sk
        |  AND ws_sold_date_sk = d_date_sk AND ca_state = 'ST03'
        |  AND d_year = 1999 AND d_qoy = 2""".stripMargin),
  )
}
