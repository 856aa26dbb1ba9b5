package repro.tpch

import org.apache.spark.sql.functions._

import repro.core.AggSpec._
import repro.sim.ApiFeature._

/** TPC-H-lite queries 12–22 (pandas-style XFrame implementations). */
private[tpch] object QueriesB {

  private def revenue = col("l_extendedprice") * (lit(1.0) - col("l_discount"))

  val q12 = TpchQuery(12, "shipping modes and order priority", Set("orders", "lineitem"), Set.empty,
    run = c => {
      val li = c.lineitem
        .filter(col("l_shipmode").isin("MAIL", "SHIP")
          && col("l_commitdate") < col("l_receiptdate")
          && col("l_shipdate") < col("l_commitdate")
          && col("l_receiptdate") >= lit("1994-01-01") && col("l_receiptdate") < lit("1995-01-01"))
        .select("l_orderkey", "l_shipmode")
      li.rename("l_orderkey" -> "o_orderkey")
        .merge(c.orders.select("o_orderkey", "o_orderpriority"), Seq("o_orderkey"))
        .withColumns(
          "high" -> when(col("o_orderpriority").isin("1-URGENT", "2-HIGH"), 1L).otherwise(0L),
          "low" -> when(col("o_orderpriority").isin("1-URGENT", "2-HIGH"), 0L).otherwise(1L))
        .groupby("l_shipmode")
        .agg(SumAgg("high", "high_line_count"), SumAgg("low", "low_line_count"))
    },
    sql = """
      SELECT l_shipmode,
             SUM(CASE WHEN o_orderpriority IN ('1-URGENT','2-HIGH') THEN 1 ELSE 0 END) AS high_line_count,
             SUM(CASE WHEN o_orderpriority IN ('1-URGENT','2-HIGH') THEN 0 ELSE 1 END) AS low_line_count
      FROM orders_t o JOIN lineitem_t l ON o.o_orderkey = l.l_orderkey
      WHERE l_shipmode IN ('MAIL','SHIP') AND l_commitdate < l_receiptdate
        AND l_shipdate < l_commitdate
        AND l_receiptdate >= DATE '1994-01-01' AND l_receiptdate < DATE '1995-01-01'
      GROUP BY l_shipmode""")

  val q13 = TpchQuery(13, "customer distribution", Set("customer", "orders"),
    Set(NamedAgg, ComputedKeyGroupby),
    run = c => {
      val ord = c.orders.filter(!col("o_comment").like("%special%requests%"))
        .select("o_orderkey", "o_custkey")
      val co = c.customer.select("c_custkey").rename("c_custkey" -> "o_custkey")
        .merge(ord, Seq("o_custkey"), "left")
      co.groupby("o_custkey").agg(CountColAgg("o_orderkey", "c_count"))
        .groupby("c_count").agg(CountAgg("custdist"))
    },
    sql = """
      SELECT c_count, COUNT(*) AS custdist
      FROM (SELECT c.c_custkey, COUNT(o.o_orderkey) AS c_count
            FROM customer_t c LEFT JOIN
              (SELECT * FROM orders_t WHERE o_comment NOT LIKE '%special%requests%') o
              ON c.c_custkey = o.o_custkey
            GROUP BY c.c_custkey)
      GROUP BY c_count""")

  val q14 = TpchQuery(14, "promotion effect", Set("lineitem", "part"), Set.empty,
    run = c => {
      val li = c.lineitem
        .filter(col("l_shipdate") >= lit("1995-09-01") && col("l_shipdate") < lit("1995-10-01"))
        .withColumn("rev", revenue).select("l_partkey", "rev")
      li.rename("l_partkey" -> "p_partkey")
        .merge(c.part.select("p_partkey", "p_type"), Seq("p_partkey"))
        .withColumn("promo_rev", when(col("p_type") === "PROMO", col("rev")).otherwise(lit(0.0)))
        .groupby().agg(SumAgg("promo_rev", "promo"), SumAgg("rev", "total"))
        .withColumn("promo_revenue", col("promo") * 100.0 / col("total"))
        .select("promo_revenue")
    },
    sql = """
      SELECT 100.0 * SUM(CASE WHEN p_type = 'PROMO'
                              THEN l_extendedprice*(1-l_discount) ELSE 0 END)
             / SUM(l_extendedprice*(1-l_discount)) AS promo_revenue
      FROM lineitem_t l JOIN part_t p ON l.l_partkey = p.p_partkey
      WHERE l_shipdate >= DATE '1995-09-01' AND l_shipdate < DATE '1995-10-01'""")

  val q15 = TpchQuery(15, "top supplier", Set("lineitem", "supplier"), Set.empty,
    run = c => {
      val rev = c.lineitem
        .filter(col("l_shipdate") >= lit("1996-01-01") && col("l_shipdate") < lit("1996-04-01"))
        .withColumn("rev", revenue)
        .groupby("l_suppkey").agg(SumAgg("rev", "total_revenue"))
      val mx = rev.groupby().agg(MaxAgg("total_revenue", "max_rev"))
      rev.crossMerge(mx).filter(col("total_revenue") === col("max_rev"))
        .rename("l_suppkey" -> "s_suppkey")
        .merge(c.supplier.select("s_suppkey", "s_name"), Seq("s_suppkey"))
        .select("s_suppkey", "s_name", "total_revenue")
    },
    sql = """
      WITH rev AS (
        SELECT l_suppkey AS s_suppkey, SUM(l_extendedprice*(1-l_discount)) AS total_revenue
        FROM lineitem_t
        WHERE l_shipdate >= DATE '1996-01-01' AND l_shipdate < DATE '1996-04-01'
        GROUP BY l_suppkey)
      SELECT s.s_suppkey AS s_suppkey, s_name, total_revenue
      FROM supplier_t s JOIN rev ON s.s_suppkey = rev.s_suppkey
      WHERE total_revenue = (SELECT MAX(total_revenue) FROM rev)""")

  val q16 = TpchQuery(16, "parts/supplier relationship", Set("partsupp", "part", "supplier"),
    Set(GroupNUnique),
    run = c => {
      val bad = c.supplier
        .filter(col("s_comment").contains("Customer") && col("s_comment").contains("Complaints"))
        .select("s_suppkey")
      val p = c.part
        .filter(col("p_brand") =!= "Brand#33" && col("p_type") =!= "PROMO"
          && col("p_size").isin(1, 5, 10, 15, 20, 25, 30, 35))
        .select("p_partkey", "p_brand", "p_type", "p_size")
      c.partsupp.select("ps_partkey", "ps_suppkey")
        .rename("ps_suppkey" -> "s_suppkey")
        .merge(bad, Seq("s_suppkey"), "leftanti")
        .rename("ps_partkey" -> "p_partkey")
        .merge(p, Seq("p_partkey"))
        .groupby("p_brand", "p_type", "p_size")
        .agg(NUniqueAgg("s_suppkey", "supplier_cnt"))
    },
    sql = """
      SELECT p_brand, p_type, p_size, COUNT(DISTINCT ps_suppkey) AS supplier_cnt
      FROM partsupp_t ps JOIN part_t p ON p.p_partkey = ps.ps_partkey
      WHERE p_brand <> 'Brand#33' AND p_type <> 'PROMO'
        AND p_size IN (1,5,10,15,20,25,30,35)
        AND ps.ps_suppkey NOT IN (
          SELECT s_suppkey FROM supplier_t
          WHERE s_comment LIKE '%Customer%Complaints%')
      GROUP BY p_brand, p_type, p_size""")

  val q17 = TpchQuery(17, "small-quantity-order revenue", Set("lineitem", "part"), Set.empty,
    run = c => {
      val p = c.part.filter(col("p_brand") === "Brand#23" && col("p_container") === "MED BOX")
        .select("p_partkey")
      val li = c.lineitem.select("l_partkey", "l_quantity", "l_extendedprice")
        .rename("l_partkey" -> "p_partkey")
        .merge(p, Seq("p_partkey"), "leftsemi")
      val avg = li.groupby("p_partkey").agg(MeanAgg("l_quantity", "avg_qty"))
      li.merge(avg, Seq("p_partkey"))
        .filter(col("l_quantity") < col("avg_qty") * 0.2)
        .groupby().agg(SumAgg("l_extendedprice", "total_price"))
        .withColumn("avg_yearly", col("total_price") / 7.0)
        .select("avg_yearly")
    },
    sql = """
      SELECT SUM(l_extendedprice) / 7.0 AS avg_yearly
      FROM lineitem_t l JOIN part_t p ON p.p_partkey = l.l_partkey
      WHERE p_brand = 'Brand#23' AND p_container = 'MED BOX'
        AND l_quantity < 0.2 * (
          SELECT AVG(l2.l_quantity) FROM lineitem_t l2 WHERE l2.l_partkey = p.p_partkey)""")

  val q18 = TpchQuery(18, "large volume customer", Set("customer", "orders", "lineitem"), Set.empty,
    run = c => {
      val big = c.lineitem.groupby("l_orderkey").agg(SumAgg("l_quantity", "sum_qty"))
        .filter(col("sum_qty") > 200)
        .rename("l_orderkey" -> "o_orderkey")
      c.orders.select("o_orderkey", "o_custkey", "o_orderdate", "o_totalprice")
        .merge(big, Seq("o_orderkey"))
        .rename("o_custkey" -> "c_custkey")
        .select("c_custkey", "o_orderkey", "o_orderdate", "o_totalprice", "sum_qty")
    },
    sql = """
      SELECT o_custkey AS c_custkey, o.o_orderkey AS o_orderkey, o_orderdate, o_totalprice,
             big.sum_qty AS sum_qty
      FROM orders_t o JOIN (
        SELECT l_orderkey, SUM(l_quantity) AS sum_qty
        FROM lineitem_t GROUP BY l_orderkey HAVING SUM(l_quantity) > 200) big
        ON o.o_orderkey = big.l_orderkey""")

  val q19 = TpchQuery(19, "discounted revenue", Set("lineitem", "part"), Set.empty,
    run = c => {
      val j = c.lineitem
        .select("l_partkey", "l_quantity", "l_extendedprice", "l_discount",
          "l_shipmode", "l_shipinstruct")
        .rename("l_partkey" -> "p_partkey")
        .merge(c.part.select("p_partkey", "p_brand", "p_container"), Seq("p_partkey"))
      val cond1 = col("p_brand") === "Brand#12" &&
        col("p_container").isin("SM CASE", "SM BOX", "SM PACK", "SM PKG") &&
        col("l_quantity") >= 1 && col("l_quantity") <= 11
      val cond2 = col("p_brand") === "Brand#23" &&
        col("p_container").isin("MED BAG", "MED BOX", "MED PKG", "MED PACK") &&
        col("l_quantity") >= 10 && col("l_quantity") <= 20
      val cond3 = col("p_brand") === "Brand#34" &&
        col("p_container").isin("LG CASE", "LG BOX", "LG PACK", "LG PKG") &&
        col("l_quantity") >= 20 && col("l_quantity") <= 30
      j.filter((cond1 || cond2 || cond3)
          && col("l_shipmode").isin("AIR", "AIR REG")
          && col("l_shipinstruct") === "DELIVER IN PERSON")
        .withColumn("rev", revenue)
        .groupby().agg(SumAgg("rev", "revenue_total"))
    },
    sql = """
      SELECT SUM(l_extendedprice*(1-l_discount)) AS revenue_total
      FROM lineitem_t l JOIN part_t p ON p.p_partkey = l.l_partkey
      WHERE l_shipmode IN ('AIR','AIR REG') AND l_shipinstruct = 'DELIVER IN PERSON'
        AND ((p_brand = 'Brand#12' AND p_container IN ('SM CASE','SM BOX','SM PACK','SM PKG')
              AND l_quantity BETWEEN 1 AND 11)
          OR (p_brand = 'Brand#23' AND p_container IN ('MED BAG','MED BOX','MED PKG','MED PACK')
              AND l_quantity BETWEEN 10 AND 20)
          OR (p_brand = 'Brand#34' AND p_container IN ('LG CASE','LG BOX','LG PACK','LG PKG')
              AND l_quantity BETWEEN 20 AND 30))""")

  val q20 = TpchQuery(20, "potential part promotion",
    Set("supplier", "nation", "partsupp", "part", "lineitem"), Set.empty,
    run = c => {
      val p = c.part.filter(col("p_name").like("green%")).select("p_partkey")
        .rename("p_partkey" -> "l_partkey")
      val liAgg = c.lineitem
        .filter(col("l_shipdate") >= lit("1994-01-01") && col("l_shipdate") < lit("1995-01-01"))
        .groupby("l_partkey", "l_suppkey").agg(SumAgg("l_quantity", "qty_sum"))
      val psQual = c.partsupp
        .rename("ps_partkey" -> "l_partkey", "ps_suppkey" -> "l_suppkey")
        .merge(liAgg, Seq("l_partkey", "l_suppkey"))
        .merge(p, Seq("l_partkey"), "leftsemi")
        .filter(col("ps_availqty") > col("qty_sum") * 0.5)
        .select("l_suppkey").dropDuplicates()
        .rename("l_suppkey" -> "s_suppkey")
      c.supplier.select("s_suppkey", "s_name", "s_nationkey")
        .rename("s_nationkey" -> "n_nationkey")
        .merge(c.nation.filter(col("n_name") === "CANADA").select("n_nationkey"),
          Seq("n_nationkey"), "leftsemi")
        .merge(psQual, Seq("s_suppkey"), "leftsemi")
        .select("s_suppkey", "s_name")
    },
    sql = """
      SELECT s.s_suppkey AS s_suppkey, s_name
      FROM supplier_t s JOIN nation_t n ON s.s_nationkey = n.n_nationkey
      WHERE n.n_name = 'CANADA'
        AND s.s_suppkey IN (
          SELECT ps.ps_suppkey FROM partsupp_t ps
          WHERE ps.ps_partkey IN (SELECT p_partkey FROM part_t WHERE p_name LIKE 'green%')
            AND ps.ps_availqty > 0.5 * (
              SELECT SUM(l_quantity) FROM lineitem_t l
              WHERE l.l_partkey = ps.ps_partkey AND l.l_suppkey = ps.ps_suppkey
                AND l.l_shipdate >= DATE '1994-01-01' AND l.l_shipdate < DATE '1995-01-01')
            AND EXISTS (
              SELECT 1 FROM lineitem_t l
              WHERE l.l_partkey = ps.ps_partkey AND l.l_suppkey = ps.ps_suppkey
                AND l.l_shipdate >= DATE '1994-01-01' AND l.l_shipdate < DATE '1995-01-01'))""")

  val q21 = TpchQuery(21, "suppliers who kept orders waiting",
    Set("supplier", "lineitem", "orders", "nation"), Set(MultiCondExists),
    run = c => {
      val late = c.lineitem.filter(col("l_receiptdate") > col("l_commitdate"))
        .select("l_orderkey", "l_suppkey")
      val allSupp = c.lineitem.select("l_orderkey", "l_suppkey")
        .groupby("l_orderkey").agg(NUniqueAgg("l_suppkey", "n_supp_all"))
      val lateSupp = late.groupby("l_orderkey").agg(NUniqueAgg("l_suppkey", "n_supp_late"))
      val ordF = c.orders.filter(col("o_orderstatus") === "F")
        .select("o_orderkey").rename("o_orderkey" -> "l_orderkey")
      late
        .merge(ordF, Seq("l_orderkey"), "leftsemi")
        .merge(allSupp, Seq("l_orderkey"))
        .merge(lateSupp, Seq("l_orderkey"))
        .filter(col("n_supp_all") >= 2 && col("n_supp_late") === 1)
        .rename("l_suppkey" -> "s_suppkey")
        .merge(c.supplier.select("s_suppkey", "s_name", "s_nationkey"), Seq("s_suppkey"))
        .rename("s_nationkey" -> "n_nationkey")
        .merge(c.nation.filter(col("n_name") === "SAUDI ARABIA").select("n_nationkey"),
          Seq("n_nationkey"), "leftsemi")
        .groupby("s_name").agg(CountAgg("numwait"))
    },
    sql = """
      SELECT s_name, COUNT(*) AS numwait
      FROM supplier_t s
        JOIN lineitem_t l1 ON s.s_suppkey = l1.l_suppkey
        JOIN orders_t o ON o.o_orderkey = l1.l_orderkey
        JOIN nation_t n ON s.s_nationkey = n.n_nationkey
      WHERE o.o_orderstatus = 'F' AND l1.l_receiptdate > l1.l_commitdate
        AND EXISTS (SELECT 1 FROM lineitem_t l2
                    WHERE l2.l_orderkey = l1.l_orderkey AND l2.l_suppkey <> l1.l_suppkey)
        AND NOT EXISTS (SELECT 1 FROM lineitem_t l3
                        WHERE l3.l_orderkey = l1.l_orderkey AND l3.l_suppkey <> l1.l_suppkey
                          AND l3.l_receiptdate > l3.l_commitdate)
        AND n.n_name = 'SAUDI ARABIA'
      GROUP BY s_name""")

  val q22 = TpchQuery(22, "global sales opportunity", Set("customer", "orders"), Set(SeriesIsin),
    run = c => {
      val cust = c.customer
        .withColumn("cntrycode", substring(col("c_phone"), 1, 2))
        .filter(col("cntrycode").isin("13", "31", "23", "29", "30", "18", "17"))
        .select("c_custkey", "c_acctbal", "cntrycode")
      val avgBal = cust.filter(col("c_acctbal") > 0.0)
        .groupby().agg(MeanAgg("c_acctbal", "avg_bal"))
      cust.rename("c_custkey" -> "o_custkey")
        .merge(c.orders.select("o_custkey"), Seq("o_custkey"), "leftanti")
        .crossMerge(avgBal)
        .filter(col("c_acctbal") > col("avg_bal"))
        .groupby("cntrycode")
        .agg(CountAgg("numcust"), SumAgg("c_acctbal", "totacctbal"))
    },
    sql = """
      SELECT cntrycode, COUNT(*) AS numcust, SUM(c_acctbal) AS totacctbal
      FROM (SELECT SUBSTRING(c_phone, 1, 2) AS cntrycode, c_custkey, c_acctbal
            FROM customer_t
            WHERE SUBSTRING(c_phone, 1, 2) IN ('13','31','23','29','30','18','17')) c
      WHERE c_acctbal > (
          SELECT AVG(c_acctbal) FROM customer_t
          WHERE c_acctbal > 0.0
            AND SUBSTRING(c_phone, 1, 2) IN ('13','31','23','29','30','18','17'))
        AND NOT EXISTS (SELECT 1 FROM orders_t o WHERE o.o_custkey = c.c_custkey)
      GROUP BY cntrycode""")

  val qs: Vector[TpchQuery] = Vector(q12, q13, q14, q15, q16, q17, q18, q19, q20, q21, q22)
}
