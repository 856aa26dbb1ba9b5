package repro.tpch

import org.apache.spark.sql.functions._

import repro.core.AggSpec._
import repro.sim.ApiFeature._

/** TPC-H-lite queries 1–11 (pandas-style XFrame implementations). */
private[tpch] object QueriesA {

  private def revenue = col("l_extendedprice") * (lit(1.0) - col("l_discount"))

  val q1 = TpchQuery(1, "pricing summary", Set("lineitem"), Set.empty,
    run = c => c.lineitem
      .filter(col("l_shipdate") <= lit("1998-09-02"))
      .withColumns(
        "disc_price" -> revenue,
        "charge" -> (revenue * (lit(1.0) + col("l_tax"))))
      .groupby("l_returnflag", "l_linestatus")
      .agg(
        SumAgg("l_quantity", "sum_qty"), SumAgg("l_extendedprice", "sum_base_price"),
        SumAgg("disc_price", "sum_disc_price"), SumAgg("charge", "sum_charge"),
        MeanAgg("l_quantity", "avg_qty"), MeanAgg("l_extendedprice", "avg_price"),
        MeanAgg("l_discount", "avg_disc"), CountAgg("count_order")),
    sql = """
      SELECT l_returnflag, l_linestatus,
             SUM(l_quantity) AS sum_qty, SUM(l_extendedprice) AS sum_base_price,
             SUM(l_extendedprice*(1-l_discount)) AS sum_disc_price,
             SUM(l_extendedprice*(1-l_discount)*(1+l_tax)) AS sum_charge,
             AVG(l_quantity) AS avg_qty, AVG(l_extendedprice) AS avg_price,
             AVG(l_discount) AS avg_disc, COUNT(*) AS count_order
      FROM lineitem_t WHERE l_shipdate <= DATE '1998-09-02'
      GROUP BY l_returnflag, l_linestatus""")

  val q2 = TpchQuery(2, "minimum cost supplier", Set("part", "supplier", "partsupp", "nation", "region"),
    Set.empty,
    run = c => {
      val p = c.part.filter(col("p_size") === 15 && col("p_type") === "STANDARD")
        .select("p_partkey", "p_mfgr")
      val eu = c.region.filter(col("r_name") === "EUROPE").select("r_regionkey")
      val nEu = c.nation.rename("n_regionkey" -> "r_regionkey")
        .merge(eu, Seq("r_regionkey"), "leftsemi").select("n_nationkey", "n_name")
      val s = c.supplier.select("s_suppkey", "s_name", "s_acctbal", "s_nationkey")
        .rename("s_nationkey" -> "n_nationkey").merge(nEu, Seq("n_nationkey"))
      val ps = c.partsupp.select("ps_partkey", "ps_suppkey", "ps_supplycost")
        .rename("ps_partkey" -> "p_partkey", "ps_suppkey" -> "s_suppkey")
      val joined = ps.merge(p, Seq("p_partkey")).merge(s, Seq("s_suppkey"))
      val minCost = joined.groupby("p_partkey").agg(MinAgg("ps_supplycost", "min_cost"))
      joined.merge(minCost, Seq("p_partkey"))
        .filter(col("ps_supplycost") === col("min_cost"))
        .select("s_acctbal", "s_name", "n_name", "p_partkey", "p_mfgr")
    },
    sql = """
      SELECT s_acctbal, s_name, n_name, p.p_partkey AS p_partkey, p_mfgr
      FROM partsupp_t ps
        JOIN part_t p ON ps.ps_partkey = p.p_partkey
        JOIN supplier_t s ON ps.ps_suppkey = s.s_suppkey
        JOIN nation_t n ON s.s_nationkey = n.n_nationkey
        JOIN region_t r ON n.n_regionkey = r.r_regionkey
      WHERE p.p_size = 15 AND p.p_type = 'STANDARD' AND r.r_name = 'EUROPE'
        AND ps.ps_supplycost = (
          SELECT MIN(ps2.ps_supplycost) FROM partsupp_t ps2
            JOIN supplier_t s2 ON ps2.ps_suppkey = s2.s_suppkey
            JOIN nation_t n2 ON s2.s_nationkey = n2.n_nationkey
            JOIN region_t r2 ON n2.n_regionkey = r2.r_regionkey
          WHERE ps2.ps_partkey = p.p_partkey AND r2.r_name = 'EUROPE')""")

  val q3 = TpchQuery(3, "shipping priority", Set("customer", "orders", "lineitem"), Set.empty,
    run = c => {
      val cust = c.customer.filter(col("c_mktsegment") === "BUILDING")
        .select("c_custkey").rename("c_custkey" -> "o_custkey")
      val ord = c.orders.filter(col("o_orderdate") < lit("1995-03-15"))
        .select("o_orderkey", "o_custkey", "o_orderdate", "o_shippriority")
        .merge(cust, Seq("o_custkey"), "leftsemi")
      val li = c.lineitem.filter(col("l_shipdate") > lit("1995-03-15"))
        .withColumn("rev", revenue)
        .select("l_orderkey", "rev").rename("l_orderkey" -> "o_orderkey")
      li.merge(ord, Seq("o_orderkey"))
        .groupby("o_orderkey", "o_orderdate", "o_shippriority")
        .agg(SumAgg("rev", "revenue_total"))
    },
    sql = """
      SELECT o.o_orderkey AS o_orderkey, o_orderdate, o_shippriority,
             SUM(l_extendedprice*(1-l_discount)) AS revenue_total
      FROM customer_t c JOIN orders_t o ON c.c_custkey = o.o_custkey
        JOIN lineitem_t l ON l.l_orderkey = o.o_orderkey
      WHERE c.c_mktsegment = 'BUILDING' AND o.o_orderdate < DATE '1995-03-15'
        AND l.l_shipdate > DATE '1995-03-15'
      GROUP BY o.o_orderkey, o_orderdate, o_shippriority""")

  val q4 = TpchQuery(4, "order priority checking", Set("orders", "lineitem"), Set.empty,
    run = c => {
      val li = c.lineitem.filter(col("l_commitdate") < col("l_receiptdate"))
        .select("l_orderkey").rename("l_orderkey" -> "o_orderkey")
      c.orders
        .filter(col("o_orderdate") >= lit("1993-07-01") && col("o_orderdate") < lit("1993-10-01"))
        .select("o_orderkey", "o_orderpriority")
        .merge(li, Seq("o_orderkey"), "leftsemi")
        .groupby("o_orderpriority").agg(CountAgg("order_count"))
    },
    sql = """
      SELECT o_orderpriority, COUNT(*) AS order_count
      FROM orders_t o
      WHERE o_orderdate >= DATE '1993-07-01' AND o_orderdate < DATE '1993-10-01'
        AND EXISTS (SELECT 1 FROM lineitem_t l
                    WHERE l.l_orderkey = o.o_orderkey AND l.l_commitdate < l.l_receiptdate)
      GROUP BY o_orderpriority""")

  val q5 = TpchQuery(5, "local supplier volume",
    Set("customer", "orders", "lineitem", "supplier", "nation", "region"), Set.empty,
    run = c => {
      val asia = c.region.filter(col("r_name") === "ASIA").select("r_regionkey")
      val nat = c.nation.rename("n_regionkey" -> "r_regionkey")
        .merge(asia, Seq("r_regionkey"), "leftsemi").select("n_nationkey", "n_name")
      val cust = c.customer.select("c_custkey", "c_nationkey")
      val ord = c.orders
        .filter(col("o_orderdate") >= lit("1994-01-01") && col("o_orderdate") < lit("1995-01-01"))
        .select("o_orderkey", "o_custkey")
        .rename("o_custkey" -> "c_custkey").merge(cust, Seq("c_custkey"))
      val sup = c.supplier.select("s_suppkey", "s_nationkey")
      c.lineitem.withColumn("rev", revenue).select("l_orderkey", "l_suppkey", "rev")
        .rename("l_orderkey" -> "o_orderkey").merge(ord, Seq("o_orderkey"))
        .rename("l_suppkey" -> "s_suppkey").merge(sup, Seq("s_suppkey"))
        .filter(col("c_nationkey") === col("s_nationkey"))
        .rename("s_nationkey" -> "n_nationkey").merge(nat, Seq("n_nationkey"))
        .groupby("n_name").agg(SumAgg("rev", "revenue_total"))
    },
    sql = """
      SELECT n_name, SUM(l_extendedprice*(1-l_discount)) AS revenue_total
      FROM customer_t c JOIN orders_t o ON c.c_custkey = o.o_custkey
        JOIN lineitem_t l ON l.l_orderkey = o.o_orderkey
        JOIN supplier_t s ON l.l_suppkey = s.s_suppkey AND c.c_nationkey = s.s_nationkey
        JOIN nation_t n ON s.s_nationkey = n.n_nationkey
        JOIN region_t r ON n.n_regionkey = r.r_regionkey
      WHERE r.r_name = 'ASIA'
        AND o.o_orderdate >= DATE '1994-01-01' AND o.o_orderdate < DATE '1995-01-01'
      GROUP BY n_name""")

  val q6 = TpchQuery(6, "forecasting revenue change", Set("lineitem"), Set.empty,
    run = c => c.lineitem
      .filter(col("l_shipdate") >= lit("1994-01-01") && col("l_shipdate") < lit("1995-01-01")
        && col("l_discount") >= 0.05 && col("l_discount") <= 0.07 && col("l_quantity") < 24)
      .withColumn("rev", col("l_extendedprice") * col("l_discount"))
      .groupby().agg(SumAgg("rev", "revenue_total")),
    sql = """
      SELECT SUM(l_extendedprice*l_discount) AS revenue_total
      FROM lineitem_t
      WHERE l_shipdate >= DATE '1994-01-01' AND l_shipdate < DATE '1995-01-01'
        AND l_discount BETWEEN 0.05 AND 0.07 AND l_quantity < 24""")

  val q7 = TpchQuery(7, "volume shipping",
    Set("supplier", "lineitem", "orders", "customer", "nation"), Set.empty,
    run = c => {
      val n1 = c.nation.filter(col("n_name").isin("FRANCE", "GERMANY"))
        .select("n_nationkey", "n_name")
        .rename("n_nationkey" -> "s_nationkey", "n_name" -> "supp_nation")
      val n2 = c.nation.filter(col("n_name").isin("FRANCE", "GERMANY"))
        .select("n_nationkey", "n_name")
        .rename("n_nationkey" -> "c_nationkey", "n_name" -> "cust_nation")
      val sup = c.supplier.select("s_suppkey", "s_nationkey").merge(n1, Seq("s_nationkey"))
      val cust = c.customer.select("c_custkey", "c_nationkey").merge(n2, Seq("c_nationkey"))
      val ord = c.orders.select("o_orderkey", "o_custkey")
        .rename("o_custkey" -> "c_custkey").merge(cust, Seq("c_custkey"))
      c.lineitem
        .filter(col("l_shipdate") >= lit("1995-01-01") && col("l_shipdate") <= lit("1996-12-31"))
        .withColumns("volume" -> revenue, "l_year" -> year(col("l_shipdate")))
        .select("l_orderkey", "l_suppkey", "volume", "l_year")
        .rename("l_orderkey" -> "o_orderkey").merge(ord, Seq("o_orderkey"))
        .rename("l_suppkey" -> "s_suppkey").merge(sup, Seq("s_suppkey"))
        .filter((col("supp_nation") === "FRANCE" && col("cust_nation") === "GERMANY")
          || (col("supp_nation") === "GERMANY" && col("cust_nation") === "FRANCE"))
        .groupby("supp_nation", "cust_nation", "l_year")
        .agg(SumAgg("volume", "revenue_total"))
    },
    sql = """
      SELECT n1.n_name AS supp_nation, n2.n_name AS cust_nation,
             EXTRACT(YEAR FROM l_shipdate) AS l_year,
             SUM(l_extendedprice*(1-l_discount)) AS revenue_total
      FROM supplier_t s JOIN lineitem_t l ON s.s_suppkey = l.l_suppkey
        JOIN orders_t o ON o.o_orderkey = l.l_orderkey
        JOIN customer_t c ON c.c_custkey = o.o_custkey
        JOIN nation_t n1 ON s.s_nationkey = n1.n_nationkey
        JOIN nation_t n2 ON c.c_nationkey = n2.n_nationkey
      WHERE ((n1.n_name = 'FRANCE' AND n2.n_name = 'GERMANY')
          OR (n1.n_name = 'GERMANY' AND n2.n_name = 'FRANCE'))
        AND l_shipdate BETWEEN DATE '1995-01-01' AND DATE '1996-12-31'
      GROUP BY n1.n_name, n2.n_name, EXTRACT(YEAR FROM l_shipdate)""")

  val q8 = TpchQuery(8, "national market share",
    Set("part", "supplier", "lineitem", "orders", "customer", "nation", "region"), Set.empty,
    run = c => {
      val p = c.part.filter(col("p_type") === "ECONOMY").select("p_partkey")
      val am = c.region.filter(col("r_name") === "AMERICA").select("r_regionkey")
      val natAm = c.nation.rename("n_regionkey" -> "r_regionkey")
        .merge(am, Seq("r_regionkey"), "leftsemi").select("n_nationkey")
      val cust = c.customer.select("c_custkey", "c_nationkey")
        .rename("c_nationkey" -> "n_nationkey").merge(natAm, Seq("n_nationkey"), "leftsemi")
        .select("c_custkey")
      val ord = c.orders
        .filter(col("o_orderdate") >= lit("1995-01-01") && col("o_orderdate") <= lit("1996-12-31"))
        .withColumn("o_year", year(col("o_orderdate")))
        .select("o_orderkey", "o_custkey", "o_year")
      val supN = c.supplier.select("s_suppkey", "s_nationkey")
        .rename("s_nationkey" -> "n_nationkey")
        .merge(c.nation.select("n_nationkey", "n_name"), Seq("n_nationkey"))
      c.lineitem.withColumn("volume", revenue)
        .select("l_orderkey", "l_partkey", "l_suppkey", "volume")
        .rename("l_partkey" -> "p_partkey").merge(p, Seq("p_partkey"), "leftsemi")
        .rename("l_orderkey" -> "o_orderkey").merge(ord, Seq("o_orderkey"))
        .rename("o_custkey" -> "c_custkey").merge(cust, Seq("c_custkey"), "leftsemi")
        .rename("l_suppkey" -> "s_suppkey").merge(supN, Seq("s_suppkey"))
        .withColumn("brazil_vol", when(col("n_name") === "BRAZIL", col("volume")).otherwise(lit(0.0)))
        .groupby("o_year")
        .agg(SumAgg("brazil_vol", "sum_brazil"), SumAgg("volume", "sum_all"))
        .withColumn("mkt_share", col("sum_brazil") / col("sum_all"))
        .select("o_year", "mkt_share")
    },
    sql = """
      SELECT o_year, SUM(brazil_vol) / SUM(volume) AS mkt_share
      FROM (
        SELECT EXTRACT(YEAR FROM o_orderdate) AS o_year,
               l_extendedprice*(1-l_discount) AS volume,
               CASE WHEN n2.n_name = 'BRAZIL'
                    THEN l_extendedprice*(1-l_discount) ELSE 0 END AS brazil_vol
        FROM part_t p JOIN lineitem_t l ON p.p_partkey = l.l_partkey
          JOIN supplier_t s ON s.s_suppkey = l.l_suppkey
          JOIN orders_t o ON l.l_orderkey = o.o_orderkey
          JOIN customer_t c ON o.o_custkey = c.c_custkey
          JOIN nation_t n1 ON c.c_nationkey = n1.n_nationkey
          JOIN region_t r ON n1.n_regionkey = r.r_regionkey
          JOIN nation_t n2 ON s.s_nationkey = n2.n_nationkey
        WHERE r.r_name = 'AMERICA' AND p.p_type = 'ECONOMY'
          AND o_orderdate BETWEEN DATE '1995-01-01' AND DATE '1996-12-31')
      GROUP BY o_year""")

  val q9 = TpchQuery(9, "product type profit",
    Set("part", "supplier", "lineitem", "partsupp", "orders", "nation"), Set.empty,
    run = c => {
      val p = c.part.filter(col("p_name").contains("green")).select("p_partkey")
      val supN = c.supplier.select("s_suppkey", "s_nationkey")
        .rename("s_nationkey" -> "n_nationkey")
        .merge(c.nation.select("n_nationkey", "n_name"), Seq("n_nationkey"))
        .select("s_suppkey", "n_name")
      val ps = c.partsupp.select("ps_partkey", "ps_suppkey", "ps_supplycost")
        .rename("ps_partkey" -> "p_partkey", "ps_suppkey" -> "s_suppkey")
      val ord = c.orders.withColumn("o_year", year(col("o_orderdate")))
        .select("o_orderkey", "o_year")
      c.lineitem
        .select("l_orderkey", "l_partkey", "l_suppkey", "l_quantity", "l_extendedprice", "l_discount")
        .rename("l_partkey" -> "p_partkey", "l_suppkey" -> "s_suppkey")
        .merge(p, Seq("p_partkey"), "leftsemi")
        .merge(supN, Seq("s_suppkey"))
        .merge(ps, Seq("p_partkey", "s_suppkey"))
        .rename("l_orderkey" -> "o_orderkey").merge(ord, Seq("o_orderkey"))
        .withColumn("amount",
          revenue - col("ps_supplycost") * col("l_quantity"))
        .groupby("n_name", "o_year").agg(SumAgg("amount", "sum_profit"))
    },
    sql = """
      SELECT n_name, EXTRACT(YEAR FROM o_orderdate) AS o_year,
             SUM(l_extendedprice*(1-l_discount) - ps_supplycost*l_quantity) AS sum_profit
      FROM part_t p JOIN lineitem_t l ON p.p_partkey = l.l_partkey
        JOIN supplier_t s ON s.s_suppkey = l.l_suppkey
        JOIN partsupp_t ps ON ps.ps_partkey = l.l_partkey AND ps.ps_suppkey = l.l_suppkey
        JOIN orders_t o ON o.o_orderkey = l.l_orderkey
        JOIN nation_t n ON s.s_nationkey = n.n_nationkey
      WHERE p.p_name LIKE '%green%'
      GROUP BY n_name, EXTRACT(YEAR FROM o_orderdate)""")

  val q10 = TpchQuery(10, "returned item reporting",
    Set("customer", "orders", "lineitem", "nation"), Set.empty,
    run = c => {
      val ord = c.orders
        .filter(col("o_orderdate") >= lit("1993-10-01") && col("o_orderdate") < lit("1994-01-01"))
        .select("o_orderkey", "o_custkey")
      val li = c.lineitem.filter(col("l_returnflag") === "R")
        .withColumn("rev", revenue).select("l_orderkey", "rev")
      val cust = c.customer.select("c_custkey", "c_nationkey", "c_acctbal")
        .rename("c_nationkey" -> "n_nationkey")
        .merge(c.nation.select("n_nationkey", "n_name"), Seq("n_nationkey"))
      li.rename("l_orderkey" -> "o_orderkey").merge(ord, Seq("o_orderkey"))
        .rename("o_custkey" -> "c_custkey").merge(cust, Seq("c_custkey"))
        .groupby("c_custkey", "c_acctbal", "n_name")
        .agg(SumAgg("rev", "revenue_total"))
    },
    sql = """
      SELECT c.c_custkey AS c_custkey, c_acctbal, n_name,
             SUM(l_extendedprice*(1-l_discount)) AS revenue_total
      FROM customer_t c JOIN orders_t o ON c.c_custkey = o.o_custkey
        JOIN lineitem_t l ON l.l_orderkey = o.o_orderkey
        JOIN nation_t n ON c.c_nationkey = n.n_nationkey
      WHERE o_orderdate >= DATE '1993-10-01' AND o_orderdate < DATE '1994-01-01'
        AND l_returnflag = 'R'
      GROUP BY c.c_custkey, c_acctbal, n_name""")

  val q11 = TpchQuery(11, "important stock identification",
    Set("partsupp", "supplier", "nation"), Set.empty,
    run = c => {
      val natDe = c.nation.filter(col("n_name") === "GERMANY").select("n_nationkey")
      val sup = c.supplier.select("s_suppkey", "s_nationkey")
        .rename("s_nationkey" -> "n_nationkey")
        .merge(natDe, Seq("n_nationkey"), "leftsemi").select("s_suppkey")
      val ps = c.partsupp
        .withColumn("value", col("ps_supplycost") * col("ps_availqty"))
        .rename("ps_suppkey" -> "s_suppkey")
        .merge(sup, Seq("s_suppkey"), "leftsemi")
      val byPart = ps.groupby("ps_partkey").agg(SumAgg("value", "part_value"))
      val total = ps.groupby().agg(SumAgg("value", "total_value"))
      byPart.crossMerge(total)
        .filter(col("part_value") > col("total_value") * 0.0001)
        .select("ps_partkey", "part_value")
    },
    sql = """
      SELECT ps_partkey, SUM(ps_supplycost*ps_availqty) AS part_value
      FROM partsupp_t ps JOIN supplier_t s ON ps.ps_suppkey = s.s_suppkey
        JOIN nation_t n ON s.s_nationkey = n.n_nationkey
      WHERE n.n_name = 'GERMANY'
      GROUP BY ps_partkey
      HAVING SUM(ps_supplycost*ps_availqty) > (
        SELECT SUM(ps_supplycost*ps_availqty) * 0.0001
        FROM partsupp_t ps2 JOIN supplier_t s2 ON ps2.ps_suppkey = s2.s_suppkey
          JOIN nation_t n2 ON s2.s_nationkey = n2.n_nationkey
        WHERE n2.n_name = 'GERMANY')""")

  val qs: Vector[TpchQuery] = Vector(q1, q2, q3, q4, q5, q6, q7, q8, q9, q10, q11)
}
