package repro

import org.apache.spark.sql.functions._

/** Generator hygiene: determinism, scaling, schema completeness and the
  * statistical properties (skew) the workloads rely on.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001).agg(sum("l_quantity")).head().getDouble(0)
    val b = SynthData.lineitem(spark, 0.001).agg(sum("l_quantity")).head().getDouble(0)
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000)
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("full variants keep the base columns and add the extended ones") {
    val li = SynthData.lineitemFull(spark, 0.001)
    val expect = Set("l_orderkey", "l_partkey", "l_linenumber", "l_quantity", "l_extendedprice",
      "l_discount", "l_tax", "l_returnflag", "l_linestatus", "l_shipdate",
      "l_suppkey", "l_commitdate", "l_receiptdate", "l_shipinstruct", "l_shipmode")
    assert(li.columns.toSet == expect)
    val o = SynthData.ordersFull(spark, 0.001)
    assert(o.columns.toSet.contains("o_orderpriority") && o.columns.contains("o_comment"))
    assert(SynthData.customerFull(spark, 0.001).columns.contains("c_phone"))
    assert(SynthData.partFull(spark, 0.001).columns.toSet
      .intersect(Set("p_name", "p_mfgr", "p_brand", "p_container")).size == 4)
  }

  test("receiptdate is strictly after shipdate") {
    val li = SynthData.lineitemFull(spark, 0.001)
    assert(li.filter(col("l_receiptdate") <= col("l_shipdate")).count() == 0)
  }

  test("customer phone prefix encodes the nation (Q22 relies on it)") {
    val c = SynthData.customerFull(spark, 0.001)
    val bad = c.filter(
      substring(col("c_phone"), 1, 2) =!= lpad((col("c_nationkey") + 10).cast("string"), 2, "0"))
    assert(bad.count() == 0)
  }

  test("partsupp has 4 rows per part with valid supplier keys") {
    val ps = SynthData.partsupp(spark, 0.001)
    assert(ps.count() == 4 * 200)
    val nSupp = SynthData.supplier(spark, 0.001).count()
    assert(ps.filter(col("ps_suppkey") < 1 || col("ps_suppkey") > nSupp).count() == 0)
  }

  test("nation and region form a consistent star") {
    val n = SynthData.nation(spark); val r = SynthData.region(spark)
    assert(n.count() == 25 && r.count() == 5)
    assert(n.join(r, n("n_regionkey") === r("r_regionkey")).count() == 25)
  }

  test("zipfKeys is heavily skewed; uniformKeys is not") {
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().agg(max("count")).head().getLong(0).toDouble
      top / df.count().toDouble
    }
    val z = topShare(SynthData.zipfKeys(spark, 20000, 1000))
    val u = topShare(SynthData.uniformKeys(spark, 20000, 1000))
    assert(z > 10 * u, f"zipf top share $z%.4f should dwarf uniform $u%.4f")
  }

  test("transactions key domain stays within the customer table") {
    val tx = SynthData.transactions(spark, 0.001, nCustomers = 300)
    val mx = tx.agg(max("t_custkey")).head().getLong(0)
    val mn = tx.agg(min("t_custkey")).head().getLong(0)
    assert(mn >= 1 && mx <= 300)
  }

  test("censusLike has nulls only in the two nullable columns") {
    val c = SynthData.censusLike(spark, 0.001)
    assert(c.filter(col("workclass").isNull).count() > 0)
    assert(c.filter(col("occupation").isNull).count() > 0)
    assert(c.filter(col("education").isNull).count() == 0)
  }

  test("plasticcLike observations reference a bounded object domain") {
    val p = SynthData.plasticcLike(spark, 0.001)
    assert(p.agg(max("passband")).head().getInt(0) <= 5)
    assert(p.agg(countDistinct("object_id")).head().getLong(0) <= 20L + 20000 / 1000)
  }

  test("analytic TableStats row counts match generator constants") {
    import repro.sim.TableStats
    assert(SynthData.lineitem(spark, 0.001).count() == (TableStats.rowsPerSf("lineitem") * 0.001).toLong)
    assert(SynthData.orders(spark, 0.001).count() == (TableStats.rowsPerSf("orders") * 0.001).toLong)
    assert(SynthData.partsupp(spark, 0.001).count() == (TableStats.rowsPerSf("partsupp") * 0.001).toLong)
  }

  test("descriptor sanity: Q1 group count saturates at 6 (returnflag × linestatus)") {
    val li = SynthData.lineitem(spark, 0.002)
    val groups = li.select("l_returnflag", "l_linestatus").distinct().count()
    assert(groups == 6)
    assert(repro.sim.QueryDescs.byId(1).groupbys.head.groups(0.002) <= 6)
  }

  test("descriptor sanity: Q18 groups ≈ order count (orderkey aggregation)") {
    val li = SynthData.lineitem(spark, 0.002)
    val groups = li.select("l_orderkey").distinct().count().toDouble
    val predicted = repro.sim.QueryDescs.byId(18).groupbys.head.groups(0.002)
    assert(math.abs(groups - predicted) / predicted < 0.35,
      s"measured $groups vs predicted $predicted")
  }
}
