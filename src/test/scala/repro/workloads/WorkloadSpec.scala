package repro.workloads

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec, SynthData}
import repro.baseline.Engines

/** The three DS-pipeline workloads (TPCx-AI UC10 analog, census-like,
  * plasticc-like) are oracle-checked against DuckDB and verified to
  * exhibit the structural properties the paper exploits (size imbalance
  * + key skew for UC10).
  */
class WorkloadSpec extends SparkSpec {

  test("UC10 inputs are extremely size-imbalanced (fact ≫ dimension)") {
    val in = Uc10.inputs(spark, sf = 0.002, nCustomers = 200)
    val txRows = in.transactions.count(); val cRows = in.customers.count()
    assert(txRows > 50 * cRows, s"$txRows vs $cRows")
  }

  test("UC10 transaction keys are zipf-hot (top key ≫ uniform share)") {
    val in = Uc10.inputs(spark, sf = 0.002, nCustomers = 200)
    val counts = in.transactions.groupBy("t_custkey").count()
    val top = counts.agg(max("count")).head().getLong(0).toDouble
    val total = in.transactions.count().toDouble
    assert(top / total > 0.05, f"hot-key share ${top / total}%.3f too low for skew scenario")
  }

  test("UC10 pipeline result matches DuckDB") {
    val engine = Engines.xorbits(spark, chunkLimit = 64 << 10)
    try {
      val in = Uc10.inputs(spark, sf = 0.002, nCustomers = 200)
      val got = Uc10.pipeline(engine, in).toDF()
      Oracle.assertEquivalentApprox(got, Uc10.referenceSql,
        Seq("tx" -> in.transactions, "cust" -> in.customers))
    } finally engine.reset()
  }

  test("UC10 dynamic engine broadcast-merges the tiny customer side") {
    val engine = Engines.xorbits(spark, chunkLimit = 64 << 10)
    try {
      val in = Uc10.inputs(spark, sf = 0.002, nCustomers = 200)
      Uc10.pipeline(engine, in).toDF().count()
      assert(engine.stats.broadcastMerges == 1 && engine.stats.shuffleMerges == 0)
    } finally engine.reset()
  }

  test("UC10 static engine hash-shuffles the skewed join (the paper's failure mode)") {
    val engine = Engines.static(spark, chunkLimit = 64 << 10)
    try {
      val in = Uc10.inputs(spark, sf = 0.002, nCustomers = 200)
      val got = Uc10.pipeline(engine, in).toDF()
      assert(engine.stats.shuffleMerges == 1 && engine.stats.broadcastMerges == 0)
      // still correct, just fragile at scale
      Oracle.assertEquivalentApprox(got, Uc10.referenceSql,
        Seq("tx" -> in.transactions, "cust" -> in.customers))
    } finally engine.reset()
  }

  test("census pipeline matches DuckDB") {
    val engine = Engines.xorbits(spark, chunkLimit = 128 << 10)
    try {
      val df = Census.input(spark, sf = 0.002)
      val got = Census.pipeline(engine, df).toDF()
      Oracle.assertEquivalentApprox(got, Census.referenceSql, Seq("census" -> df))
    } finally engine.reset()
  }

  test("census pipeline benefits from operator fusion (stats)") {
    val engine = Engines.xorbits(spark, chunkLimit = 128 << 10)
    try {
      Census.pipeline(engine, Census.input(spark, sf = 0.002)).toDF().count()
      assert(engine.stats.narrowStepsFused > 0,
        "the feature-column chain should fuse into few Catalyst projections")
    } finally engine.reset()
  }

  test("plasticc pipeline matches DuckDB") {
    val engine = Engines.xorbits(spark, chunkLimit = 128 << 10)
    try {
      val df = Plasticc.input(spark, sf = 0.001)
      val got = Plasticc.pipeline(engine, df).toDF()
      Oracle.assertEquivalentApprox(got, Plasticc.referenceSql, Seq("plasticc" -> df))
    } finally engine.reset()
  }

  test("plasticc feature frame has one row per (object, passband)") {
    val engine = Engines.xorbits(spark, chunkLimit = 128 << 10)
    try {
      val df = Plasticc.input(spark, sf = 0.001)
      val got = Plasticc.pipeline(engine, df).toDF()
      assert(got.groupBy("object_id", "passband").count().filter(col("count") > 1).count() == 0)
    } finally engine.reset()
  }
}
