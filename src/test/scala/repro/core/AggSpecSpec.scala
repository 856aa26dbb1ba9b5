package repro.core

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.AggSpec._

/** The map-combine-reduce aggregate algebra: each spec's decomposition
  * (map → merge → finalize) must equal the direct Spark aggregate, for
  * any partitioning of the input.
  */
class AggSpecSpec extends SparkSpec {

  private def data() = spark.range(997).select( // odd size → uneven splits
    (col("id") % 13) as "k",
    (col("id") % 51).cast("double") as "v",
    when(col("id") % 7 === 0, lit(null)).otherwise(col("id") % 29).cast("double") as "nv")

  /** Emulate the engine: split into n slices, map-aggregate each, merge
    * pairwise in arbitrary tree shapes, finalize.
    */
  private def viaAlgebra(specs: Seq[AggSpec], nSplits: Int, keys: Seq[String] = Seq("k")) = {
    val df = data()
    val slices = (0 until nSplits).map(i => df.filter(pmod(col("id"), lit(nSplits)) === i))
    val mapped = slices.map { s =>
      val exprs = AggSpec.mapExprs(specs)
      s.groupBy(keys.map(col): _*).agg(exprs.head, exprs.tail: _*)
    }
    val mergeExprs = AggSpec.mergeExprs(specs)
    val merged = mapped.reduce(_ unionByName _)
      .groupBy(keys.map(col): _*).agg(mergeExprs.head, mergeExprs.tail: _*)
    merged.select(AggSpec.finalExprs(keys, specs): _*)
  }

  private def direct(cols: Seq[org.apache.spark.sql.Column]) =
    data().groupBy("k").agg(cols.head, cols.tail: _*)

  private def assertSame(a: org.apache.spark.sql.DataFrame, b: org.apache.spark.sql.DataFrame): Unit = {
    def canon(df: org.apache.spark.sql.DataFrame) =
      df.collect().map(_.toSeq.map {
        case null      => "∅"
        case d: Double => f"$d%.6f"
        case x         => x.toString
      }.mkString("|")).sorted
    assert(canon(a).sameElements(canon(b)))
  }

  test("sum decomposes over any split count") {
    for (n <- Seq(1, 3, 8)) {
      assertSame(viaAlgebra(Seq(SumAgg("v", "s")), n), direct(Seq(sum("v") as "s")))
    }
  }

  test("count(*) decomposes") {
    assertSame(viaAlgebra(Seq(CountAgg("n")), 5), direct(Seq(count(lit(1)) as "n")))
  }

  test("count(col) skips nulls and decomposes") {
    assertSame(viaAlgebra(Seq(CountColAgg("nv", "n")), 4), direct(Seq(count(col("nv")) as "n")))
  }

  test("min and max decompose") {
    assertSame(
      viaAlgebra(Seq(MinAgg("v", "lo"), MaxAgg("v", "hi")), 6),
      direct(Seq(min("v") as "lo", max("v") as "hi")))
  }

  test("mean decomposes via (sum, count)") {
    assertSame(viaAlgebra(Seq(MeanAgg("v", "m")), 7), direct(Seq(avg("v") as "m")))
  }

  test("mean over a column with nulls uses non-null counts") {
    assertSame(viaAlgebra(Seq(MeanAgg("nv", "m")), 3), direct(Seq(avg("nv") as "m")))
  }

  test("sample variance decomposes via (sum, sumsq, count)") {
    assertSame(viaAlgebra(Seq(VarAgg("v", "s2")), 5), direct(Seq(var_samp("v") as "s2")))
  }

  test("nunique decomposes via set union") {
    assertSame(viaAlgebra(Seq(NUniqueAgg("v", "u")), 6),
      direct(Seq(countDistinct("v") as "u")))
  }

  test("multiple specs coexist without intermediate-name collisions") {
    assertSame(
      viaAlgebra(Seq(SumAgg("v", "a"), MeanAgg("v", "b"), CountAgg("c"),
        MinAgg("v", "d"), MaxAgg("v", "e"), VarAgg("v", "f")), 4),
      direct(Seq(sum("v") as "a", avg("v") as "b", count(lit(1)) as "c",
        min("v") as "d", max("v") as "e", var_samp("v") as "f")))
  }

  test("same source column under two different output names") {
    assertSame(
      viaAlgebra(Seq(MinAgg("v", "v_min"), MaxAgg("v", "v_max")), 3),
      direct(Seq(min("v") as "v_min", max("v") as "v_max")))
  }

  test("multi-key aggregation decomposes") {
    val keys = Seq("k", "k2")
    val df = spark.range(997).select(
      col("id"), (col("id") % 13) as "k", (col("id") % 3) as "k2",
      (col("id") % 51).cast("double") as "v")
    val slices = (0 until 4).map(i => df.filter(pmod(col("id"), lit(4)) === i).drop("id"))
    val specs = Seq(SumAgg("v", "s"))
    val mapExprs = AggSpec.mapExprs(specs)
    val mapped = slices.map(_.groupBy(keys.map(col): _*).agg(mapExprs.head, mapExprs.tail: _*))
    val mergeExprs = AggSpec.mergeExprs(specs)
    val got = mapped.reduce(_ unionByName _)
      .groupBy(keys.map(col): _*).agg(mergeExprs.head, mergeExprs.tail: _*)
      .select(AggSpec.finalExprs(keys, specs): _*)
    assertSame(got, df.drop("id").groupBy("k", "k2").agg(sum("v") as "s"))
  }
}
