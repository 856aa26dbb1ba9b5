package repro.tpch

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.types._

import repro.SynthData
import repro.core.{Engine, XFrame}

/** TPC-H-lite datasets + DuckDB helpers.
  *
  * The 8-table synthetic schema comes from `SynthData` (deterministic in
  * (sf, seed)). For the oracle, tables load into DuckDB as VARCHAR, so
  * every query's SQL references typed views (`lineitem_t`, …) generated
  * by `duckPrelude` which casts each column to its Spark type.
  */
object TpchData {

  /** All eight tables at the given scale factor. */
  def tables(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "lineitem" -> SynthData.lineitemFull(spark, sf),
    "orders"   -> SynthData.ordersFull(spark, sf),
    "customer" -> SynthData.customerFull(spark, sf),
    "part"     -> SynthData.partFull(spark, sf),
    "supplier" -> SynthData.supplier(spark, sf),
    "partsupp" -> SynthData.partsupp(spark, sf),
    "nation"   -> SynthData.nation(spark),
    "region"   -> SynthData.region(spark),
  )

  private def duckType(dt: DataType): String = dt match {
    case LongType | IntegerType | ShortType | ByteType => "BIGINT"
    case DoubleType | FloatType                        => "DOUBLE"
    case DateType                                      => "DATE"
    case BooleanType                                   => "BOOLEAN"
    case _                                             => "VARCHAR"
  }

  /** WITH-clause prelude defining a typed view `<name>_t` per table. */
  def duckPrelude(ts: Map[String, DataFrame]): String = {
    val views = ts.toSeq.sortBy(_._1).map { case (name, df) =>
      val casts = df.schema.fields
        .map(f => s"CAST(${f.name} AS ${duckType(f.dataType)}) AS ${f.name}")
        .mkString(", ")
      s"${name}_t AS (SELECT $casts FROM $name)"
    }
    s"WITH ${views.mkString(",\n")}"
  }

  /** Full DuckDB statement for a query: typed-view prelude + query SQL,
    * merging the query's own WITH clause into the prelude if present.
    */
  def fullSql(q: TpchQuery, ts: Map[String, DataFrame]): String = {
    val used = ts.view.filterKeys(q.tables.contains).toMap
    val p = duckPrelude(used)
    val s = q.sql.trim
    if (s.toUpperCase.startsWith("WITH")) s"$p, ${s.drop(4).trim}" else s"$p $s"
  }
}

/** XFrame handles over the eight TPC-H tables for one engine. */
final case class TpchCtx(
    engine: Engine,
    lineitem: XFrame,
    orders: XFrame,
    customer: XFrame,
    part: XFrame,
    supplier: XFrame,
    partsupp: XFrame,
    nation: XFrame,
    region: XFrame,
)

object TpchCtx {
  def apply(engine: Engine, ts: Map[String, DataFrame]): TpchCtx = TpchCtx(
    engine,
    XFrame.source(engine, "lineitem", ts("lineitem")),
    XFrame.source(engine, "orders", ts("orders")),
    XFrame.source(engine, "customer", ts("customer")),
    XFrame.source(engine, "part", ts("part")),
    XFrame.source(engine, "supplier", ts("supplier")),
    XFrame.source(engine, "partsupp", ts("partsupp")),
    XFrame.source(engine, "nation", ts("nation")),
    XFrame.source(engine, "region", ts("region")),
  )
}
