package repro.core

import org.apache.spark.sql.{Column, DataFrame}

import repro.core.NarrowStep._
import repro.core.TileableOp._

/** The user-facing distributed dataframe: a drop-in-style, pandas-like
  * lazy API over the tiling engine (paper §III-B).
  *
  * Like Xorbits, evaluation is deferred: operators only build the
  * tileable graph; `toDF`, `count`, and `show` trigger tiling +
  * execution (the paper's `__repr__`-driven deferred evaluation).
  */
final class XFrame private[repro] (val engine: Engine, val tileable: Tileable) {

  private def derive(op: TileableOp, ins: Vector[Tileable]): XFrame =
    new XFrame(engine, new Tileable(op, ins))

  private def narrow(label: String, step: NarrowStep): XFrame =
    derive(NarrowOp(NarrowPipe.one(step), label), Vector(tileable))

  /** Boolean-mask row filter: `df[df["col"] < 1]`. */
  def filter(cond: Column): XFrame = narrow("Filter", FilterStep(cond))

  /** Column projection: `df[["a","b"]]`. */
  def select(cols: String*): XFrame = narrow("Select", SelectStep(cols))

  /** Add or replace a column: `df.assign(...)` / `df["c"] = …`. */
  def withColumn(name: String, c: Column): XFrame =
    narrow("WithColumn", WithColsStep(Seq(name -> c)))

  /** Add or replace several columns at once. */
  def withColumns(cols: (String, Column)*): XFrame =
    narrow("WithColumns", WithColsStep(cols))

  def drop(cols: String*): XFrame = narrow("Drop", DropStep(cols))

  def rename(mapping: (String, String)*): XFrame = narrow("Rename", RenameStep(mapping.toMap))

  /** pandas fillna over the given columns (all user columns if empty). */
  def fillna(value: Any, cols: String*): XFrame = narrow("FillNa", FillNaStep(value, cols))

  /** Escape hatch: arbitrary chunk-local transformation. */
  def mapChunks(label: String)(f: DataFrame => DataFrame): XFrame =
    narrow(label, FnStep(label, f))

  def groupby(keys: String*): XGroupBy = new XGroupBy(this, keys)

  /** pandas merge; `how` ∈ inner, left, leftsemi, leftanti. */
  def merge(right: XFrame, on: Seq[String], how: String = "inner"): XFrame = {
    require(right.engine eq engine, "cannot merge frames from different engines")
    derive(MergeOp(on, how), Vector(tileable, right.tileable))
  }

  /** Cartesian product with a (small) frame — scalar-subquery helper. */
  def crossMerge(right: XFrame): XFrame = {
    require(right.engine eq engine, "cannot merge frames from different engines")
    derive(MergeOp(Seq.empty, "cross"), Vector(tileable, right.tileable))
  }

  /** Positional single-row lookup (pandas `df.iloc[i]`). */
  def iloc(i: Long): XFrame = derive(ILocOp(i, 1), Vector(tileable))

  /** Positional row slice [start, end) (pandas `df.iloc[start:end]`). */
  def ilocRange(start: Long, end: Long): XFrame =
    derive(ILocOp(start, math.max(0, end - start)), Vector(tileable))

  def head(n: Long): XFrame = derive(HeadOp(n), Vector(tileable))

  def sortValues(by: Seq[String], ascending: Seq[Boolean]): XFrame = {
    require(by.size == ascending.size)
    derive(SortOp(by, ascending), Vector(tileable))
  }
  def sortValues(by: String*): XFrame = sortValues(by, Seq.fill(by.size)(true))

  /** pandas drop_duplicates (subset empty = all columns). */
  def dropDuplicates(subset: String*): XFrame = derive(DistinctOp(subset), Vector(tileable))

  /** pandas concat along rows (ignore_index). */
  def concat(other: XFrame): XFrame = {
    require(other.engine eq engine)
    derive(ConcatOp(), Vector(tileable, other.tileable))
  }

  /** pandas pivot_table with a single index/columns/values triple. */
  def pivotTable(index: String, columns: String, values: String, aggfunc: String = "mean"): XFrame =
    derive(PivotOp(index, columns, values, aggfunc), Vector(tileable))

  // -- evaluation triggers ----------------------------------------------

  /** Materialize and return the result as one Spark DataFrame, chunks
    * concatenated in row order (the paper's `execute`/`fetch`).
    */
  def toDF(): DataFrame = engine.collect(tileable)

  /** Row count from chunk metadata (materializes the frame). */
  def count(): Long = engine.countRows(tileable)

  /** Number of chunks this frame tiles into (materializes dependencies
    * when dynamic tiling needs them).
    */
  def numChunks(): Int = engine.numChunks(tileable)
}

/** groupby handle: `df.groupby("k").agg(...)`. */
final class XGroupBy private[repro] (frame: XFrame, keys: Seq[String]) {
  def agg(specs: AggSpec*): XFrame = {
    require(specs.nonEmpty, "agg requires at least one aggregate")
    new XFrame(frame.engine, new Tileable(TileableOp.GroupAggOp(keys, specs), Vector(frame.tileable)))
  }
}

object XFrame {

  /** Register a named input table with the engine (the read_parquet
    * analog — the source is chunked on first tiling).
    */
  def source(engine: Engine, name: String, df: DataFrame): XFrame =
    new XFrame(engine, new Tileable(TileableOp.SourceOp(name, df), Vector.empty))
}
