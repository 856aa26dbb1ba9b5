package repro.core

import org.apache.spark.sql.DataFrame

/** Operators of the tileable graph (logical plan, paper §III-C).
  *
  * Each user-facing API call becomes one of these nodes; the tiling
  * engine later expands each node into chunk tasks (`tile` method
  * analog), possibly pausing for execution (dynamic tiling, §IV).
  */
sealed trait TileableOp {
  /** Short operator name used in labels, stats and profiles. */
  def name: String
}

object TileableOp {
  /** A named input table (the ReadParquet analog). */
  final case class SourceOp(sourceName: String, df: DataFrame) extends TileableOp {
    def name = s"Read($sourceName)"
  }

  /** Narrow chunk-local pipeline step(s): filter / project / assign / …. */
  final case class NarrowOp(pipe: NarrowPipe, label: String) extends TileableOp {
    def name = label
  }

  /** groupby(keys).agg(specs) — the GroupbyAgg operator. */
  final case class GroupAggOp(keys: Seq[String], aggs: Seq[AggSpec]) extends TileableOp {
    def name = s"GroupbyAgg(${keys.mkString(",")})"
  }

  /** pandas merge. `how` ∈ inner, left, leftsemi, leftanti, cross. */
  final case class MergeOp(on: Seq[String], how: String) extends TileableOp {
    def name = s"Merge(${on.mkString(",")}:$how)"
  }

  /** Positional row slice [start, start+count) (pandas iloc). */
  final case class ILocOp(start: Long, count: Long) extends TileableOp {
    def name = s"ILoc($start,$count)"
  }

  /** First n rows (pandas head). */
  final case class HeadOp(nRows: Long) extends TileableOp { def name = s"Head($nRows)" }

  /** Global sort by columns (pandas sort_values). */
  final case class SortOp(by: Seq[String], ascending: Seq[Boolean]) extends TileableOp {
    def name = s"Sort(${by.mkString(",")})"
  }

  /** Drop duplicate rows by subset (empty = all user columns). */
  final case class DistinctOp(subset: Seq[String]) extends TileableOp {
    def name = s"Distinct(${subset.mkString(",")})"
  }

  /** Row-wise concatenation of the inputs (pandas concat, ignore_index). */
  final case class ConcatOp() extends TileableOp { def name = "Concat" }

  /** Pivot table: one output chunk built from all input chunks
    * (non-relational reshape; paper §II-A).
    */
  final case class PivotOp(index: String, columns: String, values: String, aggfunc: String)
      extends TileableOp {
    def name = s"Pivot($index,$columns,$values)"
  }
}

/** A node of the tileable graph: operator + upstream tileables. */
final class Tileable(val op: TileableOp, val inputs: Vector[Tileable]) {
  override def toString: String = s"Tileable(${op.name})"
}
