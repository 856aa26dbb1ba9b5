package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** A decomposable aggregate in the map-combine-reduce model (§III-C).
  *
  * Each spec describes three algebra pieces:
  *  - `mapAggs`:   per-chunk partial aggregation over raw columns,
  *                 producing named intermediate columns;
  *  - `mergeAggs`: re-aggregation of intermediates (used by both the
  *                 combine stage and the reduce stage — associativity is
  *                 what makes tree-reduce and shuffle-reduce equivalent);
  *  - `finalExpr`: converts intermediates to the user-visible result.
  *
  * Intermediate column names are prefixed with `__` + output name so
  * multiple specs can coexist in one groupby.
  */
sealed trait AggSpec {
  /** User-visible output column name. */
  def out: String
  /** Partial aggregation: (intermediate name, agg over raw columns). */
  def mapAggs: Seq[(String, Column)]
  /** Merge of intermediates: (intermediate name, agg over intermediates). */
  def mergeAggs: Seq[(String, Column)]
  /** Finalization over intermediates, to be aliased as `out`. */
  def finalExpr: Column
}

object AggSpec {
  private def n(out: String, suffix: String) = s"__${out}_$suffix"

  final case class SumAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(n(out, "s") -> sum(col(colName)))
    def mergeAggs = Seq(n(out, "s") -> sum(col(n(out, "s"))))
    def finalExpr = col(n(out, "s"))
  }

  /** count(*) — row count per group. */
  final case class CountAgg(out: String) extends AggSpec {
    def mapAggs = Seq(n(out, "c") -> count(lit(1)))
    def mergeAggs = Seq(n(out, "c") -> sum(col(n(out, "c"))))
    def finalExpr = col(n(out, "c"))
  }

  /** count(col) — non-null count per group. */
  final case class CountColAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(n(out, "c") -> count(col(colName)))
    def mergeAggs = Seq(n(out, "c") -> sum(col(n(out, "c"))))
    def finalExpr = col(n(out, "c"))
  }

  final case class MinAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(n(out, "m") -> min(col(colName)))
    def mergeAggs = Seq(n(out, "m") -> min(col(n(out, "m"))))
    def finalExpr = col(n(out, "m"))
  }

  final case class MaxAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(n(out, "m") -> max(col(colName)))
    def mergeAggs = Seq(n(out, "m") -> max(col(n(out, "m"))))
    def finalExpr = col(n(out, "m"))
  }

  final case class MeanAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(
      n(out, "s") -> sum(col(colName)),
      n(out, "c") -> count(col(colName)),
    )
    def mergeAggs = Seq(
      n(out, "s") -> sum(col(n(out, "s"))),
      n(out, "c") -> sum(col(n(out, "c"))),
    )
    def finalExpr = col(n(out, "s")) / col(n(out, "c"))
  }

  /** Sample variance (ddof = 1, pandas default) via (Σx, Σx², n). */
  final case class VarAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(
      n(out, "s")  -> sum(col(colName)),
      n(out, "s2") -> sum(col(colName) * col(colName)),
      n(out, "c")  -> count(col(colName)),
    )
    def mergeAggs = Seq(
      n(out, "s")  -> sum(col(n(out, "s"))),
      n(out, "s2") -> sum(col(n(out, "s2"))),
      n(out, "c")  -> sum(col(n(out, "c"))),
    )
    def finalExpr = {
      val s = col(n(out, "s")); val s2 = col(n(out, "s2")); val c = col(n(out, "c"))
      when(c > 1, (s2 - s * s / c) / (c - 1)).otherwise(lit(null))
    }
  }

  /** Distinct count per group via set intermediates (exact, bounded by
    * the group's distinct values — fine at our scales).
    */
  final case class NUniqueAgg(colName: String, out: String) extends AggSpec {
    def mapAggs = Seq(n(out, "set") -> collect_set(col(colName)))
    def mergeAggs = Seq(n(out, "set") -> array_distinct(flatten(collect_list(col(n(out, "set"))))))
    def finalExpr = size(col(n(out, "set"))).cast("long")
  }

  /** Build the map-stage aggregation exprs for a set of specs. */
  def mapExprs(specs: Seq[AggSpec]): Seq[Column] =
    specs.flatMap(_.mapAggs).map { case (nm, c) => c.as(nm) }

  /** Build the merge-stage aggregation exprs for a set of specs. */
  def mergeExprs(specs: Seq[AggSpec]): Seq[Column] =
    specs.flatMap(_.mergeAggs).map { case (nm, c) => c.as(nm) }

  /** Build the finalization projection (keys ++ outputs). */
  def finalExprs(keys: Seq[String], specs: Seq[AggSpec]): Seq[Column] =
    keys.map(col) ++ specs.map(s => s.finalExpr.as(s.out))
}
