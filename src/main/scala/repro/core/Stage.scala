package repro.core

/** Stage of a chunk-level task in the multi-stage map-combine-reduce
  * programming model (paper §III-C).
  *
  * Not every operator uses every stage; narrow (element-wise) operators
  * are a single `Narrow` stage, sources are `Source`, and shuffle-style
  * operators expand into `Map` → (`Combine`)* → `Reduce`.
  */
sealed trait Stage
object Stage {
  /** Reads a row-range chunk of an input table. */
  case object Source extends Stage
  /** Element-wise / chunk-local transformation (filter, project, …). */
  case object Narrow extends Stage
  /** Per-chunk partial computation producing intermediate key-values. */
  case object Map extends Stage
  /** Pre-aggregation over a subset of map outputs (tree-reduce level). */
  case object Combine extends Stage
  /** Final aggregation / join of (bucketed) intermediates. */
  case object Reduce extends Stage
  /** Anything else (concat, reindex, iloc boundary, …). */
  case object Other extends Stage
}
