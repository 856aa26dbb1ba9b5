package repro.sim

/** pandas-API features that distinguish the frameworks' coverage
  * (paper §II-B, §VI-E). Queries and coverage cases are tagged with the
  * features they require; a framework model fails a workload with an
  * `ApiFail` outcome when it misses one of its features.
  *
  * The missing-feature sets per framework (see `FrameworkModel`) are
  * modeled from the gaps the paper reports and the frameworks document:
  * e.g. pandas-on-Spark lacks `NamedAgg` and sorted merge keys, Dask
  * lacks positional `iloc` and sorted merge keys.
  */
sealed trait ApiFeature
object ApiFeature {
  /** Positional row access after shape-changing ops (iloc). */
  case object PositionalIloc extends ApiFeature
  /** merge that preserves/sorts join keys like pandas. */
  case object SortedMergeKeys extends ApiFeature
  /** Column-specific named aggregation (pd.NamedAgg). */
  case object NamedAgg extends ApiFeature
  /** Series.isin against another computed Series. */
  case object SeriesIsin extends ApiFeature
  /** Multi-condition exists/not-exists rewrites over self-joins. */
  case object MultiCondExists extends ApiFeature
  /** groupby(...).nunique / count distinct per group. */
  case object GroupNUnique extends ApiFeature
  /** pivot_table reshape. */
  case object PivotTable extends ApiFeature
  /** User-defined aggregation functions in groupby.agg. */
  case object GroupUdfAgg extends ApiFeature
  /** groupby.apply with arbitrary cross-chunk functions. */
  case object GroupApplyArbitrary extends ApiFeature
  /** value_counts / computed-key groupby chains. */
  case object ComputedKeyGroupby extends ApiFeature
  /** pandas row-order / index preservation semantics across ops
    * (left-merge keeps left order, filtered frames keep their index, …). */
  case object OrderedIndexSemantics extends ApiFeature
}
