package repro.baseline

import org.apache.spark.sql.SparkSession

import repro.core.{Engine, EngineConfig}

/** Named engine configurations: the full Xorbits-style engine plus the
  * baseline planning models and the ablation arms (paper §VI-B/D).
  *
  * All variants share the same chunk-task machinery — only planning
  * differs — so timing comparisons isolate the paper's contributions:
  * dynamic tiling, graph-level fusion, operator-level fusion, and the
  * combine stage.
  */
object Engines {

  /** Full engine (dynamic tiling + both fusion levels + combine). */
  def xorbits(spark: SparkSession, chunkLimit: Long = 8L << 20): Engine =
    new Engine(spark, EngineConfig(chunkSizeLimit = chunkLimit,
      treeReduceThreshold = chunkLimit, broadcastThreshold = chunkLimit / 2))

  /** Static planner (Dask/Modin-like): partitioning fixed at graph
    * construction from initial source sizes; always hash-shuffle with a
    * fixed reducer count; no broadcast detection; iloc unsupported.
    */
  def static(spark: SparkSession, chunkLimit: Long = 8L << 20, reducers: Int = 8): Engine =
    new Engine(spark, EngineConfig(chunkSizeLimit = chunkLimit,
      treeReduceThreshold = chunkLimit, broadcastThreshold = chunkLimit / 2,
      dynamicTiling = false, staticReducers = reducers))

  /** Single-chunk engine (pandas-like): no partitioning at all. */
  def singleNode(spark: SparkSession): Engine =
    new Engine(spark, EngineConfig(chunkSizeLimit = Long.MaxValue / 4))

  /** Ablation arm: dynamic tiling disabled, fusion kept. */
  def noDynamic(spark: SparkSession, chunkLimit: Long = 8L << 20): Engine =
    static(spark, chunkLimit)

  /** Ablation arm: graph-level fusion disabled. */
  def noGraphFusion(spark: SparkSession, chunkLimit: Long = 8L << 20): Engine =
    new Engine(spark, EngineConfig(chunkSizeLimit = chunkLimit,
      treeReduceThreshold = chunkLimit, broadcastThreshold = chunkLimit / 2,
      graphFusion = false))

  /** Ablation arm: operator-level fusion disabled. */
  def noOperatorFusion(spark: SparkSession, chunkLimit: Long = 8L << 20): Engine =
    new Engine(spark, EngineConfig(chunkSizeLimit = chunkLimit,
      treeReduceThreshold = chunkLimit, broadcastThreshold = chunkLimit / 2,
      operatorFusion = false))

  /** Ablation arm: no combine stage (plain MapReduce tree). */
  def noCombine(spark: SparkSession, chunkLimit: Long = 8L << 20): Engine =
    new Engine(spark, EngineConfig(chunkSizeLimit = chunkLimit,
      treeReduceThreshold = chunkLimit, broadcastThreshold = chunkLimit / 2,
      combineStage = false))
}
