package repro.core

/** Engine configuration.
  *
  * The flags mirror the paper's ablation axes (§VI-D) and the planning
  * differences between Xorbits and the baseline frameworks:
  *
  *  - `dynamicTiling = false` reproduces static (graph-construction-time)
  *    partitioning: fixed reducer counts derived from initial source
  *    sizes, no broadcast detection, no iterative tiling (iloc fails) —
  *    the Dask/Modin planning model and the "dy off" ablation arm;
  *  - `graphFusion = false` materializes every chunk task through the
  *    storage service (no subtask fusion) — the "g off" arm;
  *  - `operatorFusion = false` applies narrow steps one Catalyst op at a
  *    time instead of compiling them into one projection — the "o off" arm;
  *  - `combineStage = false` drops the pre-aggregation level from
  *    tree-reduce (plain MapReduce).
  */
final case class EngineConfig(
    /** Upper bound for one chunk's estimated bytes (paper's chunk size limit). */
    chunkSizeLimit: Long = 8L << 20,
    dynamicTiling: Boolean = true,
    graphFusion: Boolean = true,
    operatorFusion: Boolean = true,
    combineStage: Boolean = true,
    /** Aggregated-size threshold below which tree-reduce is selected. */
    treeReduceThreshold: Long = 8L << 20,
    /** Side-size threshold below which a merge side is broadcast. */
    broadcastThreshold: Long = 4L << 20,
    /** Fan-in of one combine node (auto-merge also caps by bytes). */
    combineFanIn: Int = 4,
    /** Number of chunks executed eagerly to collect metadata (§IV-B). */
    sampleChunks: Int = 2,
    /** Fixed reducer count used when dynamicTiling = false. */
    staticReducers: Int = 8,
    /** Simulated cluster topology: workers × bands (NUMA slots) per worker. */
    workers: Int = 4,
    bandsPerWorker: Int = 2,
    /** Memory-tier budget of the storage service before spilling to disk. */
    memoryBudget: Long = 1L << 30,
    /** Record key-skew observations during sampling (profiling runs). */
    measureSkew: Boolean = false,
) {
  def numBands: Int = workers * bandsPerWorker
}
