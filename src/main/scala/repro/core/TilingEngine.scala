package repro.core

import java.util.concurrent.atomic.AtomicLong
import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType
import org.apache.spark.storage.{StorageLevel => SparkLevel}

import repro.fusion.{Subtask, SubtaskGraph}
import repro.sched.Scheduler
import repro.storage.StorageService

/** Result of tiling one tileable operator (the paper's `tile` method).
  *
  * `NeedExec` is the Scala rendering of the paper's `yield` (§IV-B,
  * Fig 5): tiling pauses, hands the engine the chunk tasks whose
  * metadata it needs, and resumes — possibly yielding again — once they
  * have been executed and their metadata recorded in the meta service.
  */
sealed trait TileResult
object TileResult {
  final case class Tiled(chunks: Vector[ChunkTask]) extends TileResult
  final case class NeedExec(targets: Vector[ChunkTask], resume: () => TileResult) extends TileResult
}

/** The Xorbits-style execution engine: dynamic tiling, graph/operator
  * fusion, band scheduling, and an intermediate storage service — layered
  * over a single SparkSession whose Catalyst engine plays the role of the
  * single-node backend (pandas in the paper).
  */
final class Engine(val spark: SparkSession, val config: EngineConfig) {
  import TileResult._
  import TileableOp._

  val storage = new StorageService(spark, config.memoryBudget)
  val scheduler = new Scheduler(config.workers, config.bandsPerWorker)
  val stats = new EngineStats

  private val idGen = new AtomicLong(0)
  private val tiledCache = new java.util.IdentityHashMap[Tileable, Vector[ChunkTask]]()
  private val materialized = mutable.Set[Long]()
  private val sourceCache = mutable.LinkedHashMap[String, (DataFrame, Long)]()
  /** Tiling-order label → output tasks (for per-operator profiling). */
  private val opChunks = mutable.LinkedHashMap[String, Vector[ChunkTask]]()

  // ---------------------------------------------------------------------
  // Task construction
  // ---------------------------------------------------------------------

  private def task(
      label: String,
      stage: Stage,
      index: (Int, Int),
      inputs: Vector[ChunkTask],
      compute: Seq[DataFrame] => DataFrame,
      narrow: Option[NarrowPipe] = None,
  ): ChunkTask = new ChunkTask(idGen.incrementAndGet(), label, stage, index, inputs, compute, narrow)

  private def keyOf(t: ChunkTask): String = s"c${t.id}"

  /** Metadata of a materialized task's chunk, if available (meta service). */
  def metaOf(t: ChunkTask): Option[ChunkMeta] = storage.meta(keyOf(t))

  def isMaterialized(t: ChunkTask): Boolean = materialized.contains(t.id)

  // ---------------------------------------------------------------------
  // Tiling (graph construction), with dynamic switches to execution
  // ---------------------------------------------------------------------

  /** Tile a tileable node into its output chunk tasks, running the
    * dynamic tiling loop: whenever the operator's `tile` yields
    * `NeedExec`, the engine executes those chunks, records their
    * metadata, and resumes tiling.
    */
  def tile(t: Tileable): Vector[ChunkTask] = {
    val cached = tiledCache.get(t)
    if (cached != null) return cached
    val inputChunks = t.inputs.map(tile)
    var step = tileOp(t.op, inputChunks)
    var guard = 0
    while (step.isInstanceOf[NeedExec] && guard < 10000) {
      guard += 1
      val ne = step.asInstanceOf[NeedExec]
      val pending = ne.targets.filterNot(isMaterialized)
      if (pending.nonEmpty) {
        stats.tileExecSwitches += 1
        execute(pending)
      }
      step = ne.resume()
    }
    val chunks = step.asInstanceOf[Tiled].chunks
    tiledCache.put(t, chunks)
    opChunks(f"${opChunks.size}%03d:${t.op.name}") = chunks
    chunks
  }

  private def tileOp(op: TileableOp, ins: Vector[Vector[ChunkTask]]): TileResult = op match {
    case s: SourceOp   => tileSource(s)
    case n: NarrowOp   => tileNarrow(n, ins.head)
    case g: GroupAggOp => tileGroupAgg(g, ins.head)
    case m: MergeOp    => tileMerge(m, ins(0), ins(1))
    case i: ILocOp     => tileILoc(i, ins.head)
    case h: HeadOp     => tileILoc(ILocOp(0, h.nRows), ins.head)
    case s: SortOp     => tileSort(s, ins.head)
    case d: DistinctOp => tileDistinct(d, ins.head)
    case _: ConcatOp   => Tiled(reindexChunks(ins.flatten))
    case p: PivotOp    => tilePivot(p, ins.head)
  }

  /** Renumber the chunk row-index (r) of a concatenated chunk list. */
  private def reindexChunks(chunks: Vector[ChunkTask]): Vector[ChunkTask] =
    chunks.zipWithIndex.map { case (c, r) =>
      task(s"Concat[$r]", Stage.Other, (r, 0), Vector(c), dfs => dfs.head)
    }

  // -- Source ------------------------------------------------------------

  private def tileSource(s: SourceOp): TileResult = {
    val (indexed, rows) = sourceCache.getOrElseUpdate(s.sourceName, {
      val schema = s.df.schema.add(Cols.RowId, LongType, nullable = false)
      val rdd = s.df.rdd.zipWithIndex().map { case (r, i) => Row.fromSeq(r.toSeq :+ i) }
      val ind = spark.createDataFrame(rdd, schema).persist(SparkLevel.MEMORY_AND_DISK)
      (ind, ind.count())
    })
    val bytes = rows * SchemaBytes.rowWidth(s.df.schema)
    val nChunks = math.max(1L, (bytes + config.chunkSizeLimit - 1) / config.chunkSizeLimit).toInt
    val per = math.max(1L, (rows + nChunks - 1) / nChunks)
    val chunks = (0 until nChunks).toVector.flatMap { r =>
      val lo = r * per; val hi = math.min(rows, lo + per)
      if (lo >= hi && r > 0) None
      else Some(task(s"Read(${s.sourceName})[$r]", Stage.Source, (r, 0), Vector.empty,
        _ => indexed.filter(col(Cols.RowId) >= lo && col(Cols.RowId) < hi)))
    }
    Tiled(chunks)
  }

  // -- Narrow ------------------------------------------------------------

  private def tileNarrow(nop: NarrowOp, ins: Vector[ChunkTask]): TileResult =
    Tiled(ins.zipWithIndex.map { case (c, r) =>
      task(s"${nop.label}[$r]", Stage.Narrow, (r, 0), Vector(c),
        dfs => nop.pipe(dfs.head, fused = config.operatorFusion),
        narrow = Some(nop.pipe))
    })

  // -- GroupbyAgg: map → (combine)* → reduce, auto reduce selection ------

  private def tileGroupAgg(g: GroupAggOp, ins: Vector[ChunkTask]): TileResult = {
    val keys = g.keys

    val mapTasks = ins.zipWithIndex.map { case (c, r) =>
      task(s"GroupbyAgg::map[$r]", Stage.Map, (r, 0), Vector(c), dfs => {
        val exprs = AggSpec.mapExprs(g.aggs)
        dfs.head.drop(Cols.RowId).groupBy(keys.map(col): _*).agg(exprs.head, exprs.tail: _*)
      })
    }

    def finalize(df: DataFrame): DataFrame = df.select(AggSpec.finalExprs(keys, g.aggs): _*)
    def mergeAgg(dfs: Seq[DataFrame]): DataFrame = {
      val exprs = AggSpec.mergeExprs(g.aggs)
      dfs.reduce(_ unionByName _).groupBy(keys.map(col): _*).agg(exprs.head, exprs.tail: _*)
    }

    def treeReduce(): Vector[ChunkTask] = {
      stats.treeReduces += 1
      var level = mapTasks
      var depth = 0
      // Auto merge (§IV-C): concatenate map outputs up to the fan-in
      // limit per combine node until one chunk remains.
      while (level.size > 1) {
        depth += 1
        val fanIn = if (config.combineStage) config.combineFanIn else level.size
        level = level.grouped(fanIn).toVector.zipWithIndex.map { case (grp, r) =>
          if (grp.size == 1) grp.head
          else task(s"GroupbyAgg::combine$depth[$r]", Stage.Combine, (r, 0), grp, mergeAgg)
        }
      }
      Vector(task("GroupbyAgg::agg[0]", Stage.Reduce, (0, 0), level, dfs => finalize(
        if (level.head.stage == Stage.Map) mergeAgg(dfs) else dfs.head)))
    }

    def shuffleReduce(nReducers: Int): Vector[ChunkTask] = {
      stats.shuffleReduces += 1
      val r = math.max(2, nReducers)
      val buckets = mapTasks.map { m =>
        (0 until r).toVector.map { b =>
          task(s"GroupbyAgg::bucket[${m.index._1},$b]", Stage.Map, (b, 0), Vector(m),
            dfs => dfs.head.filter(pmod(hash(keys.map(col): _*), lit(r)) === b))
        }
      }
      (0 until r).toVector.map { b =>
        task(s"GroupbyAgg::agg[$b]", Stage.Reduce, (b, 0), buckets.map(_(b)),
          dfs => finalize(mergeAgg(dfs)))
      }
    }

    if (keys.isEmpty) {
      // Global aggregate: nothing to bucket on — always tree-reduce.
      Tiled(treeReduce())
    } else if (!config.dynamicTiling) {
      // Static planning: reducer count fixed from the initial chunk count.
      Tiled(shuffleReduce(math.min(config.staticReducers, math.max(2, ins.size))))
    } else {
      // Dynamic tiling: run the first few map chunks, read their actual
      // aggregated size from the meta service, then pick the reduce plan.
      val sample = mapTasks.take(math.min(config.sampleChunks, mapTasks.size))
      NeedExec(sample, () => {
        val metas = sample.flatMap(metaOf)
        val avgBytes = if (metas.isEmpty) 0.0 else metas.map(_.bytes).sum.toDouble / metas.size
        val estTotal = (avgBytes * mapTasks.size).toLong
        if (estTotal <= config.treeReduceThreshold) Tiled(treeReduce())
        else {
          val r = (estTotal / math.max(1L, config.chunkSizeLimit)).toInt + 1
          Tiled(shuffleReduce(math.min(math.max(2, r), 64)))
        }
      })
    }
  }

  // -- Merge: broadcast vs hash-shuffle, auto skew avoidance -------------

  private def tileMerge(m: MergeOp, left: Vector[ChunkTask], right: Vector[ChunkTask]): TileResult = {
    val on = m.on

    def joinCompute(l: DataFrame, r: DataFrame): DataFrame = {
      val lu = l.drop(Cols.RowId); val ru = r.drop(Cols.RowId)
      if (m.how == "cross") return lu.crossJoin(ru)
      val overlap = (lu.columns.toSet intersect ru.columns.toSet) -- on.toSet
      val lr = overlap.foldLeft(lu)((d, c) => d.withColumnRenamed(c, s"${c}_x"))
      val rr = overlap.foldLeft(ru)((d, c) => d.withColumnRenamed(c, s"${c}_y"))
      lr.join(rr, on, m.how)
    }

    def broadcastMerge(big: Vector[ChunkTask], small: Vector[ChunkTask], smallLeft: Boolean): Vector[ChunkTask] = {
      stats.broadcastMerges += 1
      val concatSmall =
        if (small.size == 1) small.head
        else task("Merge::concatSmall[0]", Stage.Other, (0, 0), small, dfs => dfs.reduce(_ unionByName _))
      big.zipWithIndex.map { case (b, r) =>
        task(s"Merge::join[$r]", Stage.Reduce, (r, 0), Vector(b, concatSmall),
          dfs => if (smallLeft) joinCompute(dfs(1), dfs(0)) else joinCompute(dfs(0), dfs(1)))
      }
    }

    def shuffleMerge(nReducers: Int): Vector[ChunkTask] = {
      stats.shuffleMerges += 1
      val r = math.max(2, nReducers)
      def bucketSide(side: Vector[ChunkTask], tag: String) = side.map { c =>
        (0 until r).toVector.map { b =>
          task(s"Merge::bucket$tag[${c.index._1},$b]", Stage.Map, (b, 0), Vector(c),
            dfs => dfs.head.filter(pmod(hash(on.map(col): _*), lit(r)) === b))
        }
      }
      val lb = bucketSide(left, "L"); val rb = bucketSide(right, "R")
      val nl = left.size
      (0 until r).toVector.map { b =>
        val inputsB = lb.map(_(b)) ++ rb.map(_(b))
        task(s"Merge::join[$b]", Stage.Reduce, (b, 0), inputsB, dfs => {
          val l = dfs.take(nl).map(_.drop(Cols.RowId)).reduce(_ unionByName _)
          val rr = dfs.drop(nl).map(_.drop(Cols.RowId)).reduce(_ unionByName _)
          joinCompute(l, rr)
        })
      }
    }

    if (m.how == "cross")
      return Tiled(broadcastMerge(left, right, smallLeft = false))

    if (!config.dynamicTiling) {
      // Static planning: always hash-shuffle, R from initial chunk counts.
      Tiled(shuffleMerge(math.min(config.staticReducers, math.max(2, math.max(left.size, right.size)))))
    } else {
      val sample = left.take(config.sampleChunks) ++ right.take(config.sampleChunks)
      NeedExec(sample, () => {
        def estSide(side: Vector[ChunkTask]): Long = {
          val ms = side.take(config.sampleChunks).flatMap(metaOf)
          if (ms.isEmpty) Long.MaxValue
          else (ms.map(_.bytes).sum.toDouble / ms.size * side.size).toLong
        }
        val el = estSide(left); val er = estSide(right)
        if (config.measureSkew) recordMergeSkew(s"Merge(${on.mkString(",")})", left.take(config.sampleChunks), on)
        // Broadcasting the LEFT side is only sound for inner joins: for
        // left/leftsemi/leftanti the output must stay partitioned by the
        // left chunks (each right chunk would otherwise see a partial
        // right table and duplicate or drop left rows).
        val canBroadcastLeft = m.how == "inner" && el <= config.broadcastThreshold
        if (er <= config.broadcastThreshold && (er <= el || !canBroadcastLeft)) {
          Tiled(broadcastMerge(left, right, smallLeft = false))
        } else if (canBroadcastLeft) {
          Tiled(broadcastMerge(right, left, smallLeft = true))
        } else {
          val r = ((el + er) / math.max(1L, config.chunkSizeLimit)).toInt + 1
          Tiled(shuffleMerge(math.min(math.max(2, r), 64)))
        }
      })
    }
  }

  /** Hot-key share observed on sampled merge inputs (profiling mode). */
  private def recordMergeSkew(label: String, sample: Seq[ChunkTask], keys: Seq[String]): Unit = {
    val dfs = sample.filter(isMaterialized).map(t => storage.get(keyOf(t), 0))
    if (dfs.nonEmpty) {
      val df = dfs.reduce(_ unionByName _)
      val total = df.count().toDouble
      if (total > 0) {
        val hot = df.groupBy(keys.map(col): _*).count().agg(max("count")).head().getLong(0)
        stats.skewObs(label) = hot / total
      }
    }
  }

  // -- ILoc / Head: iterative tiling (paper Fig 3c) ----------------------

  private def tileILoc(i: ILocOp, ins: Vector[ChunkTask]): TileResult = {
    if (!config.dynamicTiling)
      throw new UnsupportedOperationException(
        "iloc/head requires dynamic tiling (static engines cannot position rows)")
    NeedExec(ins, () => {
      val counts = ins.map(t => metaOf(t).map(_.rows).getOrElse(0L))
      val offsets = counts.scanLeft(0L)(_ + _)
      val lo = i.start; val hi = i.start + i.count
      val out = Vector.newBuilder[ChunkTask]
      var r = 0
      ins.indices.foreach { j =>
        val cLo = offsets(j); val cHi = offsets(j + 1)
        val s = math.max(lo, cLo); val e = math.min(hi, cHi)
        if (s < e) {
          val localLo = s - cLo; val localHi = e - cLo
          val idx = r; r += 1
          if (localLo == 0 && localHi == (cHi - cLo)) {
            out += task(s"ILoc::pass[$idx]", Stage.Other, (idx, 0), Vector(ins(j)), dfs => dfs.head)
          } else {
            out += task(s"ILoc::slice[$idx]", Stage.Other, (idx, 0), Vector(ins(j)), dfs => {
              val df = dfs.head
              require(df.columns.contains(Cols.RowId),
                "iloc requires ordered lineage (sort_values first after shuffles)")
              val w = Window.orderBy(col(Cols.RowId))
              df.withColumn("__rn", row_number().over(w))
                .filter(col("__rn") > localLo && col("__rn") <= localHi)
                .drop("__rn")
            })
          }
        }
      }
      val chunks = out.result()
      if (chunks.nonEmpty) Tiled(chunks)
      else Tiled(Vector(task("ILoc::empty[0]", Stage.Other, (0, 0), Vector(ins.head),
        dfs => dfs.head.limit(0))))
    })
  }

  // -- Sort: concat → global sort → reindex → resplit --------------------

  private def tileSort(s: SortOp, ins: Vector[ChunkTask]): TileResult = {
    val sortCols = s.by.zip(s.ascending).map { case (c, asc) => if (asc) col(c).asc else col(c).desc }
    val sorted = task("Sort::global[0]", Stage.Reduce, (0, 0), ins, dfs => {
      val all = dfs.map(_.drop(Cols.RowId)).reduce(_ unionByName _)
      Reindex.withRowId(all.orderBy(sortCols: _*))
    })
    NeedExec(Vector(sorted), () => {
      val meta = metaOf(sorted).get
      val nChunks = math.max(1L, meta.bytes / math.max(1L, config.chunkSizeLimit) + 1).toInt
      if (nChunks <= 1) Tiled(Vector(sorted))
      else {
        val per = math.max(1L, (meta.rows + nChunks - 1) / nChunks)
        val chunks = (0 until nChunks).toVector.flatMap { r =>
          val lo = r * per; val hi = math.min(meta.rows, lo + per)
          if (lo >= hi) None
          else Some(task(s"Sort::split[$r]", Stage.Other, (r, 0), Vector(sorted),
            dfs => dfs.head.filter(col(Cols.RowId) >= lo && col(Cols.RowId) < hi)))
        }
        Tiled(chunks)
      }
    })
  }

  // -- Distinct ----------------------------------------------------------

  private def tileDistinct(d: DistinctOp, ins: Vector[ChunkTask]): TileResult = {
    def dedup(df: DataFrame): DataFrame = {
      val u = df.drop(Cols.RowId)
      if (d.subset.isEmpty) u.dropDuplicates() else u.dropDuplicates(d.subset)
    }
    // Per-chunk pre-dedup (map), then bucketed global dedup (reduce).
    val mapTasks = ins.zipWithIndex.map { case (c, r) =>
      task(s"Distinct::map[$r]", Stage.Map, (r, 0), Vector(c), dfs => dedup(dfs.head))
    }
    if (mapTasks.size == 1) return Tiled(mapTasks)
    val r = math.max(2, math.min(ins.size, config.staticReducers))
    val buckets = mapTasks.map { mt =>
      (0 until r).toVector.map { b =>
        task(s"Distinct::bucket[${mt.index._1},$b]", Stage.Map, (b, 0), Vector(mt), dfs => {
          val df = dfs.head
          val cols0 = if (d.subset.isEmpty) df.columns.toSeq.filterNot(_ == Cols.RowId) else d.subset
          df.filter(pmod(hash(cols0.map(col): _*), lit(r)) === b)
        })
      }
    }
    Tiled((0 until r).toVector.map { b =>
      task(s"Distinct::agg[$b]", Stage.Reduce, (b, 0), buckets.map(_(b)),
        dfs => dedup(dfs.reduce(_ unionByName _)))
    })
  }

  // -- Pivot: non-relational reshape, single output chunk ----------------

  private def tilePivot(p: PivotOp, ins: Vector[ChunkTask]): TileResult =
    Tiled(Vector(task("Pivot[0]", Stage.Reduce, (0, 0), ins, dfs => {
      val all = dfs.map(_.drop(Cols.RowId)).reduce(_ unionByName _)
      val g = all.groupBy(col(p.index)).pivot(p.columns)
      p.aggfunc match {
        case "sum"   => g.sum(p.values)
        case "mean"  => g.avg(p.values)
        case "count" => g.count()
        case "min"   => g.min(p.values)
        case "max"   => g.max(p.values)
        case other   => throw new UnsupportedOperationException(s"pivot aggfunc $other")
      }
    })))

  // ---------------------------------------------------------------------
  // Execution: fuse → schedule → run subtasks → store exposed chunks
  // ---------------------------------------------------------------------

  /** Execute (materialize) the given chunk tasks plus everything they
    * transitively need that is not already in the storage service.
    */
  def execute(targets: Seq[ChunkTask]): Unit = {
    val need = ChunkGraph.closure(targets, isMaterialized)
    if (need.isEmpty) return
    val topo = ChunkGraph.topoSort(need)
    val subtasks = SubtaskGraph.build(topo, config.graphFusion)
    stats.tasksFusedAway += (topo.size - subtasks.size)

    val order = SubtaskGraph.topoOrder(subtasks)
    val predMap = SubtaskGraph.preds(subtasks)
    val stById = subtasks.map(st => st.id -> st).toMap
    val owner: Map[Long, Long] = subtasks.flatMap(st => st.tasks.map(t => t.id -> st.id)).toMap

    val bands = scheduler.assign(
      order.map(_.id),
      id => predMap(id).isEmpty && stById(id).externalInputs.isEmpty,
      id => stById(id).externalInputs.map { t =>
        val bytes = metaOf(t).map(_.bytes).getOrElse(1L)
        owner.get(t.id) match {
          case Some(sid) => (Right(sid): Either[Int, Long], bytes)
          case None      => (Left(storage.bandOf(keyOf(t)).getOrElse(0)): Either[Int, Long], bytes)
        }
      },
    )

    val targetIds = targets.map(_.id).toSet
    val succAll = ChunkGraph.successors(topo)
    order.foreach(st => runSubtask(st, bands(st.id), targetIds, succAll))
    recordOpOutputs()
  }

  private def runSubtask(
      st: Subtask,
      band: Int,
      targetIds: Set[Long],
      succAll: Map[Long, Vector[ChunkTask]],
  ): Unit = {
    val t0 = System.nanoTime()
    val inSt = st.taskIds
    val local = mutable.Map[Long, DataFrame]()
    var inputBytes = 0L
    var remoteBytes = 0L

    def dfOf(t: ChunkTask): DataFrame =
      local.getOrElse(t.id, {
        val bytes = metaOf(t).map(_.bytes).getOrElse(0L)
        inputBytes += bytes
        if (!storage.bandOf(keyOf(t)).contains(band)) remoteBytes += bytes
        storage.get(keyOf(t), band)
      })

    // Operator-level fusion: collapse chains of narrow tasks inside the
    // subtask into one composed pipe, so Catalyst sees a single
    // projection/filter instead of a chain of intermediate plans.
    val skip = mutable.Set[Long]()
    val effPipe = mutable.Map[Long, NarrowPipe]()
    val effIns = mutable.Map[Long, Vector[ChunkTask]]()
    if (config.operatorFusion) {
      st.tasks.foreach { t =>
        t.narrow.foreach { p =>
          var pipe = p
          var ins = t.inputs
          if (t.inputs.size == 1) {
            val in = t.inputs.head
            if (inSt.contains(in.id) && effPipe.contains(in.id) && !targetIds.contains(in.id) &&
                succAll(in.id).size == 1) {
              skip += in.id
              stats.narrowStepsFused += effPipe(in.id).steps.size
              pipe = effPipe(in.id) ++ p
              ins = effIns(in.id)
            }
          }
          effPipe(t.id) = pipe
          effIns(t.id) = ins
        }
      }
    }

    // Execution plan: which tasks run, their effective inputs, and how
    // many internal consumers each output has. A fused subtask must
    // compute each member ONCE (the paper's subtask semantics): outputs
    // consumed by several internal tasks — e.g. a map feeding its R
    // bucket splits — are pinned with a one-shot Spark persist, since
    // chunk fragments are lazy plans that would otherwise recompute.
    val execTasks = st.tasks.filterNot(t => skip.contains(t.id))
    def effInputs(t: ChunkTask): Vector[ChunkTask] =
      if (config.operatorFusion && effIns.contains(t.id)) effIns(t.id) else t.inputs
    val internalUses = mutable.Map[Long, Int]().withDefaultValue(0)
    execTasks.foreach(t => effInputs(t).foreach { i =>
      if (inSt.contains(i.id)) internalUses(i.id) += 1
    })

    var outputBytes = 0L
    val temps = mutable.ArrayBuffer[DataFrame]()
    execTasks.foreach { t =>
      val out =
        if (config.operatorFusion && effPipe.contains(t.id))
          effPipe(t.id)(dfOf(effInputs(t).head), fused = true)
        else t.compute(t.inputs.map(dfOf))
      local(t.id) = out
      stats.tasksExecuted += 1
      // Store exposed outputs immediately (targets, or chunks consumed
      // outside this subtask) so downstream internal consumers reuse the
      // materialized chunk instead of recomputing the plan.
      val exposed = targetIds.contains(t.id) || succAll(t.id).exists(s => !inSt.contains(s.id))
      if (exposed && !isMaterialized(t)) {
        val meta = storage.put(keyOf(t), out, band)
        materialized += t.id
        stats.chunksMaterialized += 1
        stats.bytesMaterialized += meta.bytes
        outputBytes += meta.bytes
      } else if (internalUses(t.id) > 1) {
        out.persist(SparkLevel.MEMORY_AND_DISK)
        temps += out
      }
    }
    temps.foreach(_.unpersist(false))
    stats.subtasksExecuted += 1
    stats.traces += SubtaskTrace(
      st.id, st.tasks.map(_.label), band, inputBytes, outputBytes, remoteBytes,
      (System.nanoTime() - t0) / 1e6)
  }

  private def recordOpOutputs(): Unit =
    opChunks.foreach { case (label, chunks) =>
      if (!stats.opOutputs.contains(label) && chunks.forall(isMaterialized)) {
        val ms = chunks.flatMap(metaOf)
        stats.recordOpOutput(label, ms.map(_.rows).sum, ms.map(_.bytes).sum)
      }
    }

  // ---------------------------------------------------------------------
  // Collection (deferred evaluation endpoint)
  // ---------------------------------------------------------------------

  /** Tile + execute + concatenate the tileable's chunks in row order.
    * This is the paper's deferred-evaluation trigger (`__repr__`).
    */
  def collect(t: Tileable): DataFrame = {
    val chunks = tile(t)
    execute(chunks)
    val dfs = chunks.sortBy(_.index).map(c => storage.get(keyOf(c), 0))
    val all = dfs.reduce(_ unionByName _)
    if (all.columns.contains(Cols.RowId)) all.drop(Cols.RowId) else all
  }

  /** Total rows of the tileable from chunk metadata alone. */
  def countRows(t: Tileable): Long = {
    val chunks = tile(t)
    execute(chunks)
    chunks.flatMap(metaOf).map(_.rows).sum
  }

  /** Number of output chunks the tileable tiles into. */
  def numChunks(t: Tileable): Int = tile(t).size

  /** Drop all cached state (chunks, sources, tiling cache). */
  def reset(): Unit = {
    storage.reset()
    sourceCache.values.foreach(_._1.unpersist(true))
    sourceCache.clear()
    tiledCache.clear()
    materialized.clear()
    opChunks.clear()
  }
}

/** Row-id regeneration for order-producing operators (sort). */
object Reindex {

  /** Append a fresh global `__rowid` following the DataFrame's current
    * (partition-major) order.
    */
  def withRowId(df: DataFrame): DataFrame = {
    val base = if (df.columns.contains(Cols.RowId)) df.drop(Cols.RowId) else df
    val schema = base.schema.add(Cols.RowId, LongType, nullable = false)
    val rdd = base.rdd.zipWithIndex().map { case (r, i) => Row.fromSeq(r.toSeq :+ i) }
    base.sparkSession.createDataFrame(rdd, schema)
  }
}
