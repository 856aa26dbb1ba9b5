package repro.core

import org.apache.spark.sql.DataFrame

/** A node of the chunk graph (paper §III-C): one operator application
  * producing one output chunk.
  *
  * Circles in the paper's figures are these tasks; squares (chunks) are
  * the tasks' outputs, identified by the task id in the storage service.
  *
  * @param id      unique id within an engine (also the storage key)
  * @param label   human-readable operator label, e.g. "GroupbyAgg::map"
  * @param stage   map-combine-reduce stage of the task
  * @param index   distributed index (r, c): position of the output chunk
  *                in the logical dataframe (paper Fig 4)
  * @param inputs  upstream tasks whose output chunks this task consumes
  * @param compute pure Catalyst fragment: input chunk DataFrames →
  *                output chunk DataFrame (lazy; materialization happens
  *                only through the storage service)
  * @param narrow  set iff the task is a narrow pipeline (enables
  *                operator-level fusion across adjacent narrow tasks)
  */
final class ChunkTask(
    val id: Long,
    val label: String,
    val stage: Stage,
    val index: (Int, Int),
    val inputs: Vector[ChunkTask],
    val compute: Seq[DataFrame] => DataFrame,
    val narrow: Option[NarrowPipe] = None,
) {
  override def toString: String = s"ChunkTask($id, $label, $stage, $index)"
  override def hashCode(): Int = id.hashCode()
  override def equals(o: Any): Boolean = o match {
    case t: ChunkTask => t.id == id
    case _            => false
  }
}

/** Graph utilities over sets of chunk tasks. */
object ChunkGraph {

  /** All tasks reachable from `targets` through `inputs`, stopping at
    * (and excluding) tasks for which `isMaterialized` holds — those are
    * already chunks in the storage service.
    */
  def closure(targets: Seq[ChunkTask], isMaterialized: ChunkTask => Boolean): Vector[ChunkTask] = {
    val seen = scala.collection.mutable.LinkedHashSet[ChunkTask]()
    def visit(t: ChunkTask): Unit =
      if (!isMaterialized(t) && !seen.contains(t)) {
        seen += t
        t.inputs.foreach(visit)
      }
    targets.foreach(visit)
    seen.toVector
  }

  /** Topological order (inputs before consumers) of a task set; inputs
    * outside the set are treated as satisfied.
    */
  def topoSort(tasks: Vector[ChunkTask]): Vector[ChunkTask] = {
    val inSet = tasks.map(_.id).toSet
    val indeg = scala.collection.mutable.Map[Long, Int]()
    val succs = scala.collection.mutable.Map[Long, Vector[ChunkTask]]().withDefaultValue(Vector.empty)
    tasks.foreach { t =>
      val ins = t.inputs.filter(i => inSet.contains(i.id))
      indeg(t.id) = ins.size
      ins.foreach(i => succs(i.id) = succs(i.id) :+ t)
    }
    // Stable: seed queue in given order, FIFO.
    val queue = scala.collection.mutable.Queue[ChunkTask](tasks.filter(t => indeg(t.id) == 0): _*)
    val out = Vector.newBuilder[ChunkTask]
    var n = 0
    while (queue.nonEmpty) {
      val t = queue.dequeue(); out += t; n += 1
      succs(t.id).foreach { s =>
        indeg(s.id) -= 1
        if (indeg(s.id) == 0) queue.enqueue(s)
      }
    }
    require(n == tasks.size, s"cycle detected in chunk graph ($n of ${tasks.size} ordered)")
    out.result()
  }

  /** Successor map restricted to the given task set. */
  def successors(tasks: Vector[ChunkTask]): Map[Long, Vector[ChunkTask]] = {
    val inSet = tasks.map(_.id).toSet
    val m = scala.collection.mutable.Map[Long, Vector[ChunkTask]]().withDefaultValue(Vector.empty)
    tasks.foreach { t =>
      t.inputs.foreach { i => if (inSet.contains(i.id)) m(i.id) = m(i.id) :+ t }
    }
    m.toMap.withDefaultValue(Vector.empty)
  }
}
