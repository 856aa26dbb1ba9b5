package repro.fusion

import repro.core.{ChunkGraph, ChunkTask}

/** A subtask: a fused subgraph of chunk tasks scheduled as one unit on
  * one band (paper §III-C "Subtask Graph").
  *
  * @param id    subtask id (first member task's id)
  * @param tasks member tasks in topological order
  */
final case class Subtask(id: Long, tasks: Vector[ChunkTask]) {
  def taskIds: Set[Long] = tasks.map(_.id).toSet
  /** External input tasks (producers outside this subtask). */
  def externalInputs: Vector[ChunkTask] = {
    val ids = taskIds
    tasks.flatMap(_.inputs).filterNot(t => ids.contains(t.id)).distinctBy(_.id)
  }
}

/** Builds the subtask graph from a chunk-task subgraph. */
object SubtaskGraph {

  /** Fuse `tasks` (a closed subgraph: inputs either inside or already
    * materialized) into subtasks via the coloring algorithm. When
    * `graphFusion` is false every task becomes its own subtask.
    */
  def build(tasks: Vector[ChunkTask], graphFusion: Boolean): Vector[Subtask] = {
    val topo = ChunkGraph.topoSort(tasks)
    if (!graphFusion) return topo.map(t => Subtask(t.id, Vector(t)))
    val inSet = topo.map(_.id).toSet
    val succ = ChunkGraph.successors(topo)
    val groups = Coloring.fuse[ChunkTask](
      topo,
      t => t.inputs.filter(i => inSet.contains(i.id)),
      t => succ(t.id),
    )
    groups.map(g => Subtask(g.head.id, ChunkGraph.topoSort(g)))
  }

  /** Subtask-level predecessor map (by subtask id), restricted to the
    * given subtasks; materialized inputs are not included.
    */
  def preds(subtasks: Vector[Subtask]): Map[Long, Vector[Long]] = {
    val owner: Map[Long, Long] =
      subtasks.flatMap(st => st.tasks.map(t => t.id -> st.id)).toMap
    subtasks.map { st =>
      val ps = st.externalInputs.flatMap(t => owner.get(t.id)).distinct
      st.id -> ps
    }.toMap
  }

  /** Topological order of subtasks (inputs first). */
  def topoOrder(subtasks: Vector[Subtask]): Vector[Subtask] = {
    val p = preds(subtasks)
    val byId = subtasks.map(st => st.id -> st).toMap
    val indeg = scala.collection.mutable.Map[Long, Int]()
    val succ = scala.collection.mutable.Map[Long, Vector[Long]]().withDefaultValue(Vector.empty)
    subtasks.foreach { st =>
      indeg(st.id) = p(st.id).size
      p(st.id).foreach(q => succ(q) = succ(q) :+ st.id)
    }
    val queue = scala.collection.mutable.Queue[Long](subtasks.map(_.id).filter(indeg(_) == 0): _*)
    val out = Vector.newBuilder[Subtask]
    while (queue.nonEmpty) {
      val id = queue.dequeue(); out += byId(id)
      succ(id).foreach { s => indeg(s) -= 1; if (indeg(s) == 0) queue.enqueue(s) }
    }
    val res = out.result()
    require(res.size == subtasks.size, "cycle in subtask graph")
    res
  }
}
