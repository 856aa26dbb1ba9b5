package repro.core

import scala.collection.mutable

/** Trace of one executed subtask, consumed by the memory simulator and
  * the locality statistics.
  *
  * @param band        band the subtask ran on
  * @param inputBytes  bytes read from the storage service
  * @param outputBytes bytes written to the storage service
  * @param remoteBytes input bytes whose producing band differed (simulated
  *                    network transfer)
  * @param wallMs      measured wall time of the subtask
  */
final case class SubtaskTrace(
    subtaskId: Long,
    labels: Seq[String],
    band: Int,
    inputBytes: Long,
    outputBytes: Long,
    remoteBytes: Long,
    wallMs: Double,
)

/** Mutable counters collected by one engine instance. */
final class EngineStats {
  /** Tiling ↔ execution switches (the paper's `yield` count). */
  var tileExecSwitches: Long = 0
  var subtasksExecuted: Long = 0
  var tasksExecuted: Long = 0
  var chunksMaterialized: Long = 0
  var bytesMaterialized: Long = 0
  /** Narrow plan nodes removed by operator-level fusion. */
  var narrowStepsFused: Long = 0
  /** Chunk tasks merged away by graph-level fusion. */
  var tasksFusedAway: Long = 0
  var treeReduces: Long = 0
  var shuffleReduces: Long = 0
  var broadcastMerges: Long = 0
  var shuffleMerges: Long = 0
  val traces: mutable.ArrayBuffer[SubtaskTrace] = mutable.ArrayBuffer.empty
  /** Per-tileable-operator output totals (label → (rows, bytes)). */
  val opOutputs: mutable.LinkedHashMap[String, (Long, Long)] = mutable.LinkedHashMap.empty
  /** Max observed key share per shuffle operator label (profiling mode). */
  val skewObs: mutable.LinkedHashMap[String, Double] = mutable.LinkedHashMap.empty

  def remoteBytes: Long = traces.map(_.remoteBytes).sum
  def localBytes: Long = traces.map(t => t.inputBytes - t.remoteBytes).sum

  def recordOpOutput(label: String, rows: Long, bytes: Long): Unit = {
    val (r0, b0) = opOutputs.getOrElse(label, (0L, 0L))
    opOutputs(label) = (r0 + rows, b0 + bytes)
  }

  override def toString: String =
    s"EngineStats(switches=$tileExecSwitches, subtasks=$subtasksExecuted, " +
      s"materialized=$chunksMaterialized/${bytesMaterialized}B, fusedNarrow=$narrowStepsFused, " +
      s"fusedTasks=$tasksFusedAway, tree=$treeReduces, shuffle=$shuffleReduces, " +
      s"bcast=$broadcastMerges, shufMerge=$shuffleMerges, remote=${remoteBytes}B)"
}
