package repro.sim

import repro.core.SubtaskTrace

/** Replay-based memory/makespan simulator over engine subtask traces.
  *
  * The engine records, per executed subtask, its band, input/output and
  * remote (cross-band) bytes, and wall time. Scaling those traces lets
  * us project peak per-band memory and makespan at cluster sizes and
  * data scales the local box cannot hold — the quantitative backbone of
  * the Xorbits row of Tables I/II and the weak-scaling projections.
  */
object MemorySimulator {

  final case class SimResult(
      peakBytesPerBand: Map[Int, Long],
      peakBytes: Long,
      makespanMs: Double,
      totalRemoteBytes: Long,
  ) {
    def oom(capacityBytes: Long): Boolean = peakBytes > capacityBytes
  }

  /** Replay traces in order: a subtask holds inputs + output live while
    * running; its output stays resident on its band afterwards (the
    * storage service). `scale` multiplies all byte figures (projecting a
    * larger SF); `bandwidthBytesPerMs` converts remote bytes to time.
    *
    * Per-band busy time accumulates subtask wall time + transfer time;
    * makespan = max over bands (bands run concurrently).
    */
  def simulate(
      traces: Seq[SubtaskTrace],
      scale: Double = 1.0,
      bandwidthBytesPerMs: Double = 1e6,
  ): SimResult = {
    val resident = scala.collection.mutable.Map[Int, Long]().withDefaultValue(0L)
    val busy = scala.collection.mutable.Map[Int, Double]().withDefaultValue(0.0)
    var peak = 0L
    val peakPerBand = scala.collection.mutable.Map[Int, Long]().withDefaultValue(0L)
    var remote = 0L
    traces.foreach { t =>
      val in = (t.inputBytes * scale).toLong
      val out = (t.outputBytes * scale).toLong
      val rem = (t.remoteBytes * scale).toLong
      val live = resident(t.band) + in + out
      peakPerBand(t.band) = math.max(peakPerBand(t.band), live)
      peak = math.max(peak, live)
      resident(t.band) += out
      remote += rem
      busy(t.band) += t.wallMs * scale + rem / bandwidthBytesPerMs
    }
    SimResult(peakPerBand.toMap, peak, if (busy.isEmpty) 0.0 else busy.values.max, remote)
  }

  /** Project the same trace onto `bands` bands (round-robin reassignment)
    * — the weak/strong-scaling estimate used by the array benchmarks.
    */
  def projectBands(traces: Seq[SubtaskTrace], bands: Int): Seq[SubtaskTrace] =
    traces.zipWithIndex.map { case (t, i) => t.copy(band = i % bands) }
}
