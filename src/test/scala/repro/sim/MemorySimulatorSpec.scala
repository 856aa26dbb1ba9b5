package repro.sim

import org.scalatest.funsuite.AnyFunSuite

import repro.core.SubtaskTrace

class MemorySimulatorSpec extends AnyFunSuite {

  private def t(id: Long, band: Int, in: Long, out: Long, remote: Long = 0, ms: Double = 10.0) =
    SubtaskTrace(id, Seq(s"t$id"), band, in, out, remote, ms)

  test("peak tracks inputs + outputs plus resident chunks") {
    val res = MemorySimulator.simulate(Seq(
      t(1, 0, in = 0, out = 100),
      t(2, 0, in = 100, out = 50)))
    // second subtask: resident 100 + in 100 + out 50 = 250
    assert(res.peakBytes == 250)
  }

  test("bands accumulate independently") {
    val res = MemorySimulator.simulate(Seq(
      t(1, 0, 0, 100), t(2, 1, 0, 100), t(3, 0, 100, 10)))
    assert(res.peakBytesPerBand(1) == 100)
    assert(res.peakBytesPerBand(0) == 210)
  }

  test("scale multiplies byte figures") {
    val base = MemorySimulator.simulate(Seq(t(1, 0, 0, 100)))
    val scaled = MemorySimulator.simulate(Seq(t(1, 0, 0, 100)), scale = 10)
    assert(scaled.peakBytes == 10 * base.peakBytes)
  }

  test("oom check against a capacity") {
    val res = MemorySimulator.simulate(Seq(t(1, 0, 0, 100)))
    assert(res.oom(50))
    assert(!res.oom(150))
  }

  test("makespan is the max busy band, not the sum") {
    val res = MemorySimulator.simulate(Seq(
      t(1, 0, 0, 10, ms = 100), t(2, 1, 0, 10, ms = 40)))
    assert(res.makespanMs == 100.0)
  }

  test("remote bytes add transfer time") {
    val noRemote = MemorySimulator.simulate(Seq(t(1, 0, 100, 10, remote = 0, ms = 10)))
    val remote = MemorySimulator.simulate(
      Seq(t(1, 0, 100, 10, remote = 1000000, ms = 10)), bandwidthBytesPerMs = 1e5)
    assert(remote.makespanMs > noRemote.makespanMs)
    assert(remote.totalRemoteBytes == 1000000)
  }

  test("projectBands redistributes work round-robin") {
    val traces = (1L to 8L).map(i => t(i, 0, 0, 10, ms = 10))
    val p = MemorySimulator.projectBands(traces, 4)
    assert(p.map(_.band).toSet == Set(0, 1, 2, 3))
    val res = MemorySimulator.simulate(p)
    assert(res.makespanMs == 20.0, "8 × 10ms over 4 bands = 20ms")
  }

  test("more bands shorten the projected makespan") {
    val traces = (1L to 16L).map(i => t(i, 0, 0, 10, ms = 10))
    val one = MemorySimulator.simulate(MemorySimulator.projectBands(traces, 1)).makespanMs
    val four = MemorySimulator.simulate(MemorySimulator.projectBands(traces, 4)).makespanMs
    assert(one == 4 * four)
  }

  test("empty trace simulates to zeros") {
    val res = MemorySimulator.simulate(Seq.empty)
    assert(res.peakBytes == 0 && res.makespanMs == 0.0)
  }
}
