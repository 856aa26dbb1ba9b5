package repro.bench

import repro.baseline.Engines
import repro.core.Engine
import repro.sim.MemorySimulator
import repro.workloads.{Census, Plasticc, Uc10}

/** Fig 8a as a table: end-to-end DS-pipeline wall time, dynamic-tiling
  * engine vs the static-planning baseline, plus the cluster-scale
  * projection of the skew case that drives the paper's 29×/37× claim.
  */
class PipelineSuite extends BenchBase {

  private val sf = 0.03
  private val limit: Long = 2L << 20

  private def run(name: String, mk: () => Engine)(pipeline: Engine => Long): (Double, Engine) = {
    val e = mk()
    val t = time() { pipeline(e) }
    (t, e)
  }

  test("Fig 8a (table): UC10 skew join — dynamic vs static") {
    val in = Uc10.inputs(spark, sf, nCustomers = 2000)
    in.transactions.count(); in.customers.count() // warm the generators

    val (tx, ex) = run("xorbits", () => Engines.xorbits(spark, limit)) { e =>
      Uc10.pipeline(e, in).toDF().count()
    }
    val exStats = ex.stats
    val exTraces = ex.stats.traces.toVector
    ex.reset()
    val (ts, es) = run("static", () => Engines.static(spark, limit)) { e =>
      Uc10.pipeline(e, in).toDF().count()
    }
    val stStats = es.stats
    val stTraces = es.stats.traces.toVector
    es.reset()

    val speedup = ts / tx
    // Cluster-scale projection: same traces replayed on 64 bands at the
    // paper's data scale (34 GB ≈ 470× our input).
    val projX = MemorySimulator.simulate(MemorySimulator.projectBands(exTraces, 64), scale = 1.0)
    val projS = MemorySimulator.simulate(MemorySimulator.projectBands(stTraces, 64), scale = 1.0)

    printTable("Fig 8a (table) — TPCx-AI UC10 skew join",
      Seq("engine", "wall s", "merges", "chunks stored", "bytes stored MB", "speedup vs static"),
      Seq(
        Seq("Xorbits (dynamic)", fmt(tx), s"bcast=${exStats.broadcastMerges}",
          exStats.chunksMaterialized.toString, fmt(exStats.bytesMaterialized / 1e6), fmt(speedup)),
        Seq("static baseline", fmt(ts), s"shuffle=${stStats.shuffleMerges}",
          stStats.chunksMaterialized.toString, fmt(stStats.bytesMaterialized / 1e6), "1.00"),
      ))
    println(f"paper: Xorbits 29x faster than Dask, 37x faster than Modin on UC10")
    println(f"projected 64-band makespan: xorbits=${projX.makespanMs}%.0f ms static=${projS.makespanMs}%.0f ms")

    assert(exStats.broadcastMerges == 1, "dynamic engine must broadcast the tiny side")
    assert(stStats.shuffleMerges == 1, "static engine must shuffle")
    assert(stStats.bytesMaterialized > exStats.bytesMaterialized,
      "static shuffle must move/store more bytes (the OOM driver at scale)")
    assert(speedup > 1.0, f"dynamic tiling should win on the skew join (got $speedup%.2f)")
  }

  test("Fig 8a (table): census pipeline — dynamic vs static") {
    val df = Census.input(spark, sf)
    df.count()
    val (tx, ex) = run("xorbits", () => Engines.xorbits(spark, limit)) { e =>
      Census.pipeline(e, df).toDF().count()
    }
    val fusedSteps = ex.stats.narrowStepsFused
    ex.reset()
    val (ts, es) = run("static", () => Engines.static(spark, limit)) { e =>
      Census.pipeline(e, df).toDF().count()
    }
    es.reset()
    printTable("Fig 8a (table) — census pipeline",
      Seq("engine", "wall s", "narrow steps fused", "speedup vs static"),
      Seq(
        Seq("Xorbits (dynamic)", fmt(tx), fusedSteps.toString, fmt(ts / tx)),
        Seq("static baseline", fmt(ts), "-", "1.00")))
    println("paper: Xorbits 2.65x over the fastest baseline (Modin) on census")
    assert(fusedSteps > 0)
    assert(ts / tx > 0.5, "dynamic engine must stay competitive")
  }

  test("Fig 8a (table): plasticc pipeline — dynamic vs static") {
    val df = Plasticc.input(spark, sf)
    df.count()
    val (tx, ex) = run("xorbits", () => Engines.xorbits(spark, limit)) { e =>
      Plasticc.pipeline(e, df).toDF().count()
    }
    ex.reset()
    val (ts, es) = run("static", () => Engines.static(spark, limit)) { e =>
      Plasticc.pipeline(e, df).toDF().count()
    }
    es.reset()
    printTable("Fig 8a (table) — plasticc pipeline",
      Seq("engine", "wall s", "speedup vs static"),
      Seq(
        Seq("Xorbits (dynamic)", fmt(tx), fmt(ts / tx)),
        Seq("static baseline", fmt(ts), "1.00")))
    println("paper: Xorbits 3.86x over PySpark on plasticc")
    assert(ts / tx > 0.5)
  }
}
