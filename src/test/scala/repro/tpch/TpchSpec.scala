package repro.tpch

import repro.{Oracle, SparkSpec}
import repro.core.{Engine, EngineConfig}

/** All 22 TPC-H-lite queries, executed through the dynamic-tiling engine
  * and oracle-checked against DuckDB running the equivalent SQL over the
  * same synthetic inputs.
  */
class TpchSpec extends SparkSpec {

  private val sf = 0.004
  private lazy val engine = new Engine(spark, EngineConfig(
    chunkSizeLimit = 512 << 10, treeReduceThreshold = 512 << 10,
    broadcastThreshold = 256 << 10))
  private lazy val tables = TpchData.tables(spark, sf)
  private lazy val ctx = TpchCtx(engine, tables)

  TpchQueries.all.foreach { q =>
    test(s"Q${q.id} (${q.name}) matches DuckDB") {
      val got = q.run(ctx).toDF()
      val used = tables.view.filterKeys(q.tables.contains).toMap.toSeq
      Oracle.assertEquivalentApprox(got, TpchData.fullSql(q, tables), used)
    }
  }

  test("queries exercise dynamic tiling (yield happened at least once)") {
    assert(engine.stats.tileExecSwitches > 0)
  }

  test("both reduce strategies were selected across the suite") {
    assert(engine.stats.treeReduces > 0, "some small aggregations should tree-reduce")
  }

  test("broadcast merges were selected for dimension joins") {
    assert(engine.stats.broadcastMerges > 0)
  }
}
