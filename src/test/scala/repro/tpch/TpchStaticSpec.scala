package repro.tpch

import repro.{Oracle, SparkSpec}
import repro.baseline.Engines

/** The static-planning (baseline/ablation) engine must stay *correct* —
  * only slower and memory-fragile — so a subset of queries re-runs with
  * dynamic tiling disabled and is oracle-checked.
  */
class TpchStaticSpec extends SparkSpec {

  private val sf = 0.003
  private lazy val engine = Engines.static(spark, chunkLimit = 512 << 10)
  private lazy val tables = TpchData.tables(spark, sf)
  private lazy val ctx = TpchCtx(engine, tables)

  // A representative subset: scan-agg, dimension join, semi join, global
  // agg, left join + double groupby, scalar subqueries.
  private val subset = Seq(1, 3, 4, 6, 13, 14)

  subset.foreach { id =>
    val q = TpchQueries.byId(id)
    test(s"Q$id (${q.name}) is correct under static planning") {
      val got = q.run(ctx).toDF()
      val used = tables.view.filterKeys(q.tables.contains).toMap.toSeq
      Oracle.assertEquivalentApprox(got, TpchData.fullSql(q, tables), used)
    }
  }

  test("static planning never switched between tiling and execution") {
    assert(engine.stats.tileExecSwitches == 0)
  }

  test("static planning never chose broadcast merges") {
    assert(engine.stats.broadcastMerges == 0)
    assert(engine.stats.shuffleMerges > 0)
  }
}
