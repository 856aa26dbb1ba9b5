package repro.bench

import repro.baseline.Engines
import repro.tpch.{TpchCtx, TpchData, TpchQueries}
import repro.workloads.Census

/** Fig 9 as tables: the paper's ablation.
  *
  *  (a) dynamic tiling on/off on the merge-heavy queries Q2 (4 merges)
  *      and Q7 (most merges in our rewrite) — paper: 7.08× and 10.59×;
  *  (b) graph-level fusion on/off on Q7/Q8 — paper: 3.80× and 2.04×;
  *      operator-level fusion on/off — paper: ~16 % on feature chains.
  */
class AblationSuite extends BenchBase {

  private val sf = 0.01
  private val limit: Long = 2L << 20

  private def runQuery(id: Int, mk: () => repro.core.Engine): Double = {
    val tables = TpchData.tables(spark, sf)
    val e = mk()
    try {
      val ctx = TpchCtx(e, tables)
      time() { TpchQueries.byId(id).run(ctx).toDF().count() }
    } finally e.reset()
  }

  test("Fig 9a (table): dynamic tiling on/off (Q2, Q7)") {
    val rows = Seq(2, 7).map { id =>
      val on = runQuery(id, () => Engines.xorbits(spark, limit))
      val off = runQuery(id, () => Engines.noDynamic(spark, limit))
      Seq(s"Q$id", fmt(on), fmt(off), fmt(off / on),
        if (id == 2) "7.08x" else "10.59x")
    }
    printTable("Fig 9a (table) — dynamic tiling ablation",
      Seq("query", "dy on (s)", "dy off (s)", "speedup ours", "speedup paper"), rows)
    rows.foreach { r =>
      assert(r(3).toDouble > 1.0, s"${r.head}: dynamic tiling must speed up merge-heavy queries")
    }
  }

  test("Fig 9b (table): graph-level fusion on/off (Q7, Q8)") {
    val rows = Seq(7, 8).map { id =>
      val on = runQuery(id, () => Engines.xorbits(spark, limit))
      val off = runQuery(id, () => Engines.noGraphFusion(spark, limit))
      Seq(s"Q$id", fmt(on), fmt(off), fmt(off / on),
        if (id == 7) "3.80x" else "2.04x")
    }
    printTable("Fig 9b (table) — graph-level fusion ablation",
      Seq("query", "g on (s)", "g off (s)", "speedup ours", "speedup paper"), rows)
    rows.foreach { r =>
      assert(r(3).toDouble > 1.0, s"${r.head}: graph fusion must avoid materialization cost")
    }
  }

  test("Fig 9b (table): operator-level fusion on/off (census feature chain)") {
    val df = Census.input(spark, 0.03)
    df.count()
    def run(mk: () => repro.core.Engine): Double = {
      // Warm-up run on a throwaway engine so JIT / page-cache effects
      // don't bias whichever arm happens to run first.
      val w = mk()
      try Census.pipeline(w, df).toDF().count() finally w.reset()
      val e = mk()
      try time() { Census.pipeline(e, df).toDF().count() } finally e.reset()
    }
    val on = run(() => Engines.xorbits(spark, 2L << 20))
    val off = run(() => Engines.noOperatorFusion(spark, 2L << 20))
    printTable("Fig 9b (table) — operator-level fusion ablation",
      Seq("arm", "wall s", "speedup ours", "paper"),
      Seq(
        Seq("o on", fmt(on), fmt(off / on), "~1.16x"),
        Seq("o off", fmt(off), "1.00", "-")))
    assert(off / on > 0.7, "operator fusion must not regress")
  }

  test("combine stage bounds reducer fan-in (auto merge, §IV-C)") {
    val tables = TpchData.tables(spark, sf)
    def combines(mk: () => repro.core.Engine): (Long, Double) = {
      val e = mk()
      try {
        val ctx = TpchCtx(e, tables)
        val t = time() { TpchQueries.byId(1).run(ctx).toDF().count() }
        (e.stats.traces.flatMap(_.labels).count(_.startsWith("GroupbyAgg::combine")), t)
      } finally e.reset()
    }
    val (withCombine, tOn) = combines(() => Engines.xorbits(spark, 1L << 20))
    val (without, tOff) = combines(() => Engines.noCombine(spark, 1L << 20))
    printTable("combine-stage ablation (Q1)",
      Seq("arm", "combine nodes", "wall s"),
      Seq(Seq("combine on", withCombine.toString, fmt(tOn)),
        Seq("combine off", without.toString, fmt(tOff))))
    assert(withCombine > without)
  }
}
