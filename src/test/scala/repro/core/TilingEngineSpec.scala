package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.SynthData
import repro.core.AggSpec._

/** Engine-level behavior: chunking, dynamic tiling switches, auto reduce
  * selection, broadcast-vs-shuffle merges, iterative iloc, fusion and
  * storage accounting — each checked against plain-Spark references.
  */
class TilingEngineSpec extends SparkSpec {

  private def cfg(
      limit: Long = 64 << 10,
      dynamic: Boolean = true,
      graphFusion: Boolean = true,
      opFusion: Boolean = true,
  ) = EngineConfig(
    chunkSizeLimit = limit, dynamicTiling = dynamic, graphFusion = graphFusion,
    operatorFusion = opFusion, treeReduceThreshold = limit, broadcastThreshold = limit / 2)

  private def keys(n: Long) = SynthData.uniformKeys(spark, n, 40, seed = 5)

  private def assertSameSet(got: DataFrame, want: DataFrame): Unit = {
    def canon(df: DataFrame) =
      df.collect().map(_.toSeq.map {
        case d: Double => f"$d%.6f"
        case x         => String.valueOf(x)
      }.mkString("|")).sorted
    val g = canon(got); val w = canon(want)
    assert(g.sameElements(w), s"rows differ: got ${g.length}, want ${w.length}\n" +
      s"  got head: ${g.take(3).toVector}\n  want head: ${w.take(3).toVector}")
  }

  private def withEngine[T](c: EngineConfig)(f: Engine => T): T = {
    val e = new Engine(spark, c)
    try f(e) finally e.reset()
  }

  test("source tiles into ceil(bytes/limit) row-range chunks covering all rows") {
    withEngine(cfg()) { e =>
      val f = XFrame.source(e, "t", keys(20000)) // 20000 × 16 B = 312.5 KiB → 5 chunks
      assert(f.numChunks() == 5)
      assert(f.count() == 20000)
    }
  }

  test("tiny source is a single chunk") {
    withEngine(cfg()) { e =>
      val f = XFrame.source(e, "t", keys(10))
      assert(f.numChunks() == 1)
    }
  }

  test("deferred evaluation: graph construction executes nothing") {
    withEngine(cfg()) { e =>
      val f = XFrame.source(e, "t", keys(20000)).filter(col("v") > 0.5).withColumn("u", col("v") * 2)
      assert(e.stats.subtasksExecuted == 0, "narrow graph building must not execute")
      f.toDF().count()
      assert(e.stats.subtasksExecuted > 0)
    }
  }

  test("narrow filter matches the Spark reference") {
    withEngine(cfg()) { e =>
      val src = keys(20000)
      val got = XFrame.source(e, "t", src).filter(col("v") < 0.25).toDF()
      assertSameSet(got, src.filter(col("v") < 0.25))
    }
  }

  test("chunk metadata records exact per-chunk rows after a filter") {
    withEngine(cfg()) { e =>
      val src = keys(20000)
      val f = XFrame.source(e, "t", src).filter(col("v") < 0.25)
      val total = f.count()
      assert(total == src.filter(col("v") < 0.25).count())
    }
  }

  test("small aggregated size selects tree-reduce, with at least one tiling switch") {
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", keys(20000))
        .groupby("k").agg(SumAgg("v", "sv")).toDF()
      assert(e.stats.treeReduces == 1 && e.stats.shuffleReduces == 0)
      assert(e.stats.tileExecSwitches >= 1, "dynamic tiling must have yielded to execution")
      assertSameSet(got, keys(20000).groupBy("k").agg(sum("v") as "sv"))
    }
  }

  test("large aggregated size selects shuffle-reduce") {
    // Nearly-unique keys: aggregated size ≈ input size ≫ tree threshold.
    val src = SynthData.uniformKeys(spark, 20000, 1000000, seed = 6)
    withEngine(cfg(limit = 32 << 10)) { e =>
      val got = XFrame.source(e, "t", src).groupby("k").agg(SumAgg("v", "sv")).toDF()
      assert(e.stats.shuffleReduces == 1, s"expected shuffle-reduce: ${e.stats}")
      assertSameSet(got, src.groupBy("k").agg(sum("v") as "sv"))
    }
  }

  test("static planning always shuffle-reduces and never switches") {
    withEngine(cfg(dynamic = false)) { e =>
      val got = XFrame.source(e, "t", keys(20000)).groupby("k").agg(SumAgg("v", "sv")).toDF()
      assert(e.stats.shuffleReduces == 1 && e.stats.treeReduces == 0)
      assert(e.stats.tileExecSwitches == 0)
      assertSameSet(got, keys(20000).groupBy("k").agg(sum("v") as "sv"))
    }
  }

  test("global aggregate (no keys) tree-reduces in both modes") {
    for (dyn <- Seq(true, false)) {
      withEngine(cfg(dynamic = dyn)) { e =>
        val got = XFrame.source(e, "t", keys(20000)).groupby()
          .agg(SumAgg("v", "sv"), CountAgg("n")).toDF()
        assert(e.stats.treeReduces == 1, s"dyn=$dyn: ${e.stats}")
        assertSameSet(got, keys(20000).agg(sum("v") as "sv", count(lit(1)) as "n"))
      }
    }
  }

  test("combine stage bounds fan-in; disabling it flattens the tree") {
    val src = keys(40000) // ≥ 10 chunks at 64 KiB
    withEngine(cfg()) { e =>
      XFrame.source(e, "t", src).groupby("k").agg(SumAgg("v", "sv")).toDF()
      val combines = e.stats.traces.flatMap(_.labels).count(_.startsWith("GroupbyAgg::combine"))
      assert(combines > 1, "fan-in limit should create multiple combine nodes")
    }
    withEngine(EngineConfig(chunkSizeLimit = 64 << 10, combineStage = false,
      treeReduceThreshold = 64 << 10, broadcastThreshold = 32 << 10)) { e =>
      XFrame.source(e, "t", src).groupby("k").agg(SumAgg("v", "sv")).toDF()
      val combines = e.stats.traces.flatMap(_.labels).count(_.startsWith("GroupbyAgg::combine"))
      assert(combines == 1, "without the combine stage a single node merges everything")
    }
  }

  test("merge with a tiny side selects broadcast merge") {
    val big = keys(20000)
    val dim = spark.range(1, 41).select(col("id") as "k", (col("id") * 10) as "d")
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "big", big)
        .merge(XFrame.source(e, "dim", dim), Seq("k")).toDF()
      assert(e.stats.broadcastMerges == 1 && e.stats.shuffleMerges == 0, e.stats.toString)
      assertSameSet(got, big.join(dim, Seq("k")))
    }
  }

  test("merge of two large sides selects hash-shuffle merge") {
    val a = SynthData.uniformKeys(spark, 20000, 500, seed = 1)
    val b = SynthData.uniformKeys(spark, 20000, 500, seed = 2)
      .withColumnRenamed("v", "w")
    withEngine(cfg(limit = 32 << 10)) { e =>
      val got = XFrame.source(e, "a", a).merge(XFrame.source(e, "b", b), Seq("k")).toDF()
      assert(e.stats.shuffleMerges == 1 && e.stats.broadcastMerges == 0, e.stats.toString)
      assertSameSet(got, a.join(b, Seq("k")))
    }
  }

  test("static planning always hash-shuffles merges") {
    val big = keys(20000)
    val dim = spark.range(1, 41).select(col("id") as "k", (col("id") * 10) as "d")
    withEngine(cfg(dynamic = false)) { e =>
      val got = XFrame.source(e, "big", big)
        .merge(XFrame.source(e, "dim", dim), Seq("k")).toDF()
      assert(e.stats.shuffleMerges == 1 && e.stats.broadcastMerges == 0)
      assertSameSet(got, big.join(dim, Seq("k")))
    }
  }

  test("left / semi / anti merges match Spark") {
    val a = keys(5000)
    val dim = spark.range(1, 21).select(col("id") as "k", (col("id") * 10) as "d")
    for (how <- Seq("left", "leftsemi", "leftanti")) {
      withEngine(cfg()) { e =>
        val got = XFrame.source(e, "a", a).merge(XFrame.source(e, "dim", dim), Seq("k"), how).toDF()
        assertSameSet(got, a.join(dim, Seq("k"), how))
      }
    }
  }

  test("overlapping non-key columns get pandas-style _x/_y suffixes") {
    val a = keys(2000)
    val b = keys(100).withColumnRenamed("k", "kk").withColumnRenamed("v", "v")
      .select(col("kk") as "k", col("v"))
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "a", a).merge(XFrame.source(e, "b2", b), Seq("k")).toDF()
      assert(got.columns.sorted.sameElements(Array("k", "v_x", "v_y")))
    }
  }

  test("iloc on a filtered frame returns the exact positional row (Fig 3c)") {
    val src = keys(20000)
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", src).filter(col("v") < 0.3).iloc(10).toDF().collect()
      val want = src.filter(col("v") < 0.3).collect()(10)
      assert(got.length == 1)
      assert(got(0).toSeq == want.toSeq)
    }
  }

  test("iloc slice spans chunk boundaries correctly") {
    val src = keys(20000)
    withEngine(cfg()) { e =>
      val f = XFrame.source(e, "t", src).filter(col("v") < 0.5)
      val perChunkRows = f.count() // materializes chunks
      val got = XFrame.source(e, "t", src).filter(col("v") < 0.5)
        .ilocRange(3990, 4010).toDF().collect()
      val want = src.filter(col("v") < 0.5).collect().slice(3990, 4010)
      assert(got.map(_.toSeq).sameElements(want.map(_.toSeq)))
      assert(perChunkRows >= 4010)
    }
  }

  test("iloc past the end yields an empty frame") {
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", keys(100)).iloc(1000).toDF()
      assert(got.count() == 0)
    }
  }

  test("head returns the first n rows in order") {
    val src = keys(20000)
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", src).head(11).toDF().collect()
      val want = src.collect().take(11)
      assert(got.map(_.toSeq).sameElements(want.map(_.toSeq)))
    }
  }

  test("iloc requires dynamic tiling (static engines reject it, like Dask)") {
    withEngine(cfg(dynamic = false)) { e =>
      assertThrows[UnsupportedOperationException] {
        XFrame.source(e, "t", keys(100)).iloc(3).toDF()
      }
    }
  }

  test("sort produces globally ordered output split into chunks") {
    val src = keys(20000)
    withEngine(cfg()) { e =>
      val f = XFrame.source(e, "t", src).sortValues(Seq("v"), Seq(false))
      val got = f.toDF().collect().map(_.getDouble(1))
      assert(f.numChunks() > 1, "sorted result should re-split into chunks")
      assert(got.sameElements(got.sorted(Ordering[Double].reverse)))
    }
  }

  test("iloc after sort works (sort regenerates the distributed index)") {
    val src = keys(20000)
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", src).sortValues("v").iloc(5).toDF().collect()
      val want = src.orderBy("v").collect()(5)
      assert(got(0).getDouble(1) == want.getDouble(1))
    }
  }

  test("dropDuplicates matches Spark distinct") {
    val src = keys(20000).select(col("k"), (col("v") < 0.5) as "b")
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", src).dropDuplicates().toDF()
      assertSameSet(got, src.distinct())
    }
  }

  test("dropDuplicates with subset keeps one row per key") {
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "t", keys(20000)).dropDuplicates("k").toDF()
      assert(got.count() == 40)
      assert(got.select("k").distinct().count() == 40)
    }
  }

  test("concat unions chunks of both frames") {
    val a = keys(5000); val b = SynthData.uniformKeys(spark, 3000, 40, seed = 9)
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "a", a).concat(XFrame.source(e, "b", b)).toDF()
      assert(got.count() == 8000)
      assertSameSet(got, a.unionByName(b))
    }
  }

  test("pivot table matches Spark pivot") {
    val src = spark.range(2000).select(
      (col("id") % 7) as "r",
      element_at(array(lit("a"), lit("b"), lit("c")), (col("id") % 3 + 1).cast("int")) as "c",
      (col("id") % 100).cast("double") as "v")
    withEngine(cfg()) { e =>
      val got = XFrame.source(e, "p", src).pivotTable("r", "c", "v", "sum").toDF()
      assertSameSet(got, src.groupBy("r").pivot("c").sum("v"))
    }
  }

  test("graph fusion materializes far fewer chunks than no fusion") {
    val src = keys(20000)
    def run(graphFusion: Boolean): Long =
      withEngine(cfg(graphFusion = graphFusion)) { e =>
        XFrame.source(e, "t", src).filter(col("v") > 0.1)
          .withColumn("u", col("v") * 2).filter(col("u") < 1.5)
          .groupby("k").agg(SumAgg("u", "su")).toDF().count()
        e.stats.chunksMaterialized
      }
    val fused = run(true); val unfused = run(false)
    assert(fused < unfused, s"fusion should store fewer chunks ($fused vs $unfused)")
  }

  test("operator fusion collapses narrow chains (stats + equivalence)") {
    val src = keys(20000)
    val expect = src.filter(col("v") > 0.1).withColumn("u", col("v") * 2)
      .filter(col("u") < 1.5).withColumn("w", col("u") + 1)
      .collect().map(_.toSeq.toString).sorted
    def run(opFusion: Boolean): (Long, Array[String]) =
      withEngine(cfg(opFusion = opFusion)) { e =>
        val got = XFrame.source(e, "t", src).filter(col("v") > 0.1)
          .withColumn("u", col("v") * 2).filter(col("u") < 1.5)
          .withColumn("w", col("u") + 1).toDF()
          .collect().map(_.toSeq.toString).sorted
        (e.stats.narrowStepsFused, got)
      }
    val (fusedSteps, gotFused) = run(true)
    val (unfusedSteps, gotUnfused) = run(false)
    assert(fusedSteps > 0 && unfusedSteps == 0)
    assert(gotFused.sameElements(expect))
    assert(gotUnfused.sameElements(expect))
  }

  test("subtask traces record band assignments across all bands") {
    withEngine(cfg()) { e =>
      XFrame.source(e, "t", keys(40000)).groupby("k").agg(SumAgg("v", "sv")).toDF()
      val bands = e.stats.traces.map(_.band).toSet
      assert(bands.size > 1, "work should spread over multiple bands")
      assert(bands.forall(b => b >= 0 && b < e.config.numBands))
    }
  }

  test("locality-aware scheduling keeps most reads band-local") {
    withEngine(cfg()) { e =>
      XFrame.source(e, "t", keys(40000)).filter(col("v") > 0.2)
        .groupby("k").agg(SumAgg("v", "sv")).toDF()
      assert(e.stats.remoteBytes <= e.stats.traces.map(_.inputBytes).sum)
    }
  }

  test("op outputs are recorded in the meta service for profiling") {
    withEngine(cfg()) { e =>
      XFrame.source(e, "t", keys(20000)).groupby("k").agg(SumAgg("v", "sv")).toDF()
      assert(e.stats.opOutputs.nonEmpty)
      val aggOut = e.stats.opOutputs.find(_._1.contains("GroupbyAgg")).map(_._2)
      assert(aggOut.exists(_._1 == 40), s"40 groups expected: ${e.stats.opOutputs}")
    }
  }

  test("reset clears storage and allows reuse of the engine's session") {
    val e = new Engine(spark, cfg())
    XFrame.source(e, "t", keys(1000)).toDF().count()
    e.reset()
    assert(e.storage.stats.memBytes == 0)
  }
}
