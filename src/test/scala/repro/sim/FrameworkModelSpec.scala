package repro.sim

import org.scalatest.funsuite.AnyFunSuite

import repro.sim.FrameworkModel._
import repro.sim.Outcome._

/** The analytic framework models must reproduce the paper's Tables I
  * and II cell-for-cell (see EXPERIMENTS.md for the calibration notes).
  */
class FrameworkModelSpec extends AnyFunSuite {

  private val tI = FrameworkModel.tableI()

  test("Table I: pandas fails 0 / 17 / 22") {
    assert(tI(("pandas", 10.0)) == 0)
    assert(tI(("pandas", 100.0)) == 17)
    assert(tI(("pandas", 1000.0)) == 22)
  }

  test("Table I: PySpark fails 3 / 3 / 4") {
    assert(tI(("PySpark", 10.0)) == 3)
    assert(tI(("PySpark", 100.0)) == 3)
    assert(tI(("PySpark", 1000.0)) == 4)
  }

  test("Table I: Dask fails 1 / 1 / 5") {
    assert(tI(("Dask", 10.0)) == 1)
    assert(tI(("Dask", 100.0)) == 1)
    assert(tI(("Dask", 1000.0)) == 5)
  }

  test("Table I: Modin fails 0 / 1 / 22") {
    assert(tI(("Modin", 10.0)) == 0)
    assert(tI(("Modin", 100.0)) == 1)
    assert(tI(("Modin", 1000.0)) == 22)
  }

  test("Table I: Xorbits fails 0 everywhere") {
    Seq(10.0, 100.0, 1000.0).foreach(sf => assert(tI(("Xorbits", sf)) == 0))
  }

  private val tII = FrameworkModel.tableII()

  test("Table II: PySpark = 3 API, 0 hang, 1 OOM, total 4") {
    assert(tII(("PySpark", "API Compatibility")) == 3)
    assert(tII(("PySpark", "Hang")) == 0)
    assert(tII(("PySpark", "OOM or Killed")) == 1)
    assert(tII(("PySpark", "Total")) == 4)
  }

  test("Table II: Dask = 0 API, 2 hang, 3 OOM, total 5") {
    assert(tII(("Dask", "API Compatibility")) == 0)
    assert(tII(("Dask", "Hang")) == 2)
    assert(tII(("Dask", "OOM or Killed")) == 3)
    assert(tII(("Dask", "Total")) == 5)
  }

  test("Table II: Modin = 22 OOM") {
    assert(tII(("Modin", "API Compatibility")) == 0)
    assert(tII(("Modin", "Hang")) == 0)
    assert(tII(("Modin", "OOM or Killed")) == 22)
    assert(tII(("Modin", "Total")) == 22)
  }

  test("pandas SF100 failures are exactly the lineitem-touching queries") {
    val failing = QueryDescs.all
      .filter(d => Outcome.failed(FrameworkModel.outcome(Pandas, d, 100)))
      .map(_.id).toSet
    val lineitemQs = QueryDescs.all.filter(_.tables.contains("lineitem")).map(_.id).toSet
    assert(failing == lineitemQs)
    assert(failing.size == 17)
  }

  test("PySpark API failures are the NamedAgg / isin / exists queries (13, 21, 22)") {
    val api = QueryDescs.all
      .filter(d => FrameworkModel.outcome(PySparkF, d, 10) == ApiFail).map(_.id).toSet
    assert(api == Set(13, 21, 22))
  }

  test("Dask SF1000 OOMs are the giant tree-reduce / disk-overflow queries") {
    val oom = QueryDescs.all
      .filter(d => FrameworkModel.outcome(DaskF, d, 1000) == OomKilled).map(_.id).toSet
    assert(oom == Set(9, 18, 21))
  }

  test("Dask SF1000 hangs are the heaviest multi-join shuffles") {
    val hang = QueryDescs.all
      .filter(d => FrameworkModel.outcome(DaskF, d, 1000) == Hang).map(_.id).toSet
    assert(hang == Set(7, 8))
  }

  test("Modin SF100 single failure is the lineitem self-join (Q21)") {
    val fails = QueryDescs.all
      .filter(d => Outcome.failed(FrameworkModel.outcome(ModinF, d, 100))).map(_.id)
    assert(fails == Vector(21))
  }

  test("failures are monotone in scale factor for every framework") {
    for (fw <- FrameworkModel.allFrameworks) {
      val f10 = tI((fw.name, 10.0)); val f100 = tI((fw.name, 100.0)); val f1000 = tI((fw.name, 1000.0))
      assert(f10 <= f100 && f100 <= f1000, s"${fw.name}: $f10/$f100/$f1000")
    }
  }

  test("descriptors exist for all 22 queries with consistent feature tags") {
    assert(QueryDescs.all.map(_.id).sorted == (1 to 22).toVector)
    // Feature tags must agree with the TPC-H-lite implementations.
    import repro.tpch.TpchQueries
    TpchQueries.all.foreach { q =>
      val d = QueryDescs.byId(q.id)
      assert(d.features == q.features, s"Q${q.id}: desc ${d.features} vs impl ${q.features}")
      assert(d.tables.subsetOf(q.tables ++ Set("nation", "region")),
        s"Q${q.id}: descriptor tables ${d.tables} not within impl tables ${q.tables}")
    }
  }

  test("touchedGb grows linearly in SF") {
    val d = QueryDescs.byId(1)
    assert(math.abs(d.touchedGb(100) - 10 * d.touchedGb(10)) < 1e-9)
  }
}
