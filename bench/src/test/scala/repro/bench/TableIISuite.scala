package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.sim.FrameworkModel

/** Paper Table II: reasons frameworks fail on TPC-H SF1000. */
class TableIISuite extends AnyFunSuite {

  private val paper: Map[(String, String), Int] = Map(
    ("PySpark", "API Compatibility") -> 3, ("Dask", "API Compatibility") -> 0,
    ("Modin", "API Compatibility") -> 0,
    ("PySpark", "Hang") -> 0, ("Dask", "Hang") -> 2, ("Modin", "Hang") -> 0,
    ("PySpark", "OOM or Killed") -> 1, ("Dask", "OOM or Killed") -> 3,
    ("Modin", "OOM or Killed") -> 22,
    ("PySpark", "Total") -> 4, ("Dask", "Total") -> 5, ("Modin", "Total") -> 22,
  )

  test("Table II: failure reasons at SF1000 (paper vs measured)") {
    val measured = FrameworkModel.tableII()
    val reasons = Vector("API Compatibility", "Hang", "OOM or Killed", "Total")
    val rows = reasons.map { r =>
      Seq(r) ++ Vector("PySpark", "Dask", "Modin").flatMap { fw =>
        Seq(paper((fw, r)).toString, measured((fw, r)).toString)
      }
    }
    new BenchPrinter().printTable(
      "Table II — reasons for SF1000 failures (paper | ours)",
      Seq("reason", "PySpark paper", "PySpark ours", "Dask paper", "Dask ours",
        "Modin paper", "Modin ours"),
      rows)
    paper.foreach { case (k, want) => assert(measured(k) == want, k.toString) }
  }
}
