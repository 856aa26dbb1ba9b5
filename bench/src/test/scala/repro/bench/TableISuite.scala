package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.sim.FrameworkModel

/** Paper Table I: number of failed TPC-H queries per framework at
  * SF 10 / 100 / 1000, reproduced from the analytic framework models
  * over the per-query descriptors (see DESIGN.md §3 for the
  * substitution and EXPERIMENTS.md for calibration notes).
  */
class TableISuite extends AnyFunSuite {

  private val paper: Map[(String, Double), Int] = Map(
    ("pandas", 10.0) -> 0, ("pandas", 100.0) -> 17, ("pandas", 1000.0) -> 22,
    ("PySpark", 10.0) -> 3, ("PySpark", 100.0) -> 3, ("PySpark", 1000.0) -> 4,
    ("Dask", 10.0) -> 1, ("Dask", 100.0) -> 1, ("Dask", 1000.0) -> 5,
    ("Modin", 10.0) -> 0, ("Modin", 100.0) -> 1, ("Modin", 1000.0) -> 22,
  )

  test("Table I: failed queries per framework per SF (paper vs measured)") {
    val measured = FrameworkModel.tableI()
    val fws = Vector("pandas", "PySpark", "Dask", "Modin", "Xorbits")
    val rows = fws.map { fw =>
      Seq(fw) ++ Seq(10.0, 100.0, 1000.0).flatMap { sf =>
        val p = if (fw == "Xorbits") "0*" else paper((fw, sf)).toString
        Seq(p, measured((fw, sf)).toString)
      }
    }
    new BenchPrinter().printTable(
      "Table I — failed TPC-H queries (paper | ours)",
      Seq("framework", "SF10 paper", "SF10 ours", "SF100 paper", "SF100 ours",
        "SF1000 paper", "SF1000 ours"),
      rows)
    paper.foreach { case ((fw, sf), want) =>
      assert(measured((fw, sf)) == want, s"$fw@SF$sf")
    }
    Seq(10.0, 100.0, 1000.0).foreach(sf => assert(measured(("Xorbits", sf)) == 0))
  }

  test("per-query failure detail at SF1000") {
    import repro.sim.FrameworkModel._
    val rows = repro.sim.QueryDescs.all.map { d =>
      Seq(s"Q${d.id}") ++ Vector(Pandas, PySparkF, DaskF, ModinF, XorbitsF)
        .map(fw => FrameworkModel.outcome(fw, d, 1000).toString)
    }
    new BenchPrinter().printTable(
      "Table I detail — per-query outcome at SF1000",
      Seq("query", "pandas", "PySpark", "Dask", "Modin", "Xorbits"),
      rows)
    succeed
  }
}

/** Printer for non-Spark suites (BenchBase requires a session). */
final class BenchPrinter {
  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val out = new StringBuilder
    out.append(s"\n==== $title ====\n")
    out.append(header.mkString("| ", " | ", " |")).append('\n')
    out.append(header.map(_ => "---").mkString("| ", " | ", " |")).append('\n')
    rows.foreach(r => out.append(r.mkString("| ", " | ", " |")).append('\n'))
    println(out.result())
  }
}
