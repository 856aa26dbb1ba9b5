package repro.bench

import repro.SparkSpec

/** Shared helpers for the per-table benchmark suites.
  *
  * Benchmarks assert *shape* (who wins, monotonicity, exact simulator
  * cells) rather than absolute times; the printed tables are the
  * paper-vs-measured record that EXPERIMENTS.md carries.
  */
trait BenchBase extends SparkSpec {

  // Benchmarks run thousands of small per-chunk Spark jobs; 64 shuffle
  // partitions per KB-sized chunk job is pure scheduler overhead. The
  // bench JVM is separate from the unit-test JVM, so this only affects
  // benchmark timing realism, not the correctness suites.
  spark.conf.set("spark.sql.shuffle.partitions", "16")

  /** Wall-time one action in seconds (median of `reps`). */
  def time[T](reps: Int = 1)(f: => T): Double = {
    val times = (1 to reps).map { _ =>
      val t0 = System.nanoTime()
      f
      (System.nanoTime() - t0) / 1e9
    }
    times.sorted.apply(times.size / 2)
  }

  /** Print a markdown table with a marker the harness can grep. */
  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val out = new StringBuilder
    out.append(s"\n==== $title ====\n")
    out.append(header.mkString("| ", " | ", " |")).append('\n')
    out.append(header.map(_ => "---").mkString("| ", " | ", " |")).append('\n')
    rows.foreach(r => out.append(r.mkString("| ", " | ", " |")).append('\n'))
    println(out.result())
  }

  def fmt(d: Double): String = f"$d%.2f"
}
