package repro

import java.sql.DriverManager
import org.apache.spark.sql.{DataFrame, Row}

/** DuckDB correctness oracle.
  *
  * ``assertEquivalent(sparkDf, sql, tables)`` runs ``sql`` on DuckDB
  * (via JDBC, in-process) over ``tables`` and asserts the sorted rows
  * match ``sparkDf``. This catches wrong results from a rewritten plan
  * or a custom operator — "it ran" is not "it is correct".
  *
  * Alias every output column identically on both sides (Spark names
  * ``count(*)`` as ``count(1)``, DuckDB as ``count_star()``). Project
  * to scalar columns — array/map/struct are not comparable here.
  *
  * ``assertEquivalentApprox`` is the tolerant variant for floating-point
  * aggregates (sums over different summation orders differ in the last
  * bits): numeric cells compare within a relative tolerance, everything
  * else exactly.
  */
object Oracle {

  private def canon(rows: Seq[Row], cols: Seq[String]): Seq[Seq[String]] = {
    val order = cols.sorted
    val idx   = order.map(cols.indexOf)
    rows
      .map(r => idx.map { i =>
        r.get(i) match {
          case null                 => "∅"
          case d: Double            => f"$d%.6f"
          case f: Float             => f"${f.toDouble}%.6f"
          case bd: java.math.BigDecimal => f"${bd.doubleValue}%.6f"
          case x                    => x.toString
        }
      })
      .sortBy(_.mkString(""))
  }

  /** Load `tables` into an in-process DuckDB, run `sql`, return
    * (column labels, rows). All columns load as VARCHAR; cast in SQL.
    */
  private def runDuck(sql: String, tables: Seq[(String, DataFrame)]): (Seq[String], Seq[Row]) = {
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    try {
      for ((name, df) <- tables) {
        val cols = df.columns
        conn.createStatement.execute(
          s"CREATE TABLE $name (${cols.map(c => s"$c VARCHAR").mkString(", ")})"
        )
        // Collect once; this is an oracle, not a bench — keep tables small.
        val ps = conn.prepareStatement(
          s"INSERT INTO $name VALUES (${cols.map(_ => "?").mkString(",")})"
        )
        df.collect().foreach { r =>
          cols.indices.foreach(i => ps.setString(i + 1, Option(r.get(i)).map(_.toString).orNull))
          ps.addBatch()
        }
        ps.executeBatch(); ps.close()
      }
      val rs   = conn.createStatement.executeQuery(sql)
      val meta = rs.getMetaData
      val dCols = (1 to meta.getColumnCount).map(meta.getColumnLabel)
      val dRows = Iterator
        .continually(rs)
        .takeWhile(_.next())
        .map(r => Row.fromSeq((1 to dCols.size).map(r.getObject)))
        .toSeq
      (dCols, dRows)
    } finally conn.close()
  }

  def assertEquivalent(sparkDf: DataFrame, sql: String, tables: (String, DataFrame)*): Unit = {
    val (dCols, dRows) = runDuck(sql, tables)
    val sCols = sparkDf.columns.toSeq
    require(
      dCols.map(_.toLowerCase).toSet == sCols.map(_.toLowerCase).toSet,
      s"column mismatch: spark=${sCols.sorted} duckdb=${dCols.sorted} — alias every output column"
    )
    val got = canon(sparkDf.collect().toSeq, sCols)
    val exp = canon(dRows, dCols)
    require(got == exp,
      s"result mismatch (${got.size} vs ${exp.size} rows):\n" +
      s"  first spark-only: ${got.diff(exp).take(3)}\n" +
      s"  first duck-only:  ${exp.diff(got).take(3)}"
    )
  }

  // -- tolerant variant ---------------------------------------------------

  private def cellToEither(v: Any): Either[String, Double] = v match {
    case null                     => Left("∅")
    case d: Double                => Right(d)
    case f: Float                 => Right(f.toDouble)
    case bd: java.math.BigDecimal => Right(bd.doubleValue)
    case b: Byte                  => Right(b.toDouble)
    case s: Short                 => Right(s.toDouble)
    case i: Int                   => Right(i.toDouble)
    case l: Long                  => Right(l.toDouble)
    case s: String =>
      // DuckDB may return numerics as strings when casting VARCHAR inputs.
      try Right(s.toDouble) catch { case _: NumberFormatException => Left(s) }
    case x => Left(x.toString)
  }

  private def canonApprox(rows: Seq[Row], cols: Seq[String]): Seq[Seq[Either[String, Double]]] = {
    val order = cols.sorted
    val idx   = order.map(cols.indexOf)
    rows
      .map(r => idx.map(i => cellToEither(r.get(i))))
      .sortBy(_.map {
        case Left(s)  => s
        case Right(d) => f"${d}%020.4f" // rounded sort key keeps near-equal rows aligned
      }.mkString("|"))
  }

  private def cellsMatch(a: Either[String, Double], b: Either[String, Double], relTol: Double): Boolean =
    (a, b) match {
      case (Left(x), Left(y))   => x == y
      case (Right(x), Right(y)) =>
        val scale = math.max(1.0, math.max(math.abs(x), math.abs(y)))
        math.abs(x - y) <= relTol * scale
      case (Left(x), Right(y)) => (try x.toDouble == y catch { case _: Exception => false })
      case (Right(x), Left(y)) => (try y.toDouble == x catch { case _: Exception => false })
    }

  /** Like `assertEquivalent`, but numeric cells compare within a relative
    * tolerance (default 1e-6 of the cell magnitude, floor 1).
    */
  def assertEquivalentApprox(
      sparkDf: DataFrame,
      sql: String,
      tables: Seq[(String, DataFrame)],
      relTol: Double = 1e-6,
  ): Unit = {
    val (dCols, dRows) = runDuck(sql, tables)
    val sCols = sparkDf.columns.toSeq
    require(
      dCols.map(_.toLowerCase).toSet == sCols.map(_.toLowerCase).toSet,
      s"column mismatch: spark=${sCols.sorted} duckdb=${dCols.sorted} — alias every output column"
    )
    val got = canonApprox(sparkDf.collect().toSeq, sCols)
    val exp = canonApprox(dRows, dCols)
    require(got.size == exp.size,
      s"row count mismatch: spark=${got.size} duckdb=${exp.size}\n" +
      s"  first spark rows: ${got.take(3)}\n  first duck rows: ${exp.take(3)}")
    got.zip(exp).zipWithIndex.foreach { case ((g, e), i) =>
      val ok = g.size == e.size && g.zip(e).forall { case (a, b) => cellsMatch(a, b, relTol) }
      require(ok, s"row $i mismatch:\n  spark: $g\n  duck:  $e")
    }
  }
}
