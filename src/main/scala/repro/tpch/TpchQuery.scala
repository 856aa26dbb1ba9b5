package repro.tpch

import repro.core.XFrame
import repro.sim.ApiFeature

/** One TPC-H-lite query: the XFrame (pandas-style) implementation, the
  * equivalent DuckDB SQL over the typed `<table>_t` views, and the
  * metadata the framework simulator needs.
  *
  * Constants are adapted to the synthetic TPC-H-lite vocabularies; the
  * SQL is adapted identically, so the oracle always checks the same
  * semantics. Top-N clauses are dropped (the oracle compares unordered
  * row sets); a note marks where the official query has one.
  *
  * @param features pandas-API features the pandas-style rewrite relies
  *   on — used by the framework models to reproduce the paper's
  *   API-compatibility failures (Tables I/II)
  */
final case class TpchQuery(
    id: Int,
    name: String,
    tables: Set[String],
    features: Set[ApiFeature],
    run: TpchCtx => XFrame,
    sql: String,
)

object TpchQueries {
  /** All 22 queries, in order. */
  lazy val all: Vector[TpchQuery] = QueriesA.qs ++ QueriesB.qs

  def byId(id: Int): TpchQuery = all.find(_.id == id).getOrElse(
    throw new NoSuchElementException(s"no TPC-H query $id"))
}
