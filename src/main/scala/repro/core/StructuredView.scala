package repro.core

import org.apache.spark.sql.DataFrame

/** Output of an Evaporate run: the materialized structured view.
  *
  * @param table   extracted tuples (doc_id, attr, value), attr restricted to
  *                the system's top-k schema
  * @param schema  the full ranked attribute list the system identified
  * @param tokens  total tokens processed by the LLM for this run — the
  *                paper's cost metric
  * @param tokenBreakdown tokens by call site (schema / synthesis / eval /
  *                direct), for the cost tables
  */
final case class StructuredView(
    table: DataFrame,
    schema: Seq[String],
    tokens: Long,
    tokenBreakdown: Map[String, Long],
)
