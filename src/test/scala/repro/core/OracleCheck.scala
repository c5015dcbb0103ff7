package repro.core

import org.apache.spark.sql.SparkSession

import repro.{Oracle, SynthDataX}
import repro.core.Proj.JoinRow

/** DuckDB-backed result checks shared by the engine suites: a sample drawn
  * with `k ≥ |Q(R)|` must equal the full join exactly, which we verify via
  * `Oracle.assertEquivalent` (Spark side: the sample as a DataFrame; DuckDB
  * side: the natural-join SQL over the same input tables).
  */
object OracleCheck {

  /** Assert `sample` (complete coverage case) equals `Q(R)` over `tuples`. */
  def sampleEqualsJoin(spark: SparkSession, query: JoinQuery,
                       tuples: Seq[(String, Array[Long])], sample: Seq[JoinRow]): Unit = {
    val schema = RelSchema("sample_" + query.name, query.attributes)
    // The reservoir samples without replacement: rows must already be unique.
    require(sample.toSet.size == sample.size, "sample contains duplicates")
    val sampleDf = SynthDataX.tableDf(spark, schema, sample.map(r => schema.attrs.map(r).toArray))
    val tables = SynthDataX.workloadTables(spark, query, tuples)
    val sql = SynthDataX.naturalJoinSql(query)
    Oracle.assertEquivalent(sampleDf, sql, tables: _*)
  }

  /** Exact |Q(R)| via DuckDB-free brute force (small instances only). */
  def bruteJoin(query: JoinQuery, tuples: Seq[(String, Array[Long])]): Set[JoinRow] = {
    val d = new DeltaEnumerator(query)
    tuples.foreach { case (r, t) => d.insertOnly(r, t) }
    d.fullJoin().toSet
  }
}
