package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.PrefRelation

/** The paper's preference-derivation rule (Sec. VIII-A) as a declarative
  * Spark SQL query over rating events and object metadata:
  *
  * For user `c` and attribute values `a`, `b` with per-value stats
  * `R_v` (average rating) and `M_v` (rating count),
  * `(a, b) ∈ ≻_c` iff `(R_a > R_b ∧ M_a ≥ M_b) ∨ (R_a ≥ R_b ∧ M_a > M_b)`.
  *
  * Average-rating comparisons are done in exact integer arithmetic
  * (`sum_a·m_b` vs `sum_b·m_a`) so the same SQL text produces identical
  * results on Catalyst and on DuckDB (floating-point AVG is summation-
  * order dependent and would make the oracle flaky).
  */
object PrefDerivation {

  /** SQL deriving `(user_id, better, worse)` preference tuples on
    * attribute column `attr`, from tables `ratingsTable(user_id, movie_id,
    * rating)` and `moviesTable(movie_id, <attr>, ...)`.
    */
  def prefTuplesSql(ratingsTable: String, moviesTable: String, attr: String): String =
    s"""WITH stats AS (
       |  SELECT r.user_id AS user_id, m.$attr AS v,
       |         SUM(CAST(r.rating AS BIGINT)) AS s,
       |         COUNT(*) AS c
       |  FROM $ratingsTable r JOIN $moviesTable m ON r.movie_id = m.movie_id
       |  GROUP BY r.user_id, m.$attr
       |)
       |SELECT a.user_id AS user_id, a.v AS better, b.v AS worse
       |FROM stats a JOIN stats b
       |  ON a.user_id = b.user_id AND a.v <> b.v
       |WHERE (a.s * b.c > b.s * a.c AND a.c >= b.c)
       |   OR (a.s * b.c >= b.s * a.c AND a.c > b.c)""".stripMargin

  /** Run the derivation on Catalyst over the given DataFrames. */
  def prefTuples(spark: SparkSession, ratings: DataFrame, movies: DataFrame,
                 attr: String, tag: String): DataFrame = {
    ratings.createOrReplaceTempView(s"ratings_$tag")
    movies.createOrReplaceTempView(s"movies_$tag")
    spark.sql(prefTuplesSql(s"ratings_$tag", s"movies_$tag", attr))
  }

  /** Collect a derived tuple table into per-user [[PrefRelation]]s.
    * Throws if any user's tuples are not a strict partial order — which
    * would indicate the derivation rule (or this SQL) is broken, since
    * 2-D product dominance is provably an SPO.
    */
  def toRelations(df: DataFrame, domainSize: Int): Map[Int, PrefRelation] =
    df.collect()
      .map(r => (r.getInt(0), (r.getInt(1), r.getInt(2))))
      .groupBy(_._1)
      .map { case (uid, rows) =>
        uid -> PrefRelation.fromEdges(domainSize, rows.map(_._2).toSeq)
      }
}
