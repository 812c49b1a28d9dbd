package repro.spark

import repro.{Oracle, SparkSpec, SynthData}
import repro.core._

/** The paper's preference-derivation rule as a Spark SQL pipeline over
  * SynthData's Netflix/IMDB stand-in tables, verified against DuckDB and
  * fed end-to-end into the core algorithms.
  */
class PrefDerivationSpec extends SparkSpec {

  private lazy val movies = SynthData.movies(spark, n = 300)
  private lazy val ratings = SynthData.movieRatings(spark, nUsers = 8, nMovies = 300,
    rowsPerUser = 120)

  for (attr <- Seq("actor", "director", "genre", "writer"))
    test(s"derived preference tuples match DuckDB on attribute $attr") {
      val df = PrefDerivation.prefTuples(spark, ratings, movies, attr, s"oracle_$attr")
      Oracle.assertEquivalent(df,
        PrefDerivation.prefTuplesSql(s"ratings_oracle_$attr", s"movies_oracle_$attr", attr),
        s"ratings_oracle_$attr" -> ratings,
        s"movies_oracle_$attr" -> movies)
    }

  test("derived relations are strict partial orders for every user") {
    val df = PrefDerivation.prefTuples(spark, ratings, movies, "genre", "spo")
    val rels = PrefDerivation.toRelations(df, domainSize = 18)
    assert(rels.nonEmpty)
    rels.values.foreach(r => assert(PrefRelation.isStrictPartialOrder(18, r.tuples)))
  }

  test("derivation is asymmetric: no user has both (a,b) and (b,a)") {
    val df = PrefDerivation.prefTuples(spark, ratings, movies, "director", "asym")
    val tuples = df.collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2))).toSet
    tuples.foreach { case (u, a, b) => assert(!tuples.contains((u, b, a))) }
  }

  test("end-to-end: SQL-derived preferences drive the core dissemination algorithms") {
    val domains = Seq("actor" -> 60, "director" -> 40, "genre" -> 18, "writer" -> 50)
    val relsByAttr = domains.map { case (attr, m) =>
      PrefDerivation.toRelations(
        PrefDerivation.prefTuples(spark, ratings, movies, attr, s"e2e_$attr"), m)
    }
    val userIds = relsByAttr.map(_.keySet).reduce(_ & _).toSeq.sorted
    assert(userIds.nonEmpty)
    val users = userIds.map { uid =>
      UserPrefs(uid, relsByAttr.map(rels => rels(uid)).toArray)
    }
    // New "movies" arriving as objects: reuse the metadata rows.
    val objects = movies.collect().take(150).map { r =>
      Obj(r.getLong(0), Array(r.getInt(1), r.getInt(2), r.getInt(3), r.getInt(4)))
    }.toSeq
    val base = Baseline.run(users, objects)
    // Exact single cluster of all users must agree with Baseline.
    val cluster = Cluster(0, Clustering.commonRels(users), users)
    val ftv = FilterThenVerify.run(Seq(cluster), objects)
    assert(ftv.emissions == base.emissions)
    // And each user's frontier agrees with the declarative SQL frontier.
    val u = users.head
    val sqlIds = ParetoSql.frontier(spark, objects, u.rels, "e2e")
      .collect().map(_.getLong(0)).toSet
    assert(base.frontiers(u.userId) == sqlIds)
  }
}
