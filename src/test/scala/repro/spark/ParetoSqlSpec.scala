package repro.spark

import repro.{Oracle, SparkSpec}
import repro.core._
import repro.core.TestGen._
import scala.util.Random

/** The declarative Pareto frontier (Catalyst `NOT EXISTS` anti-join) is the
  * bridge between the core algorithms and the DuckDB oracle: the same SQL
  * text runs on both engines, and the core incremental algorithms must
  * agree with the declarative result.
  */
class ParetoSqlSpec extends SparkSpec {

  private def scenario(seed: Int, nObjs: Int = 40, domains: Seq[Int] = Seq(4, 5)) = {
    val rng = new Random(seed)
    val rels = domains.map(m => randomRelation(rng, m, 0.4)).toArray
    val objs = randomObjects(rng, nObjs, domains)
    (rels, objs)
  }

  for (seed <- 0 until 5)
    test(s"Spark frontier SQL matches DuckDB on the same tables (seed=$seed)") {
      val (rels, objs) = scenario(seed)
      val tag = s"oracle$seed"
      val df = ParetoSql.frontier(spark, objs, rels, tag)
      val objT = s"objs_$tag"
      val prefTs = rels.indices.map(i => s"pref${i}_$tag")
      Oracle.assertEquivalent(df, ParetoSql.frontierSql(objT, prefTs),
        (objT -> ParetoSql.objectsDf(spark, objs)) +:
          rels.toSeq.zipWithIndex.map { case (r, i) => prefTs(i) -> ParetoSql.prefDf(spark, r) }: _*)
    }

  for (seed <- 0 until 5)
    test(s"incremental core frontier equals the declarative SQL frontier (seed=$seed)") {
      val (rels, objs) = scenario(100 + seed)
      val sqlIds = ParetoSql.frontier(spark, objs, rels, s"core$seed")
        .collect().map(_.getLong(0)).toSet
      assert(sqlIds == BruteForce.frontier(rels, objs))
      val f = new Frontier(rels, new OpCounter)
      objs.foreach(f.update)
      assert(f.ids == sqlIds)
    }

  test("paper CPU relations: frontier of a small catalogue via SQL and DuckDB") {
    val rels = Array(cpuC1)
    val objs = Seq(Obj(1, Array(Single)), Obj(2, Array(Dual)),
      Obj(3, Array(Triple)), Obj(4, Array(Quad)))
    val tag = "cpu"
    val df = ParetoSql.frontier(spark, objs, rels, tag)
    Oracle.assertEquivalent(df, ParetoSql.frontierSql(s"objs_$tag", Seq(s"pref0_$tag")),
      s"objs_$tag" -> ParetoSql.objectsDf(spark, objs),
      s"pref0_$tag" -> ParetoSql.prefDf(spark, cpuC1))
    // dual dominates everything else for c1.
    assert(df.collect().map(_.getLong(0)).toSet == Set(2L))
  }

  test("empty preference relations make every distinct object Pareto-optimal") {
    val rels = Array(PrefRelation.empty(3))
    val objs = Seq(Obj(1, Array(0)), Obj(2, Array(1)), Obj(3, Array(2)))
    val ids = ParetoSql.frontier(spark, objs, rels, "empty")
      .collect().map(_.getLong(0)).toSet
    assert(ids == Set(1L, 2L, 3L))
  }
}
