package repro.spark

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec
import repro.core._
import repro.core.TestGen._
import scala.util.Random

/** The distributed dataflow must agree bit-for-bit with the local core
  * algorithms, in batch and in Structured Streaming.
  */
class DisseminationSpec extends SparkSpec {

  private def scenario(seed: Int, nUsers: Int = 8, nObjs: Int = 60) = {
    val rng = new Random(seed)
    val domains = Seq(4, 5)
    val users = randomUsers(rng, nUsers, domains)
    val objects = randomObjects(rng, nObjs, domains)
    val clusters = randomExactClusters(rng, users, 3)
    (users, objects, clusters)
  }

  for (seed <- 0 until 3)
    test(s"batch Baseline over Spark equals the local Baseline run (seed=$seed)") {
      val (users, objects, _) = scenario(seed)
      val local = Baseline.run(users, objects)
      val dist = Dissemination.runBaseline(spark, users, objects)
      assert(dist.emissions == local.emissions)
      assert(dist.frontiers == local.frontiers)
      assert(dist.comparisons == local.comparisons)
    }

  for (seed <- 0 until 3)
    test(s"batch FilterThenVerify over Spark equals the local run (seed=$seed)") {
      val (_, objects, clusters) = scenario(10 + seed)
      val local = FilterThenVerify.run(clusters, objects)
      val dist = Dissemination.runFilterThenVerify(spark, clusters, objects)
      assert(dist.emissions == local.emissions)
      assert(dist.frontiers == local.frontiers)
      assert(dist.comparisons == local.comparisons)
    }

  for (seed <- 0 until 2)
    test(s"batch sliding-window runs over Spark equal the local runs (seed=$seed)") {
      val (users, objects, clusters) = scenario(20 + seed)
      val w = 15
      val localB = BaselineSW.run(users, objects, w)
      val distB = Dissemination.runBaseline(spark, users, objects, Some(w))
      assert(distB.emissions.map(e => e.ts -> e.users).toMap ==
        localB.emissions.map(e => e.ts -> e.users).toMap)
      assert(distB.frontiers == localB.frontiers)
      val localF = FilterThenVerifySW.run(clusters, objects, w)
      val distF = Dissemination.runFilterThenVerify(spark, clusters, objects, Some(w))
      assert(distF.frontiers == localF.frontiers)
    }

  private def runStreaming(clusters: Seq[Cluster], objects: Seq[Obj],
                           window: Option[Int], batches: Int): Map[Long, Set[Int]] = {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val source = MemoryStream[Dissemination.ObjEvent]
    val emissions = Dissemination.streamingEmissions(spark, source.toDS(), clusters, window)
    val query = emissions.writeStream
      .format("memory")
      .queryName(s"emits_${System.nanoTime()}")
      .outputMode("append")
      .start()
    try {
      val sorted = objects.sortBy(_.ts)
      val chunk = math.max(1, sorted.size / batches)
      sorted.grouped(chunk).foreach { g =>
        source.addData(g.map(o => Dissemination.ObjEvent(o.ts, o.attrs.toSeq)))
        query.processAllAvailable()
      }
      spark.table(query.name).collect()
        .map(r => (r.getLong(0), r.getInt(1)))
        .groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    } finally query.stop()
  }

  test("streaming FilterThenVerify emissions equal the batch run (append-only)") {
    val (_, objects, clusters) = scenario(30, nUsers = 6, nObjs = 40)
    val local = FilterThenVerify.run(clusters, objects)
    val streamed = runStreaming(clusters, objects, window = None, batches = 5)
    val expected = local.emissions.filter(_.users.nonEmpty).map(e => e.ts -> e.users).toMap
    assert(streamed == expected)
  }

  test("streaming FilterThenVerifySW emissions equal the batch sliding-window run") {
    val (_, objects, clusters) = scenario(31, nUsers = 6, nObjs = 50)
    val w = 12
    val local = FilterThenVerifySW.run(clusters, objects, w)
    val streamed = runStreaming(clusters, objects, window = Some(w), batches = 4)
    val expected = local.emissions.filter(_.users.nonEmpty).map(e => e.ts -> e.users).toMap
    assert(streamed == expected)
  }

  test("streaming state survives across micro-batches (single-object batches)") {
    val (_, objects, clusters) = scenario(32, nUsers = 4, nObjs = 12)
    val local = FilterThenVerify.run(clusters, objects)
    val streamed = runStreaming(clusters, objects, window = None, batches = 12)
    val expected = local.emissions.filter(_.users.nonEmpty).map(e => e.ts -> e.users).toMap
    assert(streamed == expected)
  }

  test("comparison accumulator reports the filter-then-verify saving") {
    val rng = new Random(99)
    val domains = Seq(5, 5)
    val users = randomUsers(rng, 12, domains, nGroups = 2)
    val objects = randomObjects(rng, 150, domains)
    val clusters = users.groupBy(_.userId % 2).toSeq.sortBy(_._1).map {
      case (cid, ms) => Cluster(cid, Clustering.commonRels(ms), ms)
    }
    val base = Dissemination.runBaseline(spark, users, objects)
    val ftv = Dissemination.runFilterThenVerify(spark, clusters, objects)
    assert(base.comparisons > 0 && ftv.comparisons > 0)
    assert(ftv.emissions == base.emissions) // exact clusters: same answers
  }
}
