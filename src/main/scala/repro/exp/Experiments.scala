package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.PrefSim

/** Experiment harness shared by the bench suites (`bench/`) and the
  * spark-submit jobs (`jobs/`). Each `tableXX` function reproduces one
  * evaluation-section table and returns printable rows; paper-reported
  * numbers live next to ours in EXPERIMENTS.md.
  *
  * Scale defaults are reduced from the paper's n = 1,000,000 / 1,000 users
  * (see DESIGN.md §3); override with env vars REPRO_BENCH_N,
  * REPRO_BENCH_USERS, REPRO_BENCH_SW_N, REPRO_BENCH_SW_USERS.
  */
object Experiments {

  def envInt(name: String, default: Int): Int =
    sys.env.get(name).map(_.toInt).getOrElse(default)

  /** Branch cuts used throughout the paper's evaluation. */
  val BranchCuts: Seq[Double] = Seq(0.70, 0.65, 0.60, 0.55)

  /** Approximation thresholds (Alg. 3): threshold2 = 60% as in Ex. 11;
    * threshold1 scales with the domain (max relation size of a chain).
    */
  def threshold1For(domainSize: Int): Int = domainSize * (domainSize - 1) / 3
  val Threshold2 = 0.9

  final case class EffRow(dataset: String, w: Option[Int], h: Double,
                          precision: Double, recall: Double) {
    def fMeasure: Double = Metrics.PRF(precision, recall).fMeasure
    def render: String =
      dataset.padTo(12, ' ') +
        w.map(v => s"W=$v".padTo(8, ' ')).getOrElse("") +
        f"h=$h%.2f  precision=${precision * 100}%6.2f  recall=${recall * 100}%6.2f  F-measure=${fMeasure * 100}%6.2f"
  }

  final case class PerfRow(dataset: String, algo: String, n: Int, d: Int, w: Option[Int],
                           comparisons: Long, millis: Long) {
    def render: String =
      dataset.padTo(12, ' ') + algo.padTo(26, ' ') +
        f"n=$n%-8d d=$d%d " +
        w.map(v => s"W=$v".padTo(8, ' ')).getOrElse("") +
        f"comparisons=$comparisons%-12d time=${millis}ms"
  }

  def datasetConfigs(nUsers: Int): Seq[PrefSim.SimConfig] =
    Seq(PrefSim.movieConfig(nUsers), PrefSim.publicationConfig(nUsers))

  /** Cluster users with the approximate-similarity dendrogram (Sec. VI-C
    * weighted vector Jaccard) and materialize approx clusters at cut `h`.
    */
  def approxClustersAt(users: Seq[UserPrefs], dendro: Clustering.Dendrogram,
                       h: Double): Seq[Cluster] = {
    val byId = users.map(u => u.userId -> u).toMap
    dendro.cut(h).zipWithIndex.map { case (ids, cid) =>
      val members = ids.toSeq.sorted.map(byId)
      val rels = Array.tabulate(members.head.rels.length) { d =>
        ApproxPrefs.getApproxPreferenceTuples(
          members.map(_.rels(d)),
          threshold1For(members.head.rels(d).domainSize), Threshold2)
      }
      Cluster(cid, rels, members)
    }
  }

  // --------------------------------------------------------------- Table XI

  /** Table XI: precision / recall / F-measure of FilterThenVerifyApprox
    * against exact per-user Pareto frontiers, varying branch cut h, on the
    * movie and publication datasets (paper: n = 1,000,000, d = 4).
    */
  def table11(spark: SparkSession,
              n: Int = envInt("REPRO_BENCH_N", 20000),
              nUsers: Int = envInt("REPRO_BENCH_USERS", 200)): Seq[EffRow] =
    datasetConfigs(nUsers).flatMap { cfg =>
      val users = PrefSim.users(cfg)
      val objects = PrefSim.objects(cfg, n)
      val dendro = Clustering.dendrogram(users, Clustering.SimVecWJ)
      // Ground truth: exact per-user frontiers (Baseline over Spark).
      val exact = repro.spark.Dissemination.runBaseline(spark, users, objects).frontiers
      BranchCuts.map { h =>
        val clusters = approxClustersAt(users, dendro, h)
        val approx = repro.spark.Dissemination.runFilterThenVerify(spark, clusters, objects).frontiers
        val prf = Metrics.prf(approx, exact)
        EffRow(cfg.name, None, h, prf.precision, prf.recall)
      }
    }

  // -------------------------------------------------------------- Table XII

  /** Table XII: efficacy of FilterThenVerifyApproxSW over sliding windows,
    * varying W and h. Efficacy is accumulated over periodic window
    * snapshots (the append-only case sums final frontiers; a sliding
    * window has no single final state, so we sum over checkpoints).
    */
  /** Run independent per-entity SW state machines in parallel threads and
    * merge their periodic snapshots index-wise (user states never interact
    * in BaselineSW, cluster states never interact in FilterThenVerifySW).
    */
  private def parallelSnapshots[A](items: Seq[A], runChunk: Seq[A] => SWRunResult): Seq[Map[Int, Set[Long]]] = {
    import scala.concurrent.{Await, ExecutionContext, Future}
    import scala.concurrent.duration.Duration
    implicit val ec: ExecutionContext = ExecutionContext.global
    val cores = Runtime.getRuntime.availableProcessors
    val chunks = items.grouped(math.max(1, math.ceil(items.size.toDouble / cores).toInt)).toSeq
    val results = Await.result(Future.sequence(chunks.map(c => Future(runChunk(c)))), Duration.Inf)
    val nSnaps = results.head.snapshots.size
    (0 until nSnaps).map(i => results.flatMap(_.snapshots(i)).toMap)
  }

  def table12(spark: SparkSession,
              n: Int = envInt("REPRO_BENCH_SW_N", 8000),
              nUsers: Int = envInt("REPRO_BENCH_SW_USERS", 200),
              windows: Seq[Int] = Seq(400, 800, 1600, 3200)): Seq[EffRow] =
    datasetConfigs(nUsers).flatMap { cfg =>
      val users = PrefSim.users(cfg)
      val objects = PrefSim.objects(cfg, n)
      val dendro = Clustering.dendrogram(users, Clustering.SimVecWJ)
      val clustersByH = BranchCuts.map(h => h -> approxClustersAt(users, dendro, h))
      val snapEvery = math.max(1, n / 20)
      windows.flatMap { w =>
        val exact = parallelSnapshots[UserPrefs](users,
          chunk => BaselineSW.run(chunk, objects, w, snapshotEvery = snapEvery))
        clustersByH.map { case (h, clusters) =>
          val approx = parallelSnapshots[Cluster](clusters,
            chunk => FilterThenVerifySW.run(chunk, objects, w, snapshotEvery = snapEvery))
          val prf = Metrics.prfOverSnapshots(approx, exact)
          EffRow(cfg.name, Some(w), h, prf.precision, prf.recall)
        }
      }
    }

  // ------------------------------------------------- Figures 6-13 (shape)

  /** Execution-time / work-done comparison backing Figs. 6-13: Baseline vs
    * FilterThenVerifyExact vs FilterThenVerifyApprox (append-only and SW).
    * Reported to confirm the paper's shape: FTV does 1-2 orders of
    * magnitude fewer object comparisons than Baseline.
    */
  def timing(spark: SparkSession,
             n: Int = envInt("REPRO_BENCH_N", 20000),
             nUsers: Int = envInt("REPRO_BENCH_USERS", 200),
             h: Double = 0.55,
             window: Option[Int] = None): Seq[PerfRow] =
    datasetConfigs(nUsers).flatMap { cfg =>
      val users = PrefSim.users(cfg)
      val objects = PrefSim.objects(cfg, n)
      val d = cfg.attrs.size
      // One dendrogram; exact and approx filters share cluster memberships
      // so the comparison isolates the filter relation (common vs approx).
      val dendro = Clustering.dendrogram(users, Clustering.SimVecWJ)
      val exactClusters = Clustering.exactClusters(users, dendro, h)
      val approxClusters = approxClustersAt(users, dendro, h)
      val base = repro.spark.Dissemination.runBaseline(spark, users, objects, window)
      val ftvE = repro.spark.Dissemination.runFilterThenVerify(spark, exactClusters, objects, window)
      val ftvA = repro.spark.Dissemination.runFilterThenVerify(spark, approxClusters, objects, window)
      val wTag = window
      Seq(
        PerfRow(cfg.name, if (window.isEmpty) "Baseline" else "BaselineSW", n, d, wTag,
          base.comparisons, base.wallNanos / 1000000),
        PerfRow(cfg.name, if (window.isEmpty) "FilterThenVerifyExact" else "FilterThenVerifyExactSW",
          n, d, wTag, ftvE.comparisons, ftvE.wallNanos / 1000000),
        PerfRow(cfg.name, if (window.isEmpty) "FilterThenVerifyApprox" else "FilterThenVerifyApproxSW",
          n, d, wTag, ftvA.comparisons, ftvA.wallNanos / 1000000),
      )
    }
}
