package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table XI: efficacy (precision / recall / F-measure) of
  * FilterThenVerifyApprox vs exact per-user Pareto frontiers, varying the
  * branch cut h on the movie and publication datasets (d = 4).
  *
  * Paper scale: n = 1,000,000 objects, 1,000 users. Ours (defaults):
  * n = 20,000, 200 users — see DESIGN.md §3. Paper numbers for comparison
  * are recorded in EXPERIMENTS.md next to a captured run of this bench.
  */
class Table11Bench extends SparkSpec {

  test("Table XI: efficacy of FilterThenVerifyApprox, varying h") {
    val rows = Experiments.table11(spark)
    println("=== Table XI (reproduction): FilterThenVerifyApprox efficacy, d=4 ===")
    rows.foreach(r => println("  " + r.render))

    // Shape assertions mirroring the paper's claims:
    // precision stays ≈ 100% (loss of accuracy is due to false negatives).
    assert(rows.forall(_.precision >= 0.98),
      s"precision dipped below 98%: ${rows.map(_.render)}")
    // recall stays high but below 100% once clustering is non-trivial.
    assert(rows.forall(_.recall >= 0.80), s"recall collapsed: ${rows.map(_.render)}")
    // Lower branch cuts (larger clusters) never improve recall by much:
    // the h=0.70 recall is within noise of the best across cuts.
    Seq("movie", "publication").foreach { ds =>
      val byH = rows.filter(_.dataset == ds).sortBy(-_.h)
      assert(byH.head.recall >= byH.last.recall - 0.02,
        s"$ds: recall should not increase substantially as h decreases")
    }
  }
}
