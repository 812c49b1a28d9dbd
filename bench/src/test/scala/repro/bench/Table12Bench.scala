package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Reproduces paper Table XII: efficacy of FilterThenVerifyApproxSW over
  * count-based sliding windows, varying W ∈ {400, 800, 1600, 3200} and the
  * branch cut h, on the movie and publication datasets (d = 4).
  *
  * The append-only table sums final frontiers; a sliding window has no
  * final state, so efficacy is accumulated over periodic window snapshots
  * (20 checkpoints per run). Paper scale n = 1,000,000 / 1,000 users; ours
  * n = 8,000 / 100 users by default (REPRO_BENCH_SW_N / _SW_USERS to
  * override). Paper numbers are recorded in EXPERIMENTS.md.
  */
class Table12Bench extends SparkSpec {

  test("Table XII: efficacy of FilterThenVerifyApproxSW, varying W and h") {
    val rows = Experiments.table12(spark)
    println("=== Table XII (reproduction): FilterThenVerifyApproxSW efficacy, d=4 ===")
    rows.foreach(r => println("  " + r.render))

    // Paper shape: precision ≈ 100% for every window size and cut.
    assert(rows.forall(_.precision >= 0.97),
      s"precision dipped below 97%: ${rows.filter(_.precision < 0.97).map(_.render)}")
    // Recall stays usable (paper: 80-97%).
    assert(rows.forall(_.recall >= 0.75),
      s"recall collapsed: ${rows.filter(_.recall < 0.75).map(_.render)}")
    // Loss of accuracy is due to false negatives, not false positives:
    // recall < precision on every row where approximation bites.
    rows.filter(_.recall < 0.999).foreach { r =>
      assert(r.precision >= r.recall, s"unexpected FP-dominated loss: ${r.render}")
    }
  }
}
