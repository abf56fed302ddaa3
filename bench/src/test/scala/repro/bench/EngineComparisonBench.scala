package repro.bench

import repro.SparkSpec

/** T2 — paper Fig. 12: Rumble vs single-threaded JSONiq engines (Zorba /
  * Xidel stand-ins) across input sizes. Shape claims checked: Rumble
  * finishes everything; Zorba DNFs on group/sort past its heap model but
  * always finishes filter; Xidel DNFs on everything past its (parse-all)
  * heap model. */
class EngineComparisonBench extends SparkSpec {

  private val sizes    = Seq(16_000L, 32_000L, 64_000L, 128_000L, 256_000L)
  private val zorbaCap = 64_000L  // modeled 16 GB heap, sized to the scaled-down data
  private val xidelCap = 64_000L

  test("T2 (Fig. 12): JSONiq engine comparison across sizes") {
    val rows = EngineComparisonExperiment.run(spark, sizes, zorbaCap, xidelCap, Harness.dataRoot)
    EngineComparisonExperiment.print(rows)

    def res(e: String, q: String, n: Long): String =
      rows.find(r => r._1 == e && r._2 == q && r._3 == n).get._4

    // Rumble completes every size and query
    for (q <- Seq("filter", "group", "sort"); n <- sizes)
      assert(res("rumble", q, n) != "DNF(oom)", s"rumble DNF on $q @ $n")
    // Zorba-sim: filter always completes (streaming), group/sort DNF past cap
    for (n <- sizes) assert(res("zorba-sim", "filter", n) != "DNF(oom)")
    for (q <- Seq("group", "sort"); n <- sizes.filter(_ > zorbaCap))
      assert(res("zorba-sim", q, n) == "DNF(oom)", s"zorba-sim should DNF on $q @ $n")
    for (q <- Seq("group", "sort"); n <- sizes.filter(_ <= zorbaCap))
      assert(res("zorba-sim", q, n) != "DNF(oom)")
    // Xidel-sim: parse-all → DNF on *every* query past cap
    for (q <- Seq("filter", "group", "sort"); n <- sizes.filter(_ > xidelCap))
      assert(res("xidel-sim", q, n) == "DNF(oom)", s"xidel-sim should DNF on $q @ $n")

    // Crossover shape (paper Fig. 12): the single-threaded engines grow
    // linearly with the input while Rumble stays near-flat at these sizes,
    // so Rumble overtakes them as soon as the input is large enough — and
    // is the only engine still standing at the top sizes.
    def secs(e: String, q: String, n: Long) = res(e, q, n).toDouble
    val lo = sizes.head; val hi = sizes.last
    val zorbaGrowth  = secs("zorba-sim", "filter", hi) / secs("zorba-sim", "filter", lo)
    val rumbleGrowth = secs("rumble", "filter", hi) / secs("rumble", "filter", lo)
    assert(zorbaGrowth > 3.0, s"zorba-sim filter should grow ~linearly (x$zorbaGrowth)")
    assert(rumbleGrowth < zorbaGrowth,
      s"rumble should scale better than zorba-sim ($rumbleGrowth vs $zorbaGrowth)")
    // at the largest size both complete, Rumble already wins the filter query
    assert(secs("rumble", "filter", hi) < secs("zorba-sim", "filter", hi),
      "expected the filter crossover within the measured sizes")
  }
}
