package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the benchmark harness utilities. */
class HarnessSpec extends AnyFunSuite {

  test("median of odd/even/empty") {
    assert(Harness.median(Seq(3.0, 1.0, 2.0)) == 2.0)
    assert(Harness.median(Seq(4.0, 1.0, 2.0, 3.0)) == 2.5)
    assert(Harness.median(Seq(7.0)) == 7.0)
    assert(Harness.median(Nil).isNaN)
  }

  test("time measures a thunk and returns its result") {
    val (r, s) = Harness.time { Thread.sleep(30); 42 }
    assert(r == 42)
    assert(s >= 0.025 && s < 5.0)
  }

  test("timedMedian runs the thunk reps times") {
    var n = 0
    Harness.timedMedian(3) { n += 1 }
    assert(n == 3)
  }

  test("fmtSec formats to centiseconds") {
    assert(Harness.fmtSec(1.2345) == "1.23")
    assert(Harness.fmtSec(0.0) == "0.00")
  }

  test("freshDir clears previous content") {
    val base = java.nio.file.Files.createTempDirectory("harness").toString
    val d    = Harness.freshDir(base, "x")
    new java.io.File(d).mkdirs()
    val f = new java.io.File(d, "stale")
    f.createNewFile()
    assert(f.exists())
    Harness.freshDir(base, "x")
    assert(!f.exists())
  }

  test("printTable renders aligned rows") {
    // should not throw, and the format is eyeballed in bench output
    Harness.printTable("t", Seq("a", "long-header"), Seq(Seq("1", "2"), Seq("33", "4")))
  }

  test("queries are well-formed JSONiq") {
    // parse (not run) each bench query to catch template drift
    Seq(
      RumbleQueries.filter("/tmp/x.json"),
      RumbleQueries.group("/tmp/x.json"),
      RumbleQueries.sort("/tmp/x.json"),
      RumbleQueries.redditFilter("/tmp/x.json", 1000),
    ).foreach(q => repro.core.parser.Parser.parse(q))
  }
}
