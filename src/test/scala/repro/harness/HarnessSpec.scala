package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Common

class HarnessSpec extends AnyFunSuite {

  test("fmt renders magnitudes sensibly") {
    assert(Harness.fmt(0.0) == "0")
    assert(Harness.fmt(123.4) == "123")
    assert(Harness.fmt(1.234) == "1.23")
    assert(Harness.fmt(0.01234) == "0.0123")
    assert(Harness.fmt(1.2e-7) == "1.20e-07")
  }

  test("mb converts bytes") {
    assert(Harness.mb(1048576L) == "1.00 MB")
    assert(Harness.mb(52428800L) == "50.00 MB")
  }

  test("renderTable aligns columns and includes every row") {
    val t = Harness.renderTable("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = t.split("\n")
    assert(lines.head == "== T ==")
    assert(lines.length == 5)
    assert(lines.drop(1).map(_.length).distinct.size == 1, "rows must align")
    assert(t.contains("333"))
  }

  test("defaultLambda follows min(1/m, 1e-8)") {
    assert(Common.defaultLambda(100) == 1e-8)          // 1/m larger, 1e-8 wins
    assert(Common.defaultLambda(1000000000L) == 1e-9)  // 1/m smaller than 1e-8
    assert(Common.defaultLambda(10000000L) == 1e-8)
  }

  test("walkCountW decreases in eps and mu") {
    val w1 = Common.walkCountW(1000, 0.1, 0.001)
    val w2 = Common.walkCountW(1000, 0.5, 0.001)
    val w3 = Common.walkCountW(1000, 0.1, 0.01)
    assert(w1 > w2 && w1 > w3)
  }

  test("timeSec returns the value and a non-negative duration") {
    val (v, s) = Harness.timeSec { Thread.sleep(5); 42 }
    assert(v == 42 && s >= 0.004)
  }

  test("bepiHubCount is bounded") {
    val tiny = repro.graph.GraphGen.randomGraph(100, 3.0, seed = 1)
    val big = repro.graph.GraphGen.scaleFree(20000, 5.0, seed = 1)
    assert(Harness.bepiHubCount(tiny) >= 8)
    assert(Harness.bepiHubCount(big) <= 48)
  }
}
