package repro.harness

import org.scalatest.funsuite.AnyFunSuite

class HarnessSpec extends AnyFunSuite {

  private def row(s: String, build: Long, run: Long, applicable: Boolean = true) =
    StrategyRow(s, build, run, 0, 0, 0, 0.9, reachedTarget = true, applicable = applicable)

  test("slowdown is strategy runtime over HQI runtime") {
    val b = DatasetBench("x", Seq(row("HQI", 100, 200), row("PreFilter", 100, 600)))
    assert(b.slowdown("PreFilter").contains(3.0))
    assert(b.slowdown("HQI").contains(1.0))
  }

  test("slowdown of a non-applicable strategy is None") {
    val b = DatasetBench("x", Seq(row("HQI", 100, 200), row("Range", 1, 1, applicable = false)))
    assert(b.slowdown("Range").isEmpty)
  }

  test("buildRatio is strategy build time over HQI build time") {
    val b = DatasetBench("x", Seq(row("HQI", 100, 200), row("PreFilter", 250, 600)))
    assert(b.buildRatio("PreFilter").contains(2.5))
  }

  test("ratios guard against a zero-time HQI") {
    val b = DatasetBench("x", Seq(row("HQI", 0, 0), row("PreFilter", 10, 10)))
    assert(b.slowdown("PreFilter").contains(10.0))
    assert(b.buildRatio("PreFilter").contains(10.0))
  }

  test("missing strategy yields None") {
    val b = DatasetBench("x", Seq(row("HQI", 1, 1)))
    assert(b.slowdown("PostFilter").isEmpty)
  }

  test("fmtRatio renders the paper's × convention") {
    assert(Harness.fmtRatio(Some(31.2)) == "31×")
    assert(Harness.fmtRatio(Some(0.97)) == "0.97×")
    assert(Harness.fmtRatio(Some(1.234)) == "1.23×")
    assert(Harness.fmtRatio(None) == "NA")
  }

  test("renderTable aligns columns") {
    val t = Harness.renderTable(Seq("a", "bb"), Seq(Seq("xxx", "y"), Seq("z", "wwww")))
    val lines = t.split("\n")
    assert(lines.length == 3)
    assert(lines.forall(_.length == lines.head.length))
  }

  test("strategyOpts encodes the paper's per-strategy batching defaults") {
    val hqi = Harness.strategyOpts("HQI", 10)
    assert(hqi.vectorBatching && hqi.attrBatching && !hqi.postFilter && !hqi.eagerBitmap)
    val pre = Harness.strategyOpts("PreFilter", 10)
    assert(!pre.vectorBatching && pre.attrBatching && pre.eagerBitmap)
    val post = Harness.strategyOpts("PostFilter", 10)
    assert(post.postFilter && !post.vectorBatching)
    val range = Harness.strategyOpts("Range", 10)
    assert(!range.vectorBatching && range.attrBatching && !range.eagerBitmap)
    intercept[IllegalArgumentException](Harness.strategyOpts("nope", 10))
  }

  test("Experiments: paper tables carry the published cells") {
    assert(Experiments.paperTable3(("PreFilter", "RelatedQS")) == "31×")
    assert(Experiments.paperTable3(("PostFilter", "RelatedQS")) == "136×")
    assert(Experiments.paperTable3(("Range", "MSTuring")) == "5.22×")
    assert(Experiments.paperTable4(("PreFilter", "MSTuring")) == "2.8×")
  }

  test("renderTable3 marks Range NA on KG datasets and includes paper columns") {
    val benches = Seq(
      DatasetBench("RelatedQS", Seq(row("HQI", 10, 10), row("PreFilter", 10, 50),
        row("PostFilter", 10, 100), row("Range", 0, 0, applicable = false))))
    val t = Experiments.renderTable3(benches)
    assert(t.contains("NA"))
    assert(t.contains("RelatedQS(paper)"))
    assert(t.contains("31×"))
  }

  test("table2 includes all five datasets") {
    val t = Experiments.table2()
    Seq("SIFT", "MSTuring", "YandexT2I", "LP", "RelatedQS").foreach(n => assert(t.contains(n)))
  }
}
