package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.Experiments

/** Table 2 is the dataset inventory; the "reproduction" is the mapping from
  * the paper's datasets to the scaled stand-ins (DESIGN.md substitutions).
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: print dataset inventory (stand-ins vs paper)") {
    val rendered = Experiments.table2(BenchScale.scale)
    println("\n== Table 2: evaluation datasets ==")
    println(rendered)
    val lines = rendered.split("\n")
    assert(lines.length == 6, "header + five datasets")
    assert(lines.exists(_.contains("RelatedQS")))
    assert(lines.exists(_.contains("SIFT")))
    assert(lines.exists(_.contains("MSTuring")))
    assert(lines.exists(_.contains("YandexT2I")))
    assert(lines.exists(_.contains("LP")))
  }

  test("Table 2: metrics match the paper's per-dataset metric column") {
    val rendered = Experiments.table2(BenchScale.scale)
    val byName = rendered.split("\n").map(l => l.trim.split("\\s+").headOption.getOrElse("") -> l).toMap
    assert(byName("SIFT-like").contains("L2"))
    assert(byName("MSTuring-like").contains("L2"))
    assert(byName("YandexT2I-like").contains("IP"))
    assert(byName("RelatedQS").contains("IP"))
    assert(byName("LP").contains("IP"))
  }
}
