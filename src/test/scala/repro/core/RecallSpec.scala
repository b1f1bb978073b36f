package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.core.engine.Recall
import repro.core.vec.Metric
import repro.workload.{HybridQuery, Template, Workload}
import repro.core.qdtree.Pred

class RecallSpec extends AnyFunSuite {

  private def res(pairs: (Long, Seq[Long])*): Map[Long, Array[(Long, Float)]] =
    pairs.map { case (q, ids) => q -> ids.zipWithIndex.map { case (id, i) => (id, i.toFloat) }.toArray }.toMap

  test("perfect match gives recall 1") {
    val t = res(1L -> Seq(10L, 11L, 12L))
    assert(Recall.overall(res(1L -> Seq(10L, 11L, 12L)), t, 3) == 1.0)
  }

  test("disjoint results give recall 0") {
    val t = res(1L -> Seq(10L, 11L))
    assert(Recall.overall(res(1L -> Seq(20L, 21L)), t, 2) == 0.0)
  }

  test("partial overlap is fractional") {
    val t = res(1L -> Seq(1L, 2L, 3L, 4L))
    assert(Recall.overall(res(1L -> Seq(1L, 2L, 9L, 8L)), t, 4) == 0.5)
  }

  test("empty ground truth counts as recall 1 (no valid results to find)") {
    val t = res(1L -> Seq.empty)
    assert(Recall.overall(res(1L -> Seq.empty), t, 5) == 1.0)
    assert(Recall.overall(Map.empty, t, 5) == 1.0)
  }

  test("ground truth smaller than k uses the ground-truth size as denominator") {
    val t = res(1L -> Seq(7L, 8L))
    assert(Recall.overall(res(1L -> Seq(7L, 8L)), t, 10) == 1.0)
    assert(Recall.overall(res(1L -> Seq(7L)), t, 10) == 0.5)
  }

  test("missing query in results counts as zero recall for that query") {
    val t = res(1L -> Seq(1L), 2L -> Seq(2L))
    assert(Recall.overall(res(1L -> Seq(1L)), t, 1) == 0.5)
  }

  test("only the top-k of both sides matter") {
    val t = res(1L -> Seq(1L, 2L, 3L))
    // result has the right ids beyond position k
    assert(Recall.overall(res(1L -> Seq(9L, 1L)), t, 1) == 0.0)
  }

  test("perTemplate groups by template id") {
    val templates = Seq(Template(1, "a", Seq(Pred.NotNull("x"))),
                        Template(2, "b", Seq(Pred.NotNull("y"))))
    val w = Workload(templates,
      IndexedSeq(HybridQuery(1, 1, Array(0f)), HybridQuery(2, 2, Array(0f))),
      1, Metric.L2)
    val t = res(1L -> Seq(5L), 2L -> Seq(6L))
    val got = Recall.perTemplate(res(1L -> Seq(5L), 2L -> Seq(99L)), t, w, 1)
    assert(got(1) == 1.0 && got(2) == 0.0)
  }

  test("overall averages per-query recalls") {
    val t = res(1L -> Seq(1L), 2L -> Seq(2L), 3L -> Seq(3L), 4L -> Seq(4L))
    val r = res(1L -> Seq(1L), 2L -> Seq(2L), 3L -> Seq(9L), 4L -> Seq(9L))
    assert(Recall.overall(r, t, 1) == 0.5)
  }
}
