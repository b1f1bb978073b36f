package repro.workload

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.qdtree.Pred
import repro.core.vec.Metric

class BigannSpec extends SparkSpec {

  private lazy val db: DataFrame = { val d = Bigann.dataset(spark, 16384, 8).cache(); d.count(); d }

  test("dataset schema and count") {
    assert(db.columns.toSeq == Seq("id", "vec", "a", "b"))
    assert(db.count() == 16384)
  }

  test("attributes A and B are uniform on [0,1]") {
    val s = db.agg(min("a"), max("a"), avg("a"), avg("b")).head()
    assert(s.getDouble(0) >= 0 && s.getDouble(1) <= 1)
    assert(math.abs(s.getDouble(2) - 0.5) < 0.02)
    assert(math.abs(s.getDouble(3) - 0.5) < 0.02)
  }

  test("20 templates: 10 per attribute") {
    assert(Bigann.templates.size == 20)
    assert(Bigann.templates.count(_.preds.head.attr == "a") == 10)
    assert(Bigann.templates.count(_.preds.head.attr == "b") == 10)
  }

  test("range predicate i selects ~2^-i of the data (the paper's protocol)") {
    val n = 16384.0
    for ((t, i) <- Bigann.templates.take(10).zipWithIndex) {
      val sel = db.filter(Pred.and(t.preds)).count() / n
      val want = math.pow(2.0, -i)
      assert(math.abs(sel - want) < math.max(0.25 * want, 0.01),
             s"${t.name}: got $sel want $want")
    }
  }

  test("filter i=0 selects everything") {
    assert(db.filter(Pred.and(Bigann.templates.head.preds)).count() == 16384)
  }

  test("workload is the Cartesian product of filters and query vectors") {
    val w = Bigann.workload(nq = 7, d = 8)
    assert(w.size == 20 * 7)
    assert(w.queries.map(_.qid).distinct.size == w.size)
    // every template appears exactly nq times
    w.queries.groupBy(_.templateId).values.foreach(qs => assert(qs.size == 7))
  }

  test("query vectors are shared across filters (same vi => same vector)") {
    val w = Bigann.workload(nq = 3, d = 8)
    val byVi = w.queries.groupBy(_.qid % 1000000L)
    byVi.values.foreach { qs =>
      val first = qs.head.vec
      qs.foreach(q => assert(q.vec.sameElements(first)))
    }
  }

  test("dataset and query vectors are deterministic in the seed") {
    val a = Bigann.dataset(spark, 100, 4, seed = 3).collect().sortBy(_.getLong(0))
    val b = Bigann.dataset(spark, 100, 4, seed = 3).collect().sortBy(_.getLong(0))
    a.zip(b).foreach { case (x, y) => assert(x == y) }
    val qa = Bigann.queryVectors(5, 4, seed = 3)
    val qb = Bigann.queryVectors(5, 4, seed = 3)
    qa.zip(qb).foreach { case (x, y) => assert(x.sameElements(y)) }
  }

  test("metric defaults can be overridden (IP for the YandexT2I stand-in)") {
    val w = Bigann.workload(nq = 2, d = 4, metric = Metric.IP)
    assert(w.metric == Metric.IP)
  }
}
