package repro.workload

import org.apache.spark.sql.DataFrame

import repro.SparkSpec
import repro.core.vec.Metric

class TemplatesSpec extends SparkSpec {

  private lazy val db: DataFrame = { val d = KGData.entities(spark, 8000, 8).cache(); d.count(); d }

  test("ten RelatedQS templates with ids 1..10") {
    assert(Templates.relatedQS.map(_.id) == (1 to 10))
    assert(Templates.relatedQS.map(_.name) == (1 to 10).map(i => s"T$i"))
  }

  test("every split's frequency row covers all ten templates") {
    Templates.SplitFreqs.foreach(f => assert(f.length == 10))
  }

  test("templates use all three predicate kinds from Definition 2") {
    val kinds = Templates.relatedQS.flatMap(_.preds).map(_.getClass.getSimpleName).toSet
    assert(kinds.contains("StrEq") || kinds.contains("In"))
    assert(kinds.contains("NotNull"))
    assert(kinds.contains("NumCmp"))
  }

  test("workload size approximates the requested count") {
    val w = Templates.relatedQSWorkload(db, split = 0, numQueries = 200)
    assert(math.abs(w.size - 200) <= 15)
  }

  test("workload template mix matches the split's Table 1 frequencies") {
    val w = Templates.relatedQSWorkload(db, split = 0, numQueries = 500)
    val counts = w.queries.groupBy(_.templateId).view.mapValues(_.size).toMap
    val freqs = Templates.SplitFreqs(0)
    val total = freqs.sum.toDouble
    for ((t, i) <- Templates.relatedQS.zipWithIndex) {
      val want = freqs(i) / total
      val got = counts.getOrElse(t.id, 0).toDouble / w.size
      assert(math.abs(got - want) < 0.03, s"${t.name}: got $got want $want")
    }
  }

  test("splits differ in composition as in Table 1 (t0 vs t1 differ on T1/T4)") {
    val w0 = Templates.relatedQSWorkload(db, split = 0, numQueries = 1000)
    val w1 = Templates.relatedQSWorkload(db, split = 1, numQueries = 1000)
    def frac(w: Workload, tid: Int) = w.queries.count(_.templateId == tid).toDouble / w.size
    assert(frac(w0, 4) > frac(w1, 4), "T4 share shrinks from t0 to t1 in Table 1")
    assert(frac(w0, 1) < frac(w1, 1), "T1 share grows from t0 to t1 in Table 1")
  }

  test("queries are deterministic in the seed") {
    val a = Templates.relatedQSWorkload(db, 0, 50, seed = 123)
    val b = Templates.relatedQSWorkload(db, 0, 50, seed = 123)
    assert(a.queries.map(_.qid) == b.queries.map(_.qid))
    a.queries.zip(b.queries).foreach { case (x, y) => assert(x.vec.sameElements(y.vec)) }
  }

  test("qids are unique across splits") {
    val all = (0 to 3).flatMap(s => Templates.relatedQSWorkload(db, s, 100).queries.map(_.qid))
    assert(all.distinct.size == all.size)
  }

  test("LP templates constrain only the entity type") {
    assert(Templates.lp.size == KGData.TypeFreq.size)
    Templates.lp.foreach { t =>
      assert(t.preds.size == 1)
      assert(t.preds.head.attr == "etype")
    }
  }

  test("LP workload mixes follow the type marginal") {
    val w = Templates.lpWorkload(db, 400)
    val counts = w.queries.groupBy(_.templateId).view.mapValues(_.size).toMap
    val personTid = Templates.lp.find(_.name == "LP-person").get.id
    val cityTid = Templates.lp.find(_.name == "LP-city").get.id
    assert(counts(personTid) > counts(cityTid), "person (20%) should outnumber city (5%)")
  }

  test("restrictedTo keeps only the requested templates") {
    val w = Templates.relatedQSWorkload(db, 0, 200)
    val r = w.restrictedTo(Set(9, 10))
    assert(r.queries.nonEmpty)
    assert(r.queries.forall(q => q.templateId == 9 || q.templateId == 10))
  }

  test("sampledPerTemplate caps per-template counts") {
    val w = Templates.relatedQSWorkload(db, 0, 400)
    val s = w.sampledPerTemplate(5)
    s.queries.groupBy(_.templateId).values.foreach(qs => assert(qs.size <= 5))
  }

  test("workload construction rejects queries with unknown templates") {
    intercept[IllegalArgumentException] {
      Workload(Templates.relatedQS, IndexedSeq(HybridQuery(0, 999, Array(1f))), 10, Metric.IP)
    }
  }
}
