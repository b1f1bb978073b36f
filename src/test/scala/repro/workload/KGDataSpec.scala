package repro.workload

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.qdtree.Pred

class KGDataSpec extends SparkSpec {

  private lazy val db: DataFrame = { val d = KGData.entities(spark, 20000, 8).cache(); d.count(); d }

  test("row count and schema") {
    assert(db.count() == 20000)
    assert(db.columns.toSeq == Seq("id", "vec", "etype", "height", "genre", "country",
                                   "birth_year", "popularity"))
  }

  test("generation is deterministic in the seed") {
    val a = KGData.entities(spark, 500, 8, seed = 77).collect().sortBy(_.getLong(0))
    val b = KGData.entities(spark, 500, 8, seed = 77).collect().sortBy(_.getLong(0))
    a.zip(b).foreach { case (x, y) => assert(x == y) }
  }

  test("different seeds give different data") {
    val a = KGData.entities(spark, 200, 8, seed = 1).select("popularity").collect().map(_.getDouble(0))
    val b = KGData.entities(spark, 200, 8, seed = 2).select("popularity").collect().map(_.getDouble(0))
    assert(!a.sameElements(b))
  }

  test("generation is independent of partitioning") {
    val one = KGData.entities(spark, 300, 8).repartition(1).collect().sortBy(_.getLong(0))
    val many = KGData.entities(spark, 300, 8).repartition(7).collect().sortBy(_.getLong(0))
    one.zip(many).foreach { case (x, y) => assert(x == y) }
  }

  test("entity type marginals approximate the configured distribution") {
    val counts = db.groupBy("etype").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    for ((t, p) <- KGData.TypeFreq) {
      val frac = counts.getOrElse(t, 0L).toDouble / 20000
      assert(math.abs(frac - p) < 0.02, s"type $t: got $frac want $p")
    }
  }

  test("attribute non-NULL rates are type-conditional as configured") {
    val heightByType = db.groupBy("etype")
      .agg(avg(when(col("height").isNotNull, 1.0).otherwise(0.0)).as("nn"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(math.abs(heightByType("person") - 0.5) < 0.05)
    assert(heightByType.getOrElse("song", 0.0) == 0.0)
    val genreByType = db.groupBy("etype")
      .agg(avg(when(col("genre").isNotNull, 1.0).otherwise(0.0)).as("nn"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(math.abs(genreByType("song") - 0.95) < 0.05)
    assert(genreByType.getOrElse("city", 0.0) == 0.0)
  }

  test("popularity is uniform-ish on [0,1]") {
    val stats = db.agg(min("popularity"), max("popularity"), avg("popularity")).head()
    assert(stats.getDouble(0) >= 0.0 && stats.getDouble(1) <= 1.0)
    assert(math.abs(stats.getDouble(2) - 0.5) < 0.02)
  }

  test("vectors correlate with entity type (same-type centroid distance is smaller)") {
    import repro.core.vec.VectorOps
    def meanVec(t: String): Array[Float] = {
      val vs = db.filter(col("etype") === t).select("vec").limit(500).collect()
        .map(_.getSeq[Float](0).toArray)
      val d = vs.head.length
      val m = new Array[Float](d)
      vs.foreach(v => (0 until d).foreach(i => m(i) += v(i) / vs.length))
      m
    }
    val mSong = meanVec("song"); val mCity = meanVec("city")
    val songVecs = db.filter(col("etype") === "song").select("vec").limit(200).collect()
      .map(_.getSeq[Float](0).toArray)
    val toOwn = songVecs.map(VectorOps.l2Sq(_, mSong).toDouble).sum
    val toOther = songVecs.map(VectorOps.l2Sq(_, mCity).toDouble).sum
    assert(toOwn < toOther, "song vectors should be closer to the song centroid than the city centroid")
  }

  test("template selectivity targets are met within sampling error (Table 1 shape)") {
    val n = 20000.0
    for ((t, i) <- Templates.relatedQS.zipWithIndex) {
      val sel = db.filter(Pred.and(t.preds)).count() / n
      val target = Templates.SelTargets(i)
      // Tolerance: tiny targets get an absolute bound, large ones relative.
      if (target >= 0.01)
        assert(math.abs(sel - target) / target < 0.25, s"${t.name}: got $sel want $target")
      else
        assert(sel <= target * 4 + 5e-4, s"${t.name}: got $sel want <= ~$target")
    }
  }

  test("selectivity ordering follows Table 1 (T1 most selective, T10 least)") {
    val sels = Templates.relatedQS.map(t => db.filter(Pred.and(t.preds)).count())
    assert(sels.head == sels.min, s"T1 should be most selective: $sels")
    assert(sels.last >= sels.max * 9 / 10, s"T10 should be near-least selective: $sels")
  }
}
