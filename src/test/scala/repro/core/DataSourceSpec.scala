package repro.core

import java.nio.file.Files

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.core.datasource.{HQIDataSource, HQIStore}
import repro.core.engine._
import repro.core.qdtree.Pred
import repro.core.vec.Metric
import repro.workload.{KGData, Templates}

/** The custom DataSourceV2: persisted HQI indexes round-trip exactly, and
  * filter pushdown prunes partitions via semantic descriptions without ever
  * changing results.
  */
class DataSourceSpec extends SparkSpec {

  private lazy val db: DataFrame = { val d = KGData.entities(spark, 3000, 8).cache(); d.count(); d }
  private lazy val history = Templates.relatedQSWorkload(db, 0, 100)
  private lazy val hqi =
    IndexBuilder.buildHQI(db, KGData.AttrCols, Metric.IP, history, HQIOptions(minSize = 256))

  private lazy val path: String = {
    val dir = Files.createTempDirectory("hqi-ds").toString
    HQIStore.write(hqi, dir)
    dir
  }

  private def load(): DataFrame = spark.read.format("hqi").load(path)

  test("store metadata captures dim, predicates and per-leaf semantics") {
    val meta = HQIStore.readMeta(path)
    assert(meta.dim == 8)
    assert(meta.metricName == "IP")
    assert(meta.attrs.map(_.name) == KGData.AttrCols)
    assert(meta.preds.nonEmpty)
    assert(meta.leaves.size == hqi.numPartitions)
    assert(meta.leaves.forall(_.semantic.isDefined))
  }

  test("schema inference matches the index layout schema") {
    val df = load()
    assert(df.columns.toSeq ==
      Seq("id", "vec") ++ KGData.AttrCols ++ Seq("__part", "__cluster"))
  }

  test("round-trip: every row is read back exactly") {
    val orig = hqi.data.select("id", "etype", "height", "genre", "country", "birth_year",
                               "popularity", "__part", "__cluster")
      .collect().map(_.toSeq).sortBy(_.head.asInstanceOf[Long])
    val read = load().select("id", "etype", "height", "genre", "country", "birth_year",
                             "popularity", "__part", "__cluster")
      .collect().map(_.toSeq).sortBy(_.head.asInstanceOf[Long])
    assert(read.length == orig.length)
    orig.zip(read).foreach { case (a, b) => assert(a == b) }
  }

  test("round-trip preserves vectors bit-exactly") {
    val orig = hqi.data.select("id", "vec").collect()
      .map(r => r.getLong(0) -> r.getSeq[Float](1).toArray).toMap
    val read = load().select("id", "vec").collect()
      .map(r => r.getLong(0) -> r.getSeq[Float](1).toArray).toMap
    assert(read.keySet == orig.keySet)
    read.foreach { case (id, v) => assert(v.sameElements(orig(id))) }
  }

  test("one input partition per index partition without filters") {
    assert(load().rdd.getNumPartitions == hqi.numPartitions)
  }

  test("pushed filters prune partitions via semantic descriptions") {
    val t2 = Templates.relatedQS(1) // artist template: selective
    val full = load()
    val filtered = full.filter(Pred.and(t2.preds))
    val prunedParts = filtered.rdd.getNumPartitions
    assert(prunedParts <= hqi.numPartitions)
    // The qd-tree was trained on this workload; T2's routing must match.
    val routedParts = hqi.route(t2, history.queries.head.vec).size
    assert(prunedParts == routedParts,
           s"V2 pruning ($prunedParts) should equal qd-tree routing ($routedParts)")
  }

  test("pruning never changes filter results (counts match the source of truth)") {
    for (t <- Templates.relatedQS) {
      val want = db.filter(Pred.and(t.preds)).count()
      val got = load().filter(Pred.and(t.preds)).count()
      assert(got == want, s"${t.name}: v2=$got direct=$want")
    }
  }

  test("column pruning: projected reads return correct values") {
    val got = load().select("id", "popularity").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    val want = db.select("id", "popularity").collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(got == want)
  }

  test("aggregates over the V2 source match DuckDB (oracle)") {
    val viaV2 = load().groupBy("etype").agg(count(lit(1)).cast("long").as("n"))
    val plain = db.select("id", "etype")
    Oracle.assertEquivalent(viaV2,
      "SELECT etype, CAST(count(*) AS BIGINT) AS n FROM v GROUP BY etype",
      "v" -> plain)
  }

  test("a flat index (no qd-tree) stores no semantics and never prunes") {
    val flat = IndexBuilder.buildFlat(db, KGData.AttrCols, Metric.IP)
    val dir = Files.createTempDirectory("hqi-flat").toString
    HQIStore.write(flat, dir)
    val meta = HQIStore.readMeta(dir)
    assert(meta.leaves.forall(_.semantic.isEmpty))
    val df = spark.read.format("hqi").load(dir)
    assert(df.filter(col("etype") === "person").rdd.getNumPartitions == 1)
    assert(df.count() == 3000)
    flat.unpersist()
  }
}
