package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.engine._
import repro.core.qdtree.Pred
import repro.core.vec.Metric
import repro.workload.{Bigann, KGData, Templates}

class IndexBuilderSpec extends SparkSpec {

  private lazy val kg: DataFrame = { val d = KGData.entities(spark, 3000, 8).cache(); d.count(); d }
  private lazy val history = Templates.relatedQSWorkload(kg, 0, 100)
  private lazy val bg: DataFrame = { val d = Bigann.dataset(spark, 4096, 8).cache(); d.count(); d }

  test("flat index: one partition, sqrt(n) cells, every row assigned") {
    val idx = IndexBuilder.buildFlat(kg, KGData.AttrCols, Metric.IP)
    assert(idx.numPartitions == 1)
    assert(idx.leaves.head.centroids.length == 55) // round(sqrt(3000))
    assert(idx.totalRows == 3000)
    val parts = idx.data.select(IndexBuilder.PartCol).distinct().collect().map(_.getInt(0))
    assert(parts.toSeq == Seq(0))
    val clusters = idx.data.select(IndexBuilder.ClusterCol).distinct().count()
    assert(clusters > 1 && clusters <= 55)
    idx.unpersist()
  }

  test("flat index: __cluster equals driver-side nearest-centroid assignment") {
    val idx = IndexBuilder.buildFlat(kg, KGData.AttrCols, Metric.IP)
    val cents = idx.leaves.head.centroids
    val rows = idx.data.select("vec", IndexBuilder.ClusterCol).limit(200).collect()
    rows.foreach { r =>
      val v = r.getSeq[Float](0).toArray
      assert(r.getInt(1) == repro.core.ivf.IVF.assign(v, cents))
    }
    idx.unpersist()
  }

  test("HQI index: leaves cover all rows disjointly and routing metadata is present") {
    val idx = IndexBuilder.buildHQI(kg, KGData.AttrCols, Metric.IP, history, HQIOptions(minSize = 256))
    assert(idx.qdtree.isDefined)
    assert(idx.numPartitions > 1)
    assert(idx.leaves.map(_.size).sum == 3000)
    val partCounts = idx.data.groupBy(IndexBuilder.PartCol).count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    idx.leaves.foreach(l => assert(partCounts.getOrElse(l.partId, 0L) == l.size))
    idx.unpersist()
  }

  test("HQI index: per-leaf cell count is sqrt(leaf size)") {
    val idx = IndexBuilder.buildHQI(kg, KGData.AttrCols, Metric.IP, history, HQIOptions(minSize = 256))
    idx.leaves.filter(_.size > 0).foreach { l =>
      assert(l.centroids.length == math.max(1, math.round(math.sqrt(l.size.toDouble)).toInt))
    }
    idx.unpersist()
  }

  test("HQI with empty history degenerates to a flat index named HQI (the LP case)") {
    val empty = history.copy(queries = IndexedSeq.empty)
    val idx = IndexBuilder.buildHQI(kg, KGData.AttrCols, Metric.IP, empty)
    assert(idx.name == "HQI")
    assert(idx.numPartitions == 1)
    assert(idx.qdtree.isEmpty)
    idx.unpersist()
  }

  test("HQI routing reaches every leaf containing a matching tuple") {
    val idx = IndexBuilder.buildHQI(kg, KGData.AttrCols, Metric.IP, history, HQIOptions(minSize = 256))
    for (t <- history.templates) {
      val routed = idx.route(t, history.queries.head.vec).toSet
      val matchingParts = idx.data.filter(Pred.and(t.preds))
        .select(IndexBuilder.PartCol).distinct().collect().map(_.getInt(0)).toSet
      assert(matchingParts.subsetOf(routed),
             s"${t.name}: matching parts $matchingParts not all routed ($routed)")
    }
    idx.unpersist()
  }

  test("range index: equi-depth buckets on the partition attribute") {
    val idx = IndexBuilder.buildRange(bg, Bigann.AttrCols, Metric.L2, "a", numParts = 8)
    assert(idx.numPartitions == 8)
    assert(idx.leaves.map(_.size).sum == 4096)
    // Equi-depth: no bucket is wildly off 1/8 of the data.
    idx.leaves.foreach(l => assert(l.size > 4096 / 16 && l.size < 4096 / 4, s"bucket ${l.size}"))
    idx.unpersist()
  }

  test("range index: rows land in the bucket covering their attribute value") {
    val idx = IndexBuilder.buildRange(bg, Bigann.AttrCols, Metric.L2, "a", numParts = 8)
    val ranges = idx.leaves.map(l => l.partId -> l.range.get).toMap
    val rows = idx.data.select("a", IndexBuilder.PartCol).limit(500).collect()
    rows.foreach { r =>
      val (lo, hi) = ranges(r.getInt(1))
      val v = r.getDouble(0)
      assert(v >= lo && v < hi, s"value $v outside [$lo,$hi)")
    }
    idx.unpersist()
  }

  test("range routing prunes on the partitioning attribute but not the other") {
    val idx = IndexBuilder.buildRange(bg, Bigann.AttrCols, Metric.L2, "a", numParts = 8)
    val aSel = Bigann.templates(3)  // a < 2^-3
    val bSel = Bigann.templates(13) // b < 2^-3
    val aParts = idx.route(aSel, Array.fill(8)(0f))
    val bParts = idx.route(bSel, Array.fill(8)(0f))
    assert(aParts.size < idx.numPartitions, "predicate on partitioning attribute should prune")
    assert(bParts.size == idx.numPartitions, "predicate on the other attribute cannot prune")
    idx.unpersist()
  }

  test("range routing is safe: all matching tuples are in routed partitions") {
    val idx = IndexBuilder.buildRange(bg, Bigann.AttrCols, Metric.L2, "a", numParts = 8)
    for (t <- Bigann.templates.take(10)) {
      val routed = idx.route(t, Array.fill(8)(0f)).toSet
      val matching = idx.data.filter(Pred.and(t.preds))
        .select(IndexBuilder.PartCol).distinct().collect().map(_.getInt(0)).toSet
      assert(matching.subsetOf(routed), s"${t.name}")
    }
    idx.unpersist()
  }

  test("build times are recorded") {
    val idx = IndexBuilder.buildFlat(kg, KGData.AttrCols, Metric.IP)
    assert(idx.buildMillis > 0)
    idx.unpersist()
  }

  test("layout columns do not disturb the original attribute columns") {
    val idx = IndexBuilder.buildFlat(kg, KGData.AttrCols, Metric.IP)
    val got = idx.data.select("id", "etype", "popularity").collect()
      .map(r => (r.getLong(0), r.getString(1), r.getDouble(2))).sortBy(_._1)
    val want = kg.select("id", "etype", "popularity").collect()
      .map(r => (r.getLong(0), r.getString(1), r.getDouble(2))).sortBy(_._1)
    assert(got.sameElements(want))
    idx.unpersist()
  }
}
