package repro.core

import org.apache.spark.sql.DataFrame

import repro.SparkSpec
import repro.core.engine._
import repro.core.vec.Metric
import repro.workload.{KGData, Templates, Workload}

/** Shared small-scale fixtures: one KG database and its indexes, built once
  * per test run (building indexes is the expensive part).
  */
object EngineFixtures {
  val N = 4000L
  val D = 8

  private var _db: DataFrame = _
  private var _history: Workload = _
  private var _hqi: PartitionedIndex = _
  private var _flat: PartitionedIndex = _

  def db(spec: SparkSpec): DataFrame = synchronized {
    if (_db == null) { _db = KGData.entities(spec.spark, N, D).cache(); _db.count() }
    _db
  }

  def history(spec: SparkSpec): Workload = synchronized {
    if (_history == null) _history = Templates.relatedQSWorkload(db(spec), split = 0, numQueries = 120)
    _history
  }

  def hqi(spec: SparkSpec): PartitionedIndex = synchronized {
    if (_hqi == null)
      _hqi = IndexBuilder.buildHQI(db(spec), KGData.AttrCols, Metric.IP, history(spec),
                                   HQIOptions(minSize = 256))
    _hqi
  }

  def flat(spec: SparkSpec): PartitionedIndex = synchronized {
    if (_flat == null) _flat = IndexBuilder.buildFlat(db(spec), KGData.AttrCols, Metric.IP)
    _flat
  }

  /** Exhaustive ground truth over `w` using any index (layout-independent). */
  def truth(spec: SparkSpec, w: Workload): Map[Long, Array[(Long, Float)]] =
    BatchEngine.run(flat(spec), w, EngineOptions(k = w.k, exhaustive = true)).results
}

class EngineSpec extends SparkSpec {
  import EngineFixtures._

  private lazy val workload = history(this)
  private lazy val gt = truth(this, workload)

  test("exhaustive run returns at most k results per query, sorted best-first") {
    assert(gt.nonEmpty)
    gt.values.foreach { rs =>
      assert(rs.length <= workload.k)
      assert(rs.sortBy(t => (t._2, t._1)).sameElements(rs))
    }
  }

  test("exhaustive results satisfy their query's attribute constraint") {
    val matchIds: Map[Int, Set[Long]] = workload.templates.map { t =>
      t.id -> db(this).filter(repro.core.qdtree.Pred.and(t.preds))
        .select("id").collect().map(_.getLong(0)).toSet
    }.toMap
    for (q <- workload.queries; (id, _) <- gt.getOrElse(q.qid, Array.empty)) {
      assert(matchIds(q.templateId).contains(id),
             s"query ${q.qid} (template ${q.templateId}) returned non-matching id $id")
    }
  }

  test("exhaustive results are identical across different index layouts") {
    val viaHqi = BatchEngine.run(hqi(this), workload, EngineOptions(k = workload.k, exhaustive = true)).results
    assert(viaHqi.keySet == gt.keySet)
    for ((qid, rs) <- gt) assert(viaHqi(qid).map(_._1).sameElements(rs.map(_._1)), s"qid $qid differs")
  }

  test("HQI with exhaustive per-partition probing equals ground truth (routing is safe at m=0)") {
    // Probe every cell but keep qd-tree routing: with m = 0 routing must
    // never lose a satisfying tuple, so results are exact.
    val maxCells = hqi(this).leaves.map(_.centroids.length).sum
    val run = BatchEngine.run(hqi(this), workload,
      EngineOptions(k = workload.k, defaultNprobe = maxCells))
    for ((qid, rs) <- gt)
      assert(run.results.getOrElse(qid, Array.empty).map(_._1).sameElements(rs.map(_._1)),
             s"qid $qid differs")
  }

  test("vector batching on/off produce identical results") {
    val on = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8, vectorBatching = true))
    val off = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8, vectorBatching = false))
    assert(on.results.keySet == off.results.keySet)
    for ((qid, rs) <- on.results) assert(off.results(qid).map(_._1).sameElements(rs.map(_._1)))
  }

  test("attribute batching on/off produce identical results but different filter work") {
    val on = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8, attrBatching = true))
    val off = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8, attrBatching = false))
    for ((qid, rs) <- on.results) assert(off.results(qid).map(_._1).sameElements(rs.map(_._1)))
    assert(off.metrics.filterRows > on.metrics.filterRows,
           "disabling attribute batching must repeat filter evaluations")
  }

  test("eager bitmap construction (Strategy B) produces identical results with more filter work") {
    val lazyRun = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8))
    val eager = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8, eagerBitmap = true))
    for ((qid, rs) <- lazyRun.results) assert(eager.results(qid).map(_._1).sameElements(rs.map(_._1)))
    assert(eager.metrics.filterRows >= lazyRun.metrics.filterRows)
    // Eager bitmaps touch every tuple once per template.
    assert(eager.metrics.filterRows >= N * workload.templates.size)
  }

  test("recall is monotone (non-decreasing) in nprobe") {
    val recalls = Seq(1, 4, 16, 64).map { np =>
      val run = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = np))
      Recall.overall(run.results, gt, workload.k)
    }
    recalls.sliding(2).foreach { case Seq(a, b) => assert(b >= a - 1e-9, s"recall dropped: $recalls") }
    assert(recalls.last >= 0.99, s"full-ish probing should be near-exact, got ${recalls.last}")
  }

  test("HQI scans fewer routed tuples than PreFilter for the same workload") {
    val h = BatchEngine.run(hqi(this), workload, EngineOptions(defaultNprobe = 4))
    val f = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 4))
    assert(h.metrics.routedTuples < f.metrics.routedTuples,
           s"qd-tree routing should prune partitions: hqi=${h.metrics.routedTuples} flat=${f.metrics.routedTuples}")
  }

  test("post-filtering (Strategy D) never returns non-matching tuples") {
    val run = BatchEngine.run(flat(this), workload,
      EngineOptions(defaultNprobe = 8, postFilter = true, postFilterExpansion = 4))
    val matchIds: Map[Int, Set[Long]] = workload.templates.map { t =>
      t.id -> db(this).filter(repro.core.qdtree.Pred.and(t.preds))
        .select("id").collect().map(_.getLong(0)).toSet
    }.toMap
    for (q <- workload.queries; (id, _) <- run.results.getOrElse(q.qid, Array.empty))
      assert(matchIds(q.templateId).contains(id))
  }

  test("post-filtering achieves lower or equal recall than pushdown at equal nprobe") {
    val push = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 4))
    val post = BatchEngine.run(flat(this), workload,
      EngineOptions(defaultNprobe = 4, postFilter = true, postFilterExpansion = 2))
    val rPush = Recall.overall(push.results, gt, workload.k)
    val rPost = Recall.overall(post.results, gt, workload.k)
    assert(rPost <= rPush + 0.05, s"post-filter recall $rPost should not beat pushdown $rPush")
  }

  test("counters: distance computations never exceed tuples scanned (pushdown)") {
    val run = BatchEngine.run(flat(this), workload, EngineOptions(defaultNprobe = 8))
    assert(run.metrics.distComps <= run.metrics.tuplesScanned)
    assert(run.metrics.tuplesScanned > 0)
  }

  test("results for a template matching zero tuples are empty, not an error") {
    // T1's selectivity target (0.005%) means zero matches at N=4000.
    val t1Count = db(this).filter(repro.core.qdtree.Pred.and(
      workload.templateById(1).preds)).count()
    if (t1Count == 0) {
      val w1 = workload.restrictedTo(Set(1))
      val run = BatchEngine.run(flat(this), w1, EngineOptions(defaultNprobe = 8))
      assert(run.results.values.forall(_.isEmpty) || run.results.isEmpty)
    }
  }

  test("engine results carry at most k entries per query under every strategy") {
    for (opts <- Seq(EngineOptions(defaultNprobe = 4),
                     EngineOptions(defaultNprobe = 4, postFilter = true),
                     EngineOptions(defaultNprobe = 4, vectorBatching = false))) {
      val run = BatchEngine.run(flat(this), workload, opts)
      run.results.values.foreach(rs => assert(rs.length <= workload.k))
    }
  }
}
