package repro.core.engine

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import org.apache.spark.util.LongAccumulator

import scala.collection.mutable

import repro.core.ivf.IVF
import repro.core.qdtree.Pred
import repro.core.vec.{Metric, TopK, VectorOps}
import repro.core.vec.BatchScorer
import repro.workload.Workload

/** Execution options for one batch pass (Algorithm 3 plus the §2.2 baseline
  * behaviours, selected by flags).
  *
  * @param nprobe          per-template number of IVF cells scanned per
  *                        partition (tuned per template, §6.1); missing
  *                        templates fall back to `defaultNprobe`
  * @param vectorBatching  group queries by probed cell and score each
  *                        (filter, cell) group with one batched kernel
  *                        (§5); off = per-query scans
  * @param attrBatching    evaluate each template's filter once per cell and
  *                        share the bitmap across its queries; off = each
  *                        query re-evaluates the filter (the "No batching"
  *                        baseline of Fig. 7c)
  * @param postFilter      Strategy D: ignore filters during the scan, keep
  *                        `k × postFilterExpansion` candidates, filter after
  * @param eagerBitmap     Strategy B bitmap construction: evaluate every
  *                        template's filter over every local tuple up front
  *                        (full-dataset bitmaps), instead of lazily only in
  *                        probed cells
  * @param exhaustive      Strategy A: visit every cell of every partition
  *                        regardless of routing — exact results, used as
  *                        ground truth
  */
final case class EngineOptions(k: Int = 10,
                               nprobe: Map[Int, Int] = Map.empty,
                               defaultNprobe: Int = 8,
                               vectorBatching: Boolean = true,
                               attrBatching: Boolean = true,
                               postFilter: Boolean = false,
                               postFilterExpansion: Int = 4,
                               eagerBitmap: Boolean = false,
                               exhaustive: Boolean = false) {
  def heapK: Int = if (postFilter) k * postFilterExpansion else k
}

/** Work counters for one batch pass.
  *
  * @param tuplesScanned  posting-list entries visited, summed per query (the
  *                       paper's "number of tuples scanned")
  * @param distComps      vector score computations performed
  * @param filterRows     tuple-level predicate evaluations performed
  * @param routedTuples   Σ over queries of the sizes of partitions routed to
  *                       (the pruning-power numerator of Fig. 5)
  */
final case class EngineMetrics(tuplesScanned: Long,
                               distComps: Long,
                               filterRows: Long,
                               routedTuples: Long,
                               wallMillis: Long)

/** Result of a batch pass: per query, the top-k `(id, score)` best-first. */
final case class EngineRun(results: Map[Long, Array[(Long, Float)]], metrics: EngineMetrics)

object BatchEngine {

  /** Serializable plan shipped to executors. Probe keys pack (part, cell). */
  private final case class ExecPlan(queryQids: Array[Long],
                                    queryTids: Array[Int],
                                    queryVecs: Array[Array[Float]],
                                    templates: Map[Int, Seq[Pred]],
                                    probes: Map[Long, Array[Int]],
                                    attrCols: Seq[String],
                                    indexId: String,
                                    metric: Metric,
                                    heapK: Int,
                                    vectorBatching: Boolean,
                                    attrBatching: Boolean,
                                    postFilter: Boolean,
                                    eagerBitmap: Boolean)

  private def key(part: Int, cell: Int): Long = (part.toLong << 32) | (cell.toLong & 0xffffffffL)

  /** Execute a hybrid-query workload against a partitioned index in one
    * distributed pass (plus a Catalyst window merge), per Algorithm 3.
    */
  def run(index: PartitionedIndex, workload: Workload, opts: EngineOptions): EngineRun = {
    val t0 = System.currentTimeMillis()
    val spark = index.data.sparkSession
    val sc = spark.sparkContext

    // ---- Driver planning: route queries to partitions, pick probe cells. ----
    val nq = workload.queries.length
    val qQids = new Array[Long](nq)
    val qTids = new Array[Int](nq)
    val qVecs = new Array[Array[Float]](nq)
    var routedTuples = 0L
    val probes = mutable.HashMap.empty[Long, mutable.ArrayBuilder.ofInt]
    // Routing is per-template unless centroid routing (m > 0) is active.
    val perQueryRouting = index.routing match {
      case Routing.ByQDTree(m) if m > 0 => true
      case _                            => false
    }
    val routeCache = mutable.HashMap.empty[Int, Seq[Int]]
    val allParts = index.leaves.map(_.partId).toSeq

    // Per-query probe selection. nprobe counts cells *globally across the
    // query's routed partitions*, ranked by centroid distance — per-partition
    // IVFs behave as one IVF over the union of their centroids, which keeps
    // nprobe semantics comparable across single- and multi-partition layouts.
    val perQueryCells = new Array[Array[Long]](nq)
    val routedSizes = new Array[Long](nq)
    val planQuery: Int => Unit = { qi =>
      val q = workload.queries(qi)
      qQids(qi) = q.qid; qTids(qi) = q.templateId; qVecs(qi) = q.vec
      val template = workload.templateById(q.templateId)
      val routed: Seq[Int] =
        if (opts.exhaustive) allParts
        else if (perQueryRouting) index.route(template, q.vec)
        else routeCache.synchronized {
          routeCache.getOrElseUpdate(q.templateId, index.route(template, q.vec))
        }
      routedSizes(qi) = routed.iterator.map(index.leafById(_).size).sum
      if (opts.exhaustive) {
        perQueryCells(qi) = routed.iterator.flatMap { part =>
          index.leafById(part).centroids.indices.iterator.map(c => key(part, c))
        }.toArray
      } else {
        val np = opts.nprobe.getOrElse(q.templateId, opts.defaultNprobe)
        val heap = new TopK(np)
        for (part <- routed) {
          val cents = index.leafById(part).centroids
          var ci = 0
          while (ci < cents.length) {
            heap.push(IVF.AssignMetric.score(q.vec, cents(ci)), key(part, ci))
            ci += 1
          }
        }
        perQueryCells(qi) = heap.sorted.map(_._2)
      }
    }
    // Cell ranking over routed partitions is the planning hot loop —
    // parallelize it across the driver's cores.
    java.util.stream.IntStream.range(0, nq).parallel().forEach(qi => planQuery(qi))

    var qi = 0
    while (qi < nq) {
      routedTuples += routedSizes(qi)
      val cs = perQueryCells(qi)
      var ci = 0
      while (ci < cs.length) {
        probes.getOrElseUpdate(cs(ci), new mutable.ArrayBuilder.ofInt) += qi
        ci += 1
      }
      qi += 1
    }

    val plan = ExecPlan(
      qQids, qTids, qVecs,
      workload.templates.map(t => t.id -> t.preds).toMap,
      probes.iterator.map { case (k, b) => k -> b.result() }.toMap,
      index.attrCols, index.indexId, index.metric, opts.heapK,
      opts.vectorBatching, opts.attrBatching, opts.postFilter, opts.eagerBitmap)
    val planB = sc.broadcast(plan)

    val accScanned = sc.longAccumulator("tuplesScanned")
    val accDist = sc.longAccumulator("distComps")
    val accFilter = sc.longAccumulator("filterRows")

    // ---- Distributed scan (Algorithm 3 per Spark partition). ----
    val schema = index.data.schema
    val idIdx = schema.fieldIndex("id")
    val vecIdx = schema.fieldIndex("vec")
    val partIdx = schema.fieldIndex(IndexBuilder.PartCol)
    val clusterIdx = schema.fieldIndex(IndexBuilder.ClusterCol)
    val attrIdx: Seq[(String, Int)] = index.attrCols.map(a => a -> schema.fieldIndex(a))

    val resultRdd = index.data.rdd.mapPartitions { rows =>
      scanPartition(rows, planB.value, idIdx, vecIdx, partIdx, clusterIdx, attrIdx,
                    accScanned, accDist, accFilter)
    }

    val resultSchema = StructType(Seq(
      StructField("qid", LongType, nullable = false),
      StructField("tid", IntegerType, nullable = false),
      StructField("id", LongType, nullable = false),
      StructField("score", FloatType, nullable = false)))
    val partial = spark.createDataFrame(resultRdd, resultSchema)

    // ---- Global top-k merge (Catalyst window). ----
    val w = Window.partitionBy("qid").orderBy(col("score").asc, col("id").asc)
    val merged: DataFrame =
      if (!opts.postFilter) {
        partial.withColumn("rank", row_number().over(w)).filter(col("rank") <= opts.k)
      } else {
        // Strategy D: global top-heapK first, attribute filter afterwards.
        val kept = partial.withColumn("rank0", row_number().over(w))
          .filter(col("rank0") <= opts.heapK).drop("rank0")
        val matchDf = workload.templates.map { t =>
          index.data.filter(Pred.and(t.preds)).select(col("id"), lit(t.id).as("tid"))
        }.reduce(_ unionByName _)
        kept.join(matchDf, Seq("tid", "id"), "left_semi")
          .withColumn("rank", row_number().over(w)).filter(col("rank") <= opts.k)
      }

    val collected = merged.select("qid", "id", "score").collect()
    val results: Map[Long, Array[(Long, Float)]] =
      collected.groupBy(_.getLong(0)).map { case (qid, rs) =>
        qid -> rs.map(r => (r.getLong(1), r.getFloat(2))).sortBy(t => (t._2, t._1))
      }

    val wall = System.currentTimeMillis() - t0
    planB.destroy()
    EngineRun(results,
      EngineMetrics(accScanned.value, accDist.value, accFilter.value, routedTuples, wall))
  }

  /** Per-Spark-partition execution: group local rows into (part, cell)
    * posting lists, then evaluate each (filter, cell) query group — one
    * filter pass (bitmap) and one batched score kernel per group.
    */
  /** One materialized posting-list entry held in the executor-side cache. */
  private[engine] final class Entry(val id: Long, val vec: Array[Float], val attrs: Array[Any])

  /** Executor-side posting-list cache: a [[PartitionedIndex]] is immutable
    * once built, so each Spark partition's decoded posting lists are parsed
    * from the cached DataFrame once and reused across every batch pass over
    * the same index — the in-memory index residency a real vector database
    * has, without which every run would re-pay row decoding.
    */
  private[engine] object CellCache {
    private val cache =
      new java.util.concurrent.ConcurrentHashMap[(String, Int), mutable.HashMap[Long, Array[Entry]]]()
    private val order = new java.util.concurrent.ConcurrentLinkedQueue[(String, Int)]()
    private val MaxKeys = 512

    def get(k: (String, Int)): mutable.HashMap[Long, Array[Entry]] = cache.get(k)

    def put(k: (String, Int), v: mutable.HashMap[Long, Array[Entry]]): Unit = {
      if (cache.putIfAbsent(k, v) == null) {
        order.add(k)
        while (cache.size > MaxKeys) {
          val victim = order.poll()
          if (victim != null) cache.remove(victim) else return
        }
      }
    }

    /** Drop every cached partition of one index (local-mode unpersist). */
    def invalidate(indexId: String): Unit = {
      val it = cache.keySet.iterator
      while (it.hasNext) if (it.next()._1 == indexId) it.remove()
    }
  }

  private def scanPartition(rows: Iterator[Row], plan: ExecPlan,
                            idIdx: Int, vecIdx: Int, partIdx: Int, clusterIdx: Int,
                            attrIdx: Seq[(String, Int)],
                            accScanned: LongAccumulator, accDist: LongAccumulator,
                            accFilter: LongAccumulator): Iterator[Row] = {
    // Compile each template's predicates against positions in the per-row
    // attribute array, so filter evaluation is array indexing, not map
    // lookups, on the hot path.
    val attrPos: Map[String, Int] = attrIdx.map(_._1).zipWithIndex.toMap
    val compiled: Map[Int, Array[(Pred, Int)]] = plan.templates.map { case (tid, preds) =>
      tid -> preds.map(p => (p, attrPos.getOrElse(p.attr, -1))).toArray
    }
    val rowIdx: Array[Int] = attrIdx.map(_._2).toArray

    // Decode this Spark partition's posting lists once per index; later
    // passes over the same index partition hit the cache.
    val cacheKey = (plan.indexId, org.apache.spark.TaskContext.getPartitionId())
    val cells: mutable.HashMap[Long, Array[Entry]] = {
      val hit = CellCache.get(cacheKey)
      if (hit != null) hit
      else {
        val built = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Entry]]
        rows.foreach { r =>
          val k = key(r.getInt(partIdx), r.getInt(clusterIdx))
          val attrs = new Array[Any](rowIdx.length)
          var i = 0
          while (i < rowIdx.length) {
            attrs(i) = if (r.isNullAt(rowIdx(i))) null else r.get(rowIdx(i))
            i += 1
          }
          built.getOrElseUpdate(k, mutable.ArrayBuffer.empty[Entry]) +=
            new Entry(r.getLong(idIdx), r.getSeq[Float](vecIdx).toArray, attrs)
        }
        val frozen = built.map { case (k, b) => k -> b.toArray }
        CellCache.put(cacheKey, frozen)
        frozen
      }
    }

    def evalFilter(preds: Array[(Pred, Int)], buf: Array[Entry]): Array[Boolean] = {
      accFilter.add(buf.length)
      val out = new Array[Boolean](buf.length)
      var i = 0
      while (i < buf.length) {
        val attrs = buf(i).attrs
        var ok = true
        var p = 0
        while (ok && p < preds.length) {
          val (pred, pos) = preds(p)
          ok = pred.evalValue(if (pos >= 0) attrs(pos) else null)
          p += 1
        }
        out(i) = ok
        i += 1
      }
      out
    }

    // Strategy B's full-dataset bitmap construction: every template's filter
    // over every local tuple, up front.
    val eagerMasks: Map[(Long, Int), Array[Boolean]] =
      if (!plan.eagerBitmap) Map.empty
      else (for {
        (ck, buf) <- cells.iterator
        (tid, preds) <- compiled.iterator
      } yield (ck, tid) -> evalFilter(preds, buf)).toMap

    val heaps = mutable.HashMap.empty[Int, TopK]
    def heapOf(qi: Int): TopK = heaps.getOrElseUpdate(qi, new TopK(plan.heapK))
    val scorer = new repro.core.vec.BatchScorer

    for ((ck, buf) <- cells; qidxs <- plan.probes.get(ck)) {
      val byTemplate = qidxs.groupBy(plan.queryTids(_))
      for ((tid, qs) <- byTemplate) {
        accScanned.add(buf.length.toLong * qs.length)
        val mask: Array[Boolean] =
          if (plan.postFilter) null
          else if (plan.eagerBitmap) eagerMasks((ck, tid))
          else if (plan.attrBatching) evalFilter(compiled(tid), buf)
          else {
            // No attribute batching: each query pays its own filter pass.
            var m: Array[Boolean] = null
            qs.foreach(_ => m = evalFilter(compiled(tid), buf))
            m
          }
        if (plan.vectorBatching) {
          // Algorithm 3: one shared posting-list pass builds the candidate
          // set (posting list ∩ filter bitmap, §4.2 pushdown), then a single
          // batched kernel scores the whole query group against it.
          val candIdx = new mutable.ArrayBuilder.ofInt
          var i = 0
          while (i < buf.length) { if (mask == null || mask(i)) candIdx += i; i += 1 }
          val cand = candIdx.result()
          if (cand.nonEmpty) {
            accDist.add(cand.length.toLong * qs.length)
            val qvecs = qs.map(plan.queryVecs(_))
            val candVecs = cand.map(buf(_).vec)
            val flat = scorer.scores(qvecs, candVecs, plan.metric)
            val n = cand.length
            var a = 0
            while (a < qs.length) {
              val h = heapOf(qs(a)); val base = a * n
              var b = 0
              while (b < n) { h.push(flat(base + b), buf(cand(b)).id); b += 1 }
              a += 1
            }
          }
        } else {
          // Baseline index traversal (Strategies B/C/D): every query walks
          // the posting list itself, testing the bitmap per entry — no
          // sharing of scans or distance computations across queries.
          var dist = 0L
          var a = 0
          while (a < qs.length) {
            val h = heapOf(qs(a)); val qv = plan.queryVecs(qs(a))
            var b = 0
            while (b < buf.length) {
              if (mask == null || mask(b)) {
                val e = buf(b)
                h.push(plan.metric.score(qv, e.vec), e.id)
                dist += 1
              }
              b += 1
            }
            a += 1
          }
          accDist.add(dist)
        }
      }
    }

    heaps.iterator.flatMap { case (qi, h) =>
      h.sorted.iterator.map { case (score, id) =>
        Row(plan.queryQids(qi), plan.queryTids(qi), id, score)
      }
    }
  }
}
