package repro.harness

import org.apache.spark.sql.DataFrame

import repro.core.engine._
import repro.core.vec.Metric
import repro.workload.Workload

/** One strategy's measured numbers on one dataset. */
final case class StrategyRow(strategy: String,
                             buildMillis: Long,
                             runMillis: Long,
                             tuplesScanned: Long,
                             distComps: Long,
                             routedTuples: Long,
                             recall: Double,
                             reachedTarget: Boolean,
                             applicable: Boolean = true)

/** All strategies on one dataset, with ratio helpers for the paper's
  * "normalized by HQI" tables.
  */
final case class DatasetBench(dataset: String, rows: Seq[StrategyRow]) {
  private def row(s: String): Option[StrategyRow] = rows.find(_.strategy == s)

  /** Table 3 cell: strategy runtime / HQI runtime. */
  def slowdown(strategy: String): Option[Double] =
    for (h <- row("HQI"); s <- row(strategy) if s.applicable)
      yield s.runMillis.toDouble / math.max(1L, h.runMillis)

  /** Table 4 cell: strategy build time / HQI build time. */
  def buildRatio(strategy: String): Option[Double] =
    for (h <- row("HQI"); s <- row(strategy) if s.applicable)
      yield s.buildMillis.toDouble / math.max(1L, h.buildMillis)
}

/** Shared benchmarking harness: builds every applicable index for a dataset,
  * tunes each strategy per template to the target recall (§6.1), then times
  * one full batch pass per strategy (Table 3) and records build times
  * (Table 4).
  */
object Harness {

  final case class Config(k: Int = 10,
                          targetRecall: Double = 0.8,
                          tunePerTemplate: Int = 25,
                          minSize: Int = 4096,
                          rangeParts: Int = 16,
                          m: Int = 0)

  /** Engine options per strategy. All baselines batch queries by attribute
    * constraint (the paper enables this for every baseline); only HQI adds
    * vector-similarity batching (Algorithm 3). PreFilter additionally pays
    * Strategy B's full-dataset bitmap construction.
    */
  def strategyOpts(strategy: String, k: Int): EngineOptions = strategy match {
    case "HQI"        => EngineOptions(k = k, vectorBatching = true, attrBatching = true)
    case "PreFilter"  => EngineOptions(k = k, vectorBatching = false, attrBatching = true, eagerBitmap = true)
    case "PostFilter" => EngineOptions(k = k, vectorBatching = false, attrBatching = true, postFilter = true)
    case "Range"      => EngineOptions(k = k, vectorBatching = false, attrBatching = true)
    case other        => throw new IllegalArgumentException(s"unknown strategy $other")
  }

  /** Run every applicable strategy on one dataset.
    *
    * @param history   workload used for qd-tree training ([[Workload]] with
    *                  no queries = no history, the LP case)
    * @param rangeAttr Strategy C partitioning attribute; None marks Range
    *                  as not applicable (RelatedQS/LP have IN / IS NOT NULL
    *                  constraints over multiple attributes)
    */
  def benchDataset(name: String, db: DataFrame, attrCols: Seq[String], metric: Metric,
                   workload: Workload, history: Workload, rangeAttr: Option[String],
                   cfg: Config = Config(), quiet: Boolean = false): DatasetBench = {
    def log(s: String): Unit = if (!quiet) println(s"[bench:$name] $s")

    log(s"building indexes over ${db.count()} rows, |Q| = ${workload.size}")
    // Warm the build code paths (collect, k-means, layout) on a small sample
    // so the first timed build does not absorb JIT compilation, and start
    // each timed build from a settled heap.
    // (an id-filter, not limit(): limit is non-deterministic across the
    // multiple passes a build makes over its input)
    IndexBuilder.buildFlat(db.filter(org.apache.spark.sql.functions.col("id") < 2000),
                           attrCols, metric, name = "warmup").unpersist()
    System.gc()
    val hqiIdx = IndexBuilder.buildHQI(db, attrCols, metric, history,
      HQIOptions(minSize = cfg.minSize, m = cfg.m))
    log(s"HQI built in ${hqiIdx.buildMillis} ms (${hqiIdx.numPartitions} partitions)")
    System.gc()
    val flatIdx = IndexBuilder.buildFlat(db, attrCols, metric)
    log(s"PreFilter built in ${flatIdx.buildMillis} ms")
    val rangeIdx = rangeAttr.map { a =>
      System.gc()
      val r = IndexBuilder.buildRange(db, attrCols, metric, a, cfg.rangeParts)
      log(s"Range built in ${r.buildMillis} ms")
      r
    }

    // Exhaustive ground truth over the full workload (also the recall oracle).
    val gt = BatchEngine.run(flatIdx, workload, EngineOptions(k = cfg.k, exhaustive = true)).results
    log(s"ground truth computed for ${gt.size} queries")

    val sample = workload.sampledPerTemplate(cfg.tunePerTemplate)

    def timed(strategy: String, index: PartitionedIndex): StrategyRow = {
      val base = strategyOpts(strategy, cfg.k)
      val tuned =
        if (strategy == "PostFilter")
          Tuning.tunePostFilter(index, sample, gt, cfg.targetRecall, cfg.k)
        else
          Tuning.tuneNprobe(index, sample, gt, cfg.targetRecall, cfg.k, base = base)
      val opts = base.copy(nprobe = tuned.nprobe, postFilterExpansion = tuned.expansion)
      // Untimed warmup pass over the tuning sample so the first strategy
      // measured does not absorb JIT compilation and cache-warming costs.
      BatchEngine.run(index, sample, opts)
      var run = BatchEngine.run(index, workload, opts)
      if (strategy != "PostFilter") {
        // Best of two passes damps GC/scheduler noise (PostFilter is slow
        // enough that one pass suffices).
        val second = BatchEngine.run(index, workload, opts)
        if (second.metrics.wallMillis < run.metrics.wallMillis) run = second
      }
      val recall = Recall.overall(run.results, gt, cfg.k)
      val reached = recall >= cfg.targetRecall - 0.02
      log(f"$strategy%-10s run=${run.metrics.wallMillis}%6d ms scanned=${run.metrics.tuplesScanned}%12d " +
          f"dist=${run.metrics.distComps}%12d recall=$recall%.3f reached=$reached")
      StrategyRow(strategy, index.buildMillis, run.metrics.wallMillis,
                  run.metrics.tuplesScanned, run.metrics.distComps, run.metrics.routedTuples,
                  recall, reached)
    }

    val rows = Seq(
      timed("HQI", hqiIdx),
      timed("PreFilter", flatIdx),
      timed("PostFilter", flatIdx).copy(buildMillis = flatIdx.buildMillis)) ++
      (rangeIdx match {
        case Some(r) => Seq(timed("Range", r))
        case None => Seq(StrategyRow("Range", 0, 0, 0, 0, 0, 0.0,
                                     reachedTarget = false, applicable = false))
      })

    hqiIdx.unpersist(); flatIdx.unpersist(); rangeIdx.foreach(_.unpersist())
    DatasetBench(name, rows)
  }

  /** Render a ratio with the paper's "×" convention. */
  def fmtRatio(r: Option[Double]): String = r match {
    case Some(v) if v >= 10 => f"$v%.0f×"
    case Some(v)            => f"$v%.2f×"
    case None               => "NA"
  }

  /** Fixed-width table printer for bench output. */
  def renderTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (fmt(header) +: rows.map(fmt)).mkString("\n")
  }
}
