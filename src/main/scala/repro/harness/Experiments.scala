package repro.harness

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.engine._
import repro.core.qdtree.Pred
import repro.core.vec.Metric
import repro.workload._

/** Drivers reproducing each evaluation table of the paper. Each driver
  * returns structured results plus a rendered table with the paper's numbers
  * alongside the measured ones; bench suites assert on the structure and
  * print the rendering, and `jobs/` mains just print.
  */
object Experiments {

  /** Scaled-down stand-in sizes (DESIGN.md §6). */
  final case class Scale(n: Long = 100_000L, d: Int = 32, nqRelated: Int = 2000,
                         nqLp: Int = 1000, nqBigann: Int = 100, nqSift: Int = 10)

  // ------------------------------------------------------------------ Table 1

  final case class Table1Row(template: String, shares: Seq[Double], selectivity: Double)
  final case class Table1Result(rows: Seq[Table1Row], rendered: String)

  /** Paper Table 1 "feasible KG entities" targets, for display. */
  private val paperSel = Seq("<0.005%", "<0.1%", "<0.1%", "<0.5%", "<0.5%",
                             "<1%", "2.5%", "30%", "58%", "60%")

  def table1(spark: SparkSession, n: Long = 100_000L, d: Int = 16,
             queriesPerSplit: Int = 2000): Table1Result = {
    val db = KGData.entities(spark, n, d).cache()
    db.count()
    val splits = (0 to 3).map(s => Templates.relatedQSWorkload(db, s, queriesPerSplit))
    val rows = Templates.relatedQS.zipWithIndex.map { case (t, i) =>
      val shares = splits.map(w => w.queries.count(_.templateId == t.id).toDouble / w.size)
      val sel = db.filter(Pred.and(t.preds)).count().toDouble / n
      Table1Row(t.name, shares, sel)
    }
    val header = Seq("Template", "t0", "t1", "t2", "t3", "sel(measured)", "sel(paper)",
                     "t0(paper)", "t1(paper)", "t2(paper)", "t3(paper)")
    val paperShares = Templates.SplitFreqs.map(f => f.map(_.toDouble / f.sum))
    val body = rows.zipWithIndex.map { case (r, i) =>
      Seq(r.template) ++ r.shares.map(s => f"${s * 100}%.1f%%") ++
      Seq(f"${r.selectivity * 100}%.4f%%", paperSel(i)) ++
      (0 to 3).map(s => f"${paperShares(s)(i) * 100}%.1f%%")
    }
    db.unpersist()
    Table1Result(rows, Harness.renderTable(header, body))
  }

  // ------------------------------------------------------------------ Table 2

  def table2(scale: Scale = Scale()): String = {
    val header = Seq("Dataset", "n", "n_q", "Datatype", "Metric", "Attributes",
                     "paper n", "paper n_q", "paper dtype")
    val rows = Seq(
      Seq("SIFT-like", s"${scale.n}", s"${20 * scale.nqSift}", s"${scale.d} f32", "L2",
          "synthetic A,B", "100M", "10K·20", "128 uint8"),
      Seq("MSTuring-like", s"${scale.n}", s"${20 * scale.nqBigann}", s"${scale.d} f32", "L2",
          "synthetic A,B", "100M", "100K·20", "100 f32"),
      Seq("YandexT2I-like", s"${scale.n}", s"${20 * scale.nqBigann}", s"${scale.d + 16} f32", "IP",
          "synthetic A,B", "100M", "100K·20", "200 f32"),
      Seq("LP", s"${scale.n}", s"${scale.nqLp}", s"${scale.d} f32", "IP",
          "entity types", "-", "-", "128 f32"),
      Seq("RelatedQS", s"${scale.n}", s"${scale.nqRelated}", s"${scale.d} f32", "IP",
          "entity properties", "-", "-", "128 f32"))
    Harness.renderTable(header, rows)
  }

  // ------------------------------------------- Tables 3 & 4 (shared runs)

  final case class Table34Result(benches: Seq[DatasetBench],
                                 table3: String, table4: String)

  /** The five datasets of Table 2, scaled down. Public-benchmark stand-ins
    * train HQI on their own (synthetic) query log, as in the paper; LP has
    * no history.
    */
  def datasetBenches(spark: SparkSession, scale: Scale = Scale(),
                     cfg: Harness.Config = Harness.Config(), quiet: Boolean = false,
                     only: Option[Set[String]] = None): Seq[DatasetBench] = {
    def wanted(name: String) = only.forall(_.contains(name))
    val out = scala.collection.mutable.ArrayBuffer.empty[DatasetBench]

    if (wanted("RelatedQS") || wanted("LP")) {
      val kg = KGData.entities(spark, scale.n, scale.d).cache(); kg.count()
      if (wanted("RelatedQS")) {
        val w = Templates.relatedQSWorkload(kg, 0, scale.nqRelated)
        out += Harness.benchDataset("RelatedQS", kg, KGData.AttrCols, Metric.IP,
                                    w, history = w, rangeAttr = None, cfg, quiet)
      }
      if (wanted("LP")) {
        val w = Templates.lpWorkload(kg, scale.nqLp)
        out += Harness.benchDataset("LP", kg, KGData.AttrCols, Metric.IP,
                                    w, history = w.copy(queries = IndexedSeq.empty),
                                    rangeAttr = None, cfg, quiet)
      }
      kg.unpersist()
    }

    def bigannBench(name: String, d: Int, nq: Int, metric: Metric, seed: Long): Unit = {
      if (wanted(name)) {
        val db = Bigann.dataset(spark, scale.n, d, seed = seed).cache(); db.count()
        val w = Bigann.workload(nq, d, cfg.k, metric, seed = seed)
        out += Harness.benchDataset(name, db, Bigann.AttrCols, metric,
                                    w, history = w, rangeAttr = Some("a"), cfg, quiet)
        db.unpersist()
      }
    }
    bigannBench("MSTuring", scale.d, scale.nqBigann, Metric.L2, seed = 51)
    bigannBench("SIFT100M", scale.d, scale.nqSift, Metric.L2, seed = 52)
    bigannBench("YandexT2I", scale.d + 16, scale.nqBigann, Metric.IP, seed = 53)
    out.toSeq
  }

  /** Paper values for Tables 3 and 4 (slowdown / build-time vs HQI). */
  val paperTable3: Map[(String, String), String] = Map(
    ("PreFilter", "RelatedQS") -> "31×", ("PreFilter", "LP") -> "19×",
    ("PreFilter", "MSTuring") -> "3.6×", ("PreFilter", "SIFT100M") -> "0.97×",
    ("PreFilter", "YandexT2I") -> "1.7×",
    ("PostFilter", "RelatedQS") -> "136×", ("PostFilter", "LP") -> "-",
    ("PostFilter", "MSTuring") -> "22×", ("PostFilter", "SIFT100M") -> "4.1×",
    ("PostFilter", "YandexT2I") -> "5.4×",
    ("Range", "RelatedQS") -> "NA", ("Range", "LP") -> "NA",
    ("Range", "MSTuring") -> "5.22×", ("Range", "SIFT100M") -> "1.2×",
    ("Range", "YandexT2I") -> "3×")

  val paperTable4: Map[(String, String), String] = Map(
    ("PreFilter", "RelatedQS") -> "0.95×", ("PreFilter", "LP") -> "1×",
    ("PreFilter", "MSTuring") -> "2.8×", ("PreFilter", "SIFT100M") -> "2.15×",
    ("PreFilter", "YandexT2I") -> "1.9×",
    ("Range", "RelatedQS") -> "NA", ("Range", "LP") -> "NA",
    ("Range", "MSTuring") -> "0.85×", ("Range", "SIFT100M") -> "0.63×",
    ("Range", "YandexT2I") -> "0.58×")

  def renderTable3(benches: Seq[DatasetBench]): String = {
    val names = benches.map(_.dataset)
    val header = "Approach" +: names.flatMap(n => Seq(n, s"$n(paper)"))
    def cell(strategy: String, b: DatasetBench): Seq[String] = {
      val row = b.rows.find(_.strategy == strategy)
      val measured = row match {
        case Some(r) if !r.applicable => "NA"
        case Some(r) if !r.reachedTarget && strategy == "PostFilter" =>
          Harness.fmtRatio(b.slowdown(strategy)) + s" (recall ${f"${r.recall}%.2f"})"
        case Some(_) => Harness.fmtRatio(b.slowdown(strategy))
        case None => "?"
      }
      Seq(measured, paperTable3.getOrElse((strategy, b.dataset), if (strategy == "HQI") "1×" else "?"))
    }
    val rows = Seq("HQI", "PreFilter", "PostFilter", "Range").map { s =>
      s +: benches.flatMap(b =>
        if (s == "HQI") Seq("1×", "1×") else cell(s, b))
    }
    Harness.renderTable(header, rows)
  }

  def renderTable4(benches: Seq[DatasetBench]): String = {
    val header = "Approach" +: benches.map(_.dataset).flatMap(n => Seq(n, s"$n(paper)"))
    val rows = Seq("HQI", "PreFilter", "Range").map { s =>
      s +: benches.flatMap { b =>
        val measured =
          if (s == "HQI") "1×"
          else b.rows.find(_.strategy == s) match {
            case Some(r) if !r.applicable => "NA"
            case _ => Harness.fmtRatio(b.buildRatio(s))
          }
        Seq(measured,
            if (s == "HQI") "1×" else paperTable4.getOrElse((s, b.dataset), "?"))
      }
    }
    Harness.renderTable(header, rows)
  }

  def tables3and4(spark: SparkSession, scale: Scale = Scale(),
                  cfg: Harness.Config = Harness.Config(),
                  only: Option[Set[String]] = None): Table34Result = {
    val benches = datasetBenches(spark, scale, cfg, quiet = false, only)
    Table34Result(benches, renderTable3(benches), renderTable4(benches))
  }

  // ------------------------------------------------------------------ Table 5

  final case class Table5Result(qps: Map[(String, Int), Double],
                                scanned: Map[(String, Int), Long],
                                recall: Map[(String, Int), Double],
                                rendered: String)

  /** HQI trained on t0 only, then each split t0..t3 evaluated on the frozen
    * index; QPS normalized by HQI@t0 (paper Table 5).
    */
  def table5(spark: SparkSession, n: Long = 100_000L, d: Int = 32,
             queriesPerSplit: Int = 4500, cfg: Harness.Config = Harness.Config()): Table5Result = {
    val kg = KGData.entities(spark, n, d).cache(); kg.count()
    val splits = (0 to 3).map(s => Templates.relatedQSWorkload(kg, s, queriesPerSplit))
    val t0 = splits.head

    val hqiIdx = IndexBuilder.buildHQI(kg, KGData.AttrCols, Metric.IP, t0,
      HQIOptions(minSize = cfg.minSize, m = cfg.m))
    val flatIdx = IndexBuilder.buildFlat(kg, KGData.AttrCols, Metric.IP)

    val gt0 = BatchEngine.run(flatIdx, t0, EngineOptions(k = cfg.k, exhaustive = true)).results
    val sample = t0.sampledPerTemplate(cfg.tunePerTemplate)
    val hqiTune = Tuning.tuneNprobe(hqiIdx, sample, gt0, cfg.targetRecall, cfg.k,
                                    base = Harness.strategyOpts("HQI", cfg.k))
    val preTune = Tuning.tuneNprobe(flatIdx, sample, gt0, cfg.targetRecall, cfg.k,
                                    base = Harness.strategyOpts("PreFilter", cfg.k))

    // Untimed warmup passes (JIT + posting-cache residency) for both indexes.
    BatchEngine.run(hqiIdx, sample, Harness.strategyOpts("HQI", cfg.k).copy(nprobe = hqiTune.nprobe))
    BatchEngine.run(flatIdx, sample, Harness.strategyOpts("PreFilter", cfg.k).copy(nprobe = preTune.nprobe))

    val qps = scala.collection.mutable.HashMap.empty[(String, Int), Double]
    val scanned = scala.collection.mutable.HashMap.empty[(String, Int), Long]
    val recall = scala.collection.mutable.HashMap.empty[(String, Int), Double]
    for ((w, s) <- splits.zipWithIndex) {
      // Per-split exhaustive ground truth (splits t1..t3 are *unseen* by the
      // t0-trained index and the t0-tuned nprobe values).
      val gtS = if (s == 0) gt0
                else BatchEngine.run(flatIdx, w, EngineOptions(k = cfg.k, exhaustive = true)).results
      // Best of two timed passes per cell to damp scheduler/GC noise.
      def best(run: => EngineRun): EngineRun = {
        val first = run
        val second = run
        if (second.metrics.wallMillis < first.metrics.wallMillis) second else first
      }
      val hr = best(BatchEngine.run(hqiIdx, w,
        Harness.strategyOpts("HQI", cfg.k).copy(nprobe = hqiTune.nprobe)))
      val pr = best(BatchEngine.run(flatIdx, w,
        Harness.strategyOpts("PreFilter", cfg.k).copy(nprobe = preTune.nprobe)))
      qps(("HQI", s)) = w.size * 1000.0 / math.max(1L, hr.metrics.wallMillis)
      qps(("PreFilter", s)) = w.size * 1000.0 / math.max(1L, pr.metrics.wallMillis)
      scanned(("HQI", s)) = hr.metrics.tuplesScanned
      scanned(("PreFilter", s)) = pr.metrics.tuplesScanned
      recall(("HQI", s)) = Recall.overall(hr.results, gtS, cfg.k)
      recall(("PreFilter", s)) = Recall.overall(pr.results, gtS, cfg.k)
    }
    hqiIdx.unpersist(); flatIdx.unpersist(); kg.unpersist()

    val base = qps(("HQI", 0))
    val paper = Map(("HQI", 0) -> "1×", ("HQI", 1) -> "1.05×", ("HQI", 2) -> "1.03×",
                    ("HQI", 3) -> "1.05×", ("PreFilter", 0) -> ".032×",
                    ("PreFilter", 1) -> ".031×", ("PreFilter", 2) -> ".032×",
                    ("PreFilter", 3) -> ".032×")
    val header = Seq("Approach", "t0", "t1", "t2", "t3",
                     "t0(paper)", "t1(paper)", "t2(paper)", "t3(paper)")
    val rows = Seq("HQI", "PreFilter").map { s =>
      s +: ((0 to 3).map(i => f"${qps((s, i)) / base}%.3f×") ++
            (0 to 3).map(i => paper((s, i))))
    }
    val scanRows = Seq("HQI", "PreFilter").map { s =>
      s +: (0 to 3).map(i => f"${scanned((s, i))}%d (recall ${recall((s, i))}%.2f)")
    }
    val rendered = Harness.renderTable(header, rows) +
      "\n\ntuples scanned per split (deterministic):\n" +
      Harness.renderTable(Seq("Approach", "t0", "t1", "t2", "t3"), scanRows)
    Table5Result(qps.toMap, scanned.toMap, recall.toMap, rendered)
  }
}
