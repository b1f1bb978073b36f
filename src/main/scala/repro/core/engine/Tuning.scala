package repro.core.engine

import repro.workload.Workload

/** Per-template parameter tuning (§6.1: "nprobe … is tuned for each query
  * template to reach the target recall").
  *
  * Tuning runs the engine over a per-template query sample at escalating
  * nprobe (and, for PostFilter, candidate-expansion) settings, fixing each
  * template at the first setting that reaches the target. Templates that
  * never reach it keep the largest setting; their achieved recall is
  * reported so benches can mark them "target not reached" as the paper does
  * for PostFilter on LP.
  */
object Tuning {

  final case class TuneResult(nprobe: Map[Int, Int],
                              expansion: Int,
                              achievedRecall: Map[Int, Double]) {
    def allReached(target: Double): Boolean = achievedRecall.values.forall(_ >= target - 1e-9)
  }

  val DefaultGrid: Seq[Int] = Seq(1, 2, 4, 8, 16, 32, 64, 128, 256, 512, 1024)

  /** Tune nprobe per template for a pushdown-style strategy. `truth` must be
    * exhaustive results for (at least) `sample`'s queries.
    */
  def tuneNprobe(index: PartitionedIndex, sample: Workload,
                 truth: Map[Long, Array[(Long, Float)]],
                 target: Double = 0.8, k: Int = 10,
                 grid: Seq[Int] = DefaultGrid,
                 base: EngineOptions = EngineOptions()): TuneResult = {
    val assigned = scala.collection.mutable.HashMap.empty[Int, Int]
    val achieved = scala.collection.mutable.HashMap.empty[Int, Double]
    var remaining: Set[Int] = sample.templates.map(_.id).toSet

    for (np <- grid if remaining.nonEmpty) {
      val sub = sample.restrictedTo(remaining)
      val run = BatchEngine.run(index, sub,
        base.copy(k = k, nprobe = remaining.map(_ -> np).toMap, defaultNprobe = np))
      val rec = Recall.perTemplate(run.results, truth.filter(t => sub.queries.exists(_.qid == t._1)), sub, k)
      for ((tid, r) <- rec) {
        achieved(tid) = r
        if (r >= target - 1e-9 && remaining.contains(tid)) {
          assigned(tid) = np
          remaining -= tid
        }
      }
    }
    remaining.foreach(tid => assigned(tid) = grid.last)
    TuneResult(assigned.toMap, base.postFilterExpansion, achieved.toMap)
  }

  /** Tune PostFilter: nprobe and candidate expansion escalate together,
    * since low-selectivity filters need both wider probing and more
    * unfiltered candidates to survive post-filtering.
    */
  def tunePostFilter(index: PartitionedIndex, sample: Workload,
                     truth: Map[Long, Array[(Long, Float)]],
                     target: Double = 0.8, k: Int = 10,
                     steps: Seq[(Int, Int)] = Seq((2, 2), (4, 4), (8, 8), (16, 16),
                                                  (32, 32), (64, 64), (128, 64), (256, 64)))
      : TuneResult = {
    val assignedNp = scala.collection.mutable.HashMap.empty[Int, Int]
    val assignedExp = scala.collection.mutable.HashMap.empty[Int, Int]
    val achieved = scala.collection.mutable.HashMap.empty[Int, Double]
    var remaining: Set[Int] = sample.templates.map(_.id).toSet

    for ((np, exp) <- steps if remaining.nonEmpty) {
      val sub = sample.restrictedTo(remaining)
      val run = BatchEngine.run(index, sub,
        EngineOptions(k = k, nprobe = remaining.map(_ -> np).toMap, defaultNprobe = np,
                      postFilter = true, postFilterExpansion = exp))
      val rec = Recall.perTemplate(run.results, truth.filter(t => sub.queries.exists(_.qid == t._1)), sub, k)
      for ((tid, r) <- rec) {
        achieved(tid) = r
        if (r >= target - 1e-9 && remaining.contains(tid)) {
          assignedNp(tid) = np; assignedExp(tid) = exp
          remaining -= tid
        }
      }
    }
    remaining.foreach { tid => assignedNp(tid) = steps.last._1; assignedExp(tid) = steps.last._2 }
    // A single expansion applies engine-wide; take the max any template needs.
    val exp = if (assignedExp.isEmpty) steps.last._2 else assignedExp.values.max
    TuneResult(assignedNp.toMap, exp, achieved.toMap)
  }
}
