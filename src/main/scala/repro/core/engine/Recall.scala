package repro.core.engine

import repro.workload.Workload

/** Recall@k against exhaustive ground truth (§6.1's evaluation metric):
  * the fraction of each query's true top-k present in the returned set,
  * averaged over queries. When fewer than k tuples satisfy a filter, the
  * denominator is the ground-truth size (all valid results found = 1.0).
  */
object Recall {

  def perQuery(results: Map[Long, Array[(Long, Float)]],
               truth: Map[Long, Array[(Long, Float)]], k: Int): Map[Long, Double] =
    truth.map { case (qid, gt) =>
      val gtIds = gt.take(k).map(_._1).toSet
      if (gtIds.isEmpty) qid -> 1.0
      else {
        val got = results.getOrElse(qid, Array.empty).take(k).map(_._1).toSet
        qid -> got.intersect(gtIds).size.toDouble / gtIds.size
      }
    }

  def overall(results: Map[Long, Array[(Long, Float)]],
              truth: Map[Long, Array[(Long, Float)]], k: Int): Double = {
    val pq = perQuery(results, truth, k)
    if (pq.isEmpty) 1.0 else pq.values.sum / pq.size
  }

  /** Mean recall per template id. */
  def perTemplate(results: Map[Long, Array[(Long, Float)]],
                  truth: Map[Long, Array[(Long, Float)]],
                  workload: Workload, k: Int): Map[Int, Double] = {
    val pq = perQuery(results, truth, k)
    workload.queries.groupBy(_.templateId).map { case (tid, qs) =>
      val rs = qs.flatMap(q => pq.get(q.qid))
      tid -> (if (rs.isEmpty) 1.0 else rs.sum / rs.size)
    }
  }
}
