package repro.workload

import repro.core.qdtree.Pred
import repro.core.vec.Metric

/** A predicate template (Definition 2's attribute constraint): a conjunction
  * of unary predicates shared by many queries — the unit of filter
  * commonality in the paper's workloads (Table 1's T1..T10).
  */
final case class Template(id: Int, name: String, preds: Seq[Pred]) {
  def describe: String = preds.map(_.describe).mkString(" AND ")
}

/** One hybrid query: a feature vector plus (by reference) an attribute
  * constraint template. `qid` is unique within a workload.
  */
final case class HybridQuery(qid: Long, templateId: Int, vec: Array[Float])

/** A batch hybrid-query workload (Definition 3's Q) with its search
  * parameters. `templates` must cover every `templateId` in `queries`.
  */
final case class Workload(templates: Seq[Template],
                          queries: IndexedSeq[HybridQuery],
                          k: Int,
                          metric: Metric) {
  val templateById: Map[Int, Template] = templates.map(t => t.id -> t).toMap
  require(queries.forall(q => templateById.contains(q.templateId)),
          "every query must reference a known template")

  def size: Int = queries.length

  /** Sub-workload with at most `perTemplate` queries from each template —
    * used for recall tuning so tuning cost stays bounded.
    */
  def sampledPerTemplate(perTemplate: Int): Workload = {
    val sampled = queries.groupBy(_.templateId).valuesIterator
      .flatMap(_.take(perTemplate)).toIndexedSeq.sortBy(_.qid)
    copy(queries = sampled)
  }

  /** Sub-workload restricted to the given templates. */
  def restrictedTo(templateIds: Set[Int]): Workload =
    copy(queries = queries.filter(q => templateIds.contains(q.templateId)))
}
