package repro.core.engine

import org.apache.spark.sql.DataFrame
import repro.core.qdtree.{Pred, QDTree}
import repro.core.vec.{Metric, VectorOps}
import repro.workload.Template

/** How queries are routed to index partitions at query time. */
sealed trait Routing extends Serializable
object Routing {
  /** Every query visits every partition (PreFilter / PostFilter / flat). */
  case object All extends Routing
  /** Semantic-description routing over the qd-tree; `m` is the number of
    * nearest global centroids folded into each query's constraint (§4.1.1;
    * m = 0 disables centroid routing — the paper's best configuration).
    */
  final case class ByQDTree(m: Int) extends Routing
  /** Range-partitioned on one numeric attribute (Strategy C). */
  final case class ByRange(attr: String) extends Routing
}

/** Driver-side metadata for one physical partition (`__part` value).
  *
  * @param centroids IVF cell centroids; `__cluster` on the data is the index
  *                  of the nearest centroid here
  * @param range     [lo, hi) covered on the range attribute, for Strategy C
  */
final case class LeafMeta(partId: Int, size: Long,
                          centroids: Array[Array[Float]],
                          range: Option[(Double, Double)] = None)

/** A built, partitioned vector index: the physical layout lives in `data`
  * (columns `id, vec, <attrs…>, __part, __cluster`, repartitioned and cached
  * by `(__part, __cluster)`), everything needed for routing/probing lives in
  * driver metadata.
  */
final class PartitionedIndex(val name: String,
                             val data: DataFrame,
                             val attrCols: Seq[String],
                             val metric: Metric,
                             val leaves: Array[LeafMeta],
                             val routing: Routing,
                             val qdtree: Option[QDTree],
                             val globalCentroids: Option[Array[Array[Float]]],
                             val buildMillis: Long) extends Serializable {

  /** Stable identity for executor-side posting-list caching. */
  val indexId: String = java.util.UUID.randomUUID().toString

  val leafById: Map[Int, LeafMeta] = leaves.map(l => l.partId -> l).toMap
  def numPartitions: Int = leaves.length
  def totalRows: Long = leaves.map(_.size).sum

  /** Partitions a query with this template and vector must visit. */
  def route(template: Template, qvec: Array[Float]): Seq[Int] = routing match {
    case Routing.All => leaves.map(_.partId).toSeq
    case Routing.ByQDTree(m) =>
      val qc =
        if (m <= 0) Nil
        else globalCentroids.map(c => VectorOps.nearestN(qvec, c, m, repro.core.ivf.IVF.AssignMetric).toSeq).getOrElse(Nil)
      qdtree.map(_.routePreds(template.preds, qc)).getOrElse(leaves.map(_.partId).toSeq)
    case Routing.ByRange(attr) =>
      val parts = leaves.filter { l =>
        l.range.forall { case (lo, hi) => rangeMayMatch(template, attr, lo, hi) }
      }
      parts.map(_.partId).toSeq
  }

  /** Can a [lo, hi) bucket contain tuples satisfying the template's
    * predicates over the partitioning attribute? Predicates on other
    * attributes cannot prune range partitions (the paper's point about
    * Strategy C and non-partitioning attributes).
    */
  private def rangeMayMatch(template: Template, attr: String, lo: Double, hi: Double): Boolean =
    template.preds.forall {
      case Pred.NumCmp(a, op, v) if a == attr => op match {
        case Pred.Lt   => lo < v
        case Pred.Le   => lo <= v
        case Pred.Gt   => hi > v       // hi is exclusive: some x < hi with x > v needs hi > v + eps; conservative
        case Pred.Ge   => hi > v
        case Pred.EqOp => lo <= v && v < hi
      }
      case _ => true
    }

  def unpersist(): Unit = {
    data.unpersist()
    // local[*] shares the JVM with executors, so this clears their cache too;
    // in a distributed deployment entries simply age out.
    BatchEngine.CellCache.invalidate(indexId)
  }
}
