package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.util.Random

import repro.core.qdtree.Pred._
import repro.core.vec.Metric
import repro.data.VectorData

/** BIGANN-style benchmark stand-ins (Table 2's SIFT-100M / MSTuring-100M /
  * YandexT2I-100M rows) with the paper's synthetic-attribute protocol
  * (§6.1): two random float attributes A and B, and 20 range predicates —
  * 10 per attribute, predicate i selecting a 2⁻ⁱ fraction, i ∈ [0, 9]. The
  * query log is the Cartesian product of the 20 filters with the n_q query
  * vectors, giving 20·n_q hybrid queries.
  */
object Bigann {

  val AttrCols: Seq[String] = Seq("a", "b")

  /** Dataset: Gaussian-mixture vectors plus uniform attributes A, B. */
  def dataset(spark: SparkSession, n: Long, d: Int, nClusters: Int = 64,
              seed: Long = 51, spread: Double = 0.25): DataFrame = {
    import spark.implicits._
    val centers = VectorData.makeCenters(nClusters, d, seed)
    spark.range(n).map { id =>
      val rnd = new Random(VectorData.mix(seed, id))
      val c = rnd.nextInt(centers.length)
      val vec = VectorData.sampleNear(centers(c), spread, rnd)
      (id, vec, rnd.nextDouble(), rnd.nextDouble())
    }.toDF("id", "vec", "a", "b")
  }

  /** 20 templates: ids 1..10 = `a < 2⁻⁽ⁱ⁻¹⁾`, ids 11..20 = `b < 2⁻⁽ⁱ⁻¹¹⁾`. */
  val templates: Seq[Template] =
    (0 until 10).map(i => Template(1 + i, s"A<2^-$i", Seq(NumCmp("a", Lt, math.pow(2.0, -i))))) ++
    (0 until 10).map(i => Template(11 + i, s"B<2^-$i", Seq(NumCmp("b", Lt, math.pow(2.0, -i)))))

  /** Query vectors: `nq` fresh samples from the same mixture (held-out, as
    * BIGANN ships query sets drawn from the data distribution).
    */
  def queryVectors(nq: Int, d: Int, nClusters: Int = 64, seed: Long = 51,
                   spread: Double = 0.25): Array[Array[Float]] = {
    val centers = VectorData.makeCenters(nClusters, d, seed)
    val rnd = new Random(seed * 31 + 7)
    Array.fill(nq) {
      val c = rnd.nextInt(centers.length)
      VectorData.sampleNear(centers(c), spread, rnd)
    }
  }

  /** The full workload: Cartesian product of all 20 filters × nq vectors. */
  def workload(nq: Int, d: Int, k: Int = 10, metric: Metric = Metric.L2,
               nClusters: Int = 64, seed: Long = 51): Workload = {
    val qvecs = queryVectors(nq, d, nClusters, seed)
    val queries = for {
      (t, ti) <- templates.zipWithIndex
      (v, vi) <- qvecs.zipWithIndex
    } yield HybridQuery(ti.toLong * 1_000_000L + vi, t.id, v)
    Workload(templates, queries.toIndexedSeq, k, metric)
  }
}
