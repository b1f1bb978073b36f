package repro.core.ivf

import repro.core.vec.{KMeans, Metric, VectorOps}

/** Inverted-file (IVF) cell training and assignment.
  *
  * An IVF index over a set of vectors is, in this reproduction, (i) an array
  * of cell centroids held in driver metadata and (ii) a `__cluster` column on
  * the data DataFrame assigning each row to its nearest centroid — the
  * posting lists are the groups of rows sharing `(__part, __cluster)`.
  *
  * As in FAISS, the coarse quantizer always uses L2 for training, assignment
  * and probing — even for inner-product workloads, where only candidate
  * *scoring* uses IP. This keeps cell geometry sane (max-IP assignment
  * collapses onto large-norm centroids).
  */
object IVF {

  /** Metric used for all centroid training/assignment/probing. */
  val AssignMetric: Metric = Metric.L2

  /** Train √n cells (the paper's default) for one partition's vectors. */
  def train(vectors: Array[Array[Float]], seed: Long,
            cellsOverride: Option[Int] = None): Array[Array[Float]] = {
    val cells = cellsOverride.getOrElse(KMeans.sqrtCells(vectors.length.toLong))
    // Train on the full vector set (no subsampling): single-index training
    // then scales as O(n·√n) versus O(n·√(n/p)) for a p-way partitioned
    // index — the asymmetry behind the paper's Table 4.
    KMeans.train(vectors, cells, AssignMetric, seed = seed, sampleCap = Int.MaxValue)
  }

  /** Cell assignment for a single vector (used identically at build time and
    * when computing probe lists, so layout and probing agree).
    */
  def assign(vec: Array[Float], centroids: Array[Array[Float]]): Int =
    VectorOps.nearest(vec, centroids, AssignMetric)

  /** The `nprobe` cells a query vector should scan, closest first. */
  def probeCells(q: Array[Float], centroids: Array[Array[Float]], nprobe: Int): Array[Int] =
    VectorOps.nearestN(q, centroids, nprobe, AssignMetric)
}
