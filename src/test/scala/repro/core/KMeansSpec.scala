package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

import repro.core.vec.{KMeans, Metric, VectorOps}

class KMeansSpec extends AnyFunSuite {

  private def blob(center: Array[Float], n: Int, spread: Float, rnd: Random): Array[Array[Float]] =
    Array.fill(n)(center.map(c => c + (rnd.nextGaussian() * spread).toFloat))

  test("recovers well-separated cluster structure") {
    val rnd = new Random(1)
    val c1 = Array(0f, 0f); val c2 = Array(10f, 10f); val c3 = Array(-10f, 10f)
    val data = blob(c1, 100, 0.3f, rnd) ++ blob(c2, 100, 0.3f, rnd) ++ blob(c3, 100, 0.3f, rnd)
    val cents = KMeans.train(data, 3, Metric.L2, seed = 5)
    // Each true center should have a learned centroid within 1.0.
    for (c <- Seq(c1, c2, c3)) {
      val d = cents.map(VectorOps.l2Sq(c, _)).min
      assert(d < 1.0f, s"no centroid near ${c.toSeq}: min dist $d")
    }
  }

  test("is deterministic in the seed") {
    val rnd = new Random(2)
    val data = blob(Array(1f, 2f), 200, 1f, rnd)
    val a = KMeans.train(data, 5, Metric.L2, seed = 9)
    val b = KMeans.train(data, 5, Metric.L2, seed = 9)
    assert(a.zip(b).forall { case (x, y) => x.sameElements(y) })
  }

  test("different seeds may differ but both partition the space") {
    val rnd = new Random(3)
    val data = blob(Array(0f), 300, 2f, rnd)
    val a = KMeans.train(data, 4, Metric.L2, seed = 1)
    assert(a.length == 4)
  }

  test("caps k at the number of points") {
    val data = Array(Array(1f), Array(2f))
    val cents = KMeans.train(data, 10, Metric.L2)
    assert(cents.length == 2)
  }

  test("k=1 yields (approximately) the mean") {
    val data = Array(Array(0f, 0f), Array(2f, 4f), Array(4f, 2f))
    val cents = KMeans.train(data, 1, Metric.L2)
    assert(VectorOps.l2Sq(cents(0), Array(2f, 2f)) < 1e-6f)
  }

  test("rejects empty input") {
    intercept[IllegalArgumentException](KMeans.train(Array.empty, 3, Metric.L2))
  }

  test("no NaN centroids even on degenerate (all-identical) input") {
    val data = Array.fill(50)(Array(3f, 3f))
    val cents = KMeans.train(data, 4, Metric.L2)
    assert(cents.forall(_.forall(f => !f.isNaN)))
  }

  test("training reduces quantization error versus a single random centroid") {
    val rnd = new Random(4)
    val data = blob(Array(0f, 0f), 150, 1f, rnd) ++ blob(Array(8f, 8f), 150, 1f, rnd)
    def err(cents: Array[Array[Float]]): Double =
      data.map(v => cents.map(VectorOps.l2Sq(v, _)).min.toDouble).sum
    val trained = KMeans.train(data, 2, Metric.L2, seed = 6)
    val single = KMeans.train(data, 1, Metric.L2, seed = 6)
    assert(err(trained) < err(single))
  }

  test("sampleCap bounds the training set but still returns k centroids") {
    val rnd = new Random(5)
    val data = blob(Array(0f), 1000, 1f, rnd)
    val cents = KMeans.train(data, 8, Metric.L2, sampleCap = 100)
    assert(cents.length == 8)
  }

  test("sqrtCells is round(sqrt(n)) with a floor of 1") {
    assert(KMeans.sqrtCells(0) == 1)
    assert(KMeans.sqrtCells(1) == 1)
    assert(KMeans.sqrtCells(100) == 10)
    assert(KMeans.sqrtCells(10000) == 100)
    assert(KMeans.sqrtCells(99) == 10)
  }
}
