package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

import repro.core.vec.{BatchScorer, Metric}

/** The reusable flat-buffer kernel must stay correct across calls of varying
  * shapes — buffer reuse is where stale-data bugs live.
  */
class BatchScorerSpec extends AnyFunSuite {

  private def grid(rnd: Random, d: Int): Array[Float] =
    Array.fill(d)((rnd.nextInt(65) - 32) / 8.0f)

  private def check(scorer: BatchScorer, m: Int, n: Int, d: Int, metric: Metric, seed: Long): Unit = {
    val rnd = new Random(seed)
    val q = Array.fill(m)(grid(rnd, d))
    val x = Array.fill(n)(grid(rnd, d))
    val flat = scorer.scores(q, x, metric)
    for (i <- 0 until m; j <- 0 until n)
      assert(flat(i * n + j) == metric.score(q(i), x(j)), s"($i,$j) m=$m n=$n d=$d ${metric.name}")
  }

  test("single call correctness (scalar path)") {
    check(new BatchScorer, 3, 5, 4, Metric.L2, 1)
  }

  test("single call correctness (GEMM path)") {
    check(new BatchScorer, 32, 64, 8, Metric.L2, 2)
    check(new BatchScorer, 32, 64, 8, Metric.IP, 3)
  }

  test("repeated calls with shrinking shapes never read stale buffer contents") {
    val s = new BatchScorer
    check(s, 40, 50, 8, Metric.L2, 4)   // big first — grows buffers
    check(s, 2, 3, 8, Metric.L2, 5)     // tiny after — must not see stale data
    check(s, 17, 29, 8, Metric.IP, 6)
    check(s, 40, 50, 8, Metric.IP, 7)
  }

  test("alternating metrics on one scorer") {
    val s = new BatchScorer
    for (seed <- 1 to 10)
      check(s, 8 + seed, 16 + seed, 8, if (seed % 2 == 0) Metric.L2 else Metric.IP, seed + 100)
  }

  test("empty inputs return an empty buffer") {
    val s = new BatchScorer
    assert(s.scores(Array.empty, Array(Array(1f)), Metric.L2).isEmpty)
    assert(s.scores(Array(Array(1f)), Array.empty, Metric.L2).isEmpty)
  }

  test("d=1 vectors work on both paths") {
    check(new BatchScorer, 2, 2, 1, Metric.L2, 8)     // scalar
    check(new BatchScorer, 80, 80, 1, Metric.IP, 9)   // 80*80*1 >= 4096 → GEMM
  }
}
