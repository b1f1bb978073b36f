package repro.core

import org.scalacheck.{Gen, Prop, Properties}

import repro.core.vec.{Metric, TopK, VectorOps}

/** ScalaCheck property suite for the vector kernels (runs under the
  * scalacheck sbt framework alongside the ScalaTest suites).
  */
object VectorProps extends Properties("vec") {

  private val gridVal: Gen[Float] = Gen.chooseNum(-32, 32).map(_ / 8.0f)
  private def vec(d: Int): Gen[Array[Float]] = Gen.containerOfN[Array, Float](d, gridVal)

  property("l2Sq nonnegative") = Prop.forAll(vec(8), vec(8)) { (a, b) =>
    VectorOps.l2Sq(a, b) >= 0f
  }

  property("l2Sq zero iff equal on grid values") = Prop.forAll(vec(8)) { a =>
    VectorOps.l2Sq(a, a) == 0f
  }

  property("dot bilinear under scalar doubling") = Prop.forAll(vec(6), vec(6)) { (a, b) =>
    val a2 = a.map(_ * 2f)
    VectorOps.dot(a2, b) == 2f * VectorOps.dot(a, b)
  }

  property("batchScores matches pairwise for both metrics") =
    Prop.forAll(Gen.listOfN(3, vec(5)), Gen.listOfN(5, vec(5)),
                Gen.oneOf(Metric.L2: Metric, Metric.IP: Metric)) { (qs, ds, m) =>
      val q = qs.toArray; val d = ds.toArray
      val batch = VectorOps.batchScores(q, d, m)
      q.indices.forall(i => d.indices.forall(j => batch(i)(j) == m.score(q(i), d(j))))
    }

  property("TopK == sort-take") =
    Prop.forAll(Gen.listOfN(30, Gen.zip(Gen.chooseNum(0f, 20f), Gen.chooseNum(0L, 40L))),
                Gen.chooseNum(1, 10)) { (xs, k) =>
      val h = new TopK(k)
      xs.foreach { case (s, id) => h.push(s, id) }
      h.sorted.toSeq == xs.sortBy(t => (t._1, t._2)).take(k)
    }

  property("nearestN is sorted by distance") = Prop.forAll(vec(4), Gen.listOfN(8, vec(4))) { (q, cs) =>
    val cents = cs.toArray
    val nn = VectorOps.nearestN(q, cents, 5, Metric.L2)
    val scores = nn.map(i => Metric.L2.score(q, cents(i)))
    scores.sliding(2).forall { case Array(a, b) => a <= b; case _ => true }
  }
}
