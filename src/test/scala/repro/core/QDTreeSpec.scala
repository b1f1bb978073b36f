package repro.core

import org.roaringbitmap.RoaringBitmap
import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

import repro.core.qdtree._

/** Pure driver-side qd-tree invariants: the tree is built from predicate
  * support bitmaps, so these tests construct supports directly.
  */
class QDTreeSpec extends AnyFunSuite {

  private def bm(idxs: Iterable[Int]): RoaringBitmap = {
    val b = new RoaringBitmap(); idxs.foreach(b.add); b
  }

  /** n tuples; each predicate's support drawn iid with probability sel(i). */
  private def randomInstance(n: Int, sels: Seq[Double], seed: Long)
      : (Array[Pred], Array[RoaringBitmap]) = {
    val rnd = new Random(seed)
    val preds = sels.indices.map(i => Pred.NotNull(s"a$i"): Pred).toArray
    val support = sels.map(s => bm((0 until n).filter(_ => rnd.nextDouble() < s))).toArray
    (preds, support)
  }

  private def singletonShapes(predIdxs: Seq[Int], weight: Long = 1): Seq[RoutedQuery] =
    predIdxs.map(i => RoutedQuery(Seq(Seq(i)), weight))

  test("leaves are a disjoint, complete partition of the tuples") {
    val n = 1000
    val (preds, support) = randomInstance(n, Seq(0.5, 0.2, 0.1, 0.8), 1)
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 3), minSize = 100)
    val all = new RoaringBitmap()
    var total = 0L
    for (l <- tree.leaves) {
      assert(!RoaringBitmap.intersects(all, l.tuples), "leaves overlap")
      all.or(l.tuples)
      total += l.size
    }
    assert(total == n)
    assert(all.getLongCardinality == n)
  }

  test("leafOfTuple is consistent with leaf tuple sets") {
    val n = 500
    val (preds, support) = randomInstance(n, Seq(0.5, 0.3), 2)
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 1), minSize = 50)
    for (l <- tree.leaves) {
      val it = l.tuples.getIntIterator
      while (it.hasNext) assert(tree.leafOfTuple(it.next()) == l.leafId)
    }
  }

  test("semantic description is exact: bit i set iff some leaf tuple satisfies predicate i") {
    val n = 800
    val (preds, support) = randomInstance(n, Seq(0.5, 0.05, 0.9, 0.01), 3)
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 3), minSize = 64)
    for (l <- tree.leaves; i <- preds.indices) {
      val expected = RoaringBitmap.intersects(support(i), l.tuples)
      assert(l.semantic.contains(i) == expected, s"leaf ${l.leafId} pred $i")
    }
  }

  test("any leaf above MIN_SIZE has no effective splitting predicate left") {
    val n = 1000
    val (preds, support) = randomInstance(n, Seq(0.5, 0.4, 0.3, 0.6, 0.2), 4)
    val minSize = 100
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 4), minSize)
    for (l <- tree.leaves if l.size > minSize) {
      val splittable = support.exists { s =>
        val c = RoaringBitmap.and(s, l.tuples).getLongCardinality
        c > 0 && c < l.size
      }
      assert(!splittable, s"leaf ${l.leafId} of size ${l.size} was still splittable")
    }
  }

  test("routing is safe: every tuple satisfying a conjunctive query lives in a routed leaf") {
    val n = 2000
    val rnd = new Random(5)
    val (preds, support) = randomInstance(n, Seq(0.5, 0.2, 0.7, 0.1, 0.3, 0.9), 5)
    val shapes = Seq(RoutedQuery(Seq(Seq(0), Seq(1)), 3), RoutedQuery(Seq(Seq(2)), 5),
                     RoutedQuery(Seq(Seq(3), Seq(4)), 1), RoutedQuery(Seq(Seq(5), Seq(0)), 2))
    val tree = QDTree.build(n, preds, support, shapes, minSize = 128)
    for (shape <- shapes) {
      val routed = tree.route(shape).toSet
      // Tuples satisfying every clause:
      val sat = (0 until n).filter(t => shape.clauses.forall(_.exists(p => support(p).contains(t))))
      for (t <- sat)
        assert(routed.contains(tree.leafOfTuple(t)),
               s"tuple $t satisfies ${shape.clauses} but its leaf is not routed")
      val _ = rnd // silence unused
    }
  }

  test("disjunctive clauses route to any leaf supporting at least one disjunct") {
    // Two predicates with disjoint supports; a query with clause (p0 OR p1)
    // must reach leaves holding either side.
    val n = 400
    val preds: Array[Pred] = Array(Pred.NotNull("a"), Pred.NotNull("b"), Pred.NotNull("c"))
    val support = Array(bm(0 until 200), bm(200 until 400), bm(0 until 400 by 2))
    val shapes = Seq(RoutedQuery(Seq(Seq(0)), 5), RoutedQuery(Seq(Seq(1)), 5))
    val tree = QDTree.build(n, preds, support, shapes, minSize = 50)
    val both = tree.route(RoutedQuery(Seq(Seq(0, 1)), 1)).toSet
    val onlyA = tree.route(RoutedQuery(Seq(Seq(0)), 1)).toSet
    val onlyB = tree.route(RoutedQuery(Seq(Seq(1)), 1)).toSet
    assert(both == onlyA.union(onlyB))
  }

  test("workload-aware layout prunes: selective templates route to a strict subset of leaves") {
    val n = 4000
    val rnd = new Random(6)
    // Two "type" predicates with disjoint supports plus a rare flag.
    val typeA = (0 until n).filter(_ % 2 == 0)
    val typeB = (0 until n).filter(_ % 2 == 1)
    val rare = (0 until n).filter(_ => rnd.nextDouble() < 0.01)
    val preds: Array[Pred] = Array(Pred.StrEq("t", "A"), Pred.StrEq("t", "B"), Pred.NotNull("rare"))
    val support = Array(bm(typeA), bm(typeB), bm(rare))
    val shapes = Seq(RoutedQuery(Seq(Seq(0)), 50), RoutedQuery(Seq(Seq(1)), 30),
                     RoutedQuery(Seq(Seq(2)), 20))
    val tree = QDTree.build(n, preds, support, shapes, minSize = 256)
    assert(tree.numLeaves >= 2)
    val aLeaves = tree.route(RoutedQuery(Seq(Seq(0)), 1)).toSet
    val bLeaves = tree.route(RoutedQuery(Seq(Seq(1)), 1)).toSet
    assert(aLeaves.size < tree.numLeaves, "type-A queries should skip type-B leaves")
    assert(bLeaves.size < tree.numLeaves)
    assert(aLeaves.intersect(bLeaves).isEmpty,
           "disjoint type predicates should produce disjoint leaf sets")
  }

  test("cost of workload-aware layout is lower than the single-partition cost") {
    val n = 3000
    val (preds, support) = randomInstance(n, Seq(0.3, 0.1, 0.5, 0.05), 7)
    val shapes = singletonShapes(0 to 3, weight = 10)
    val tree = QDTree.build(n, preds, support, shapes, minSize = 128)
    val flat = new QDTree(preds, Array(QDLeaf(0, bm(0 until n),
      scala.collection.immutable.BitSet.fromSpecific(preds.indices))), Array.fill(n)(0))
    assert(tree.cost(shapes) < flat.cost(shapes),
           s"partitioned=${tree.cost(shapes)} flat=${flat.cost(shapes)}")
  }

  test("routePreds ignores predicates the tree does not know (safe direction)") {
    val n = 200
    val (preds, support) = randomInstance(n, Seq(0.5), 8)
    val tree = QDTree.build(n, preds, support, singletonShapes(Seq(0)), minSize = 32)
    val unknown = Pred.StrEq("nope", "x")
    assert(tree.routePreds(Seq(unknown)).toSet == tree.leaves.map(_.leafId).toSet)
  }

  test("route with empty constraints reaches every leaf") {
    val n = 300
    val (preds, support) = randomInstance(n, Seq(0.4, 0.6), 9)
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 1), minSize = 64)
    assert(tree.route(RoutedQuery(Nil, 1)).toSet == tree.leaves.map(_.leafId).toSet)
  }

  test("n = 0 yields an empty tree") {
    val tree = QDTree.build(0, Array(Pred.NotNull("a")), Array(new RoaringBitmap), Nil, 16)
    assert(tree.numLeaves == 0)
  }

  test("a partition smaller than MIN_SIZE is not split") {
    val n = 50
    val (preds, support) = randomInstance(n, Seq(0.5, 0.5), 10)
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 1), minSize = 100)
    assert(tree.numLeaves == 1)
  }

  test("all-true / all-false predicates are never used as cuts") {
    val n = 400
    val preds: Array[Pred] = Array(Pred.NotNull("everything"), Pred.NotNull("nothing"))
    val support = Array(bm(0 until n), new RoaringBitmap())
    val tree = QDTree.build(n, preds, support, singletonShapes(0 to 1), minSize = 50)
    assert(tree.numLeaves == 1, "no effective predicate => single leaf")
  }

  test("splits are reasonably balanced with selective predicates (the Algorithm 1 fix)") {
    val n = 4096
    // Only highly selective predicates: the vanilla greedy qd-tree would cut
    // off tiny slivers; the balanced variant unions them to approach n/2.
    val rnd = new Random(11)
    val sels = Seq.fill(30)(0.05)
    val (preds, support) = randomInstance(n, sels, 12)
    val tree = QDTree.build(n, preds, support, singletonShapes(sels.indices), minSize = 512)
    assert(tree.numLeaves >= 2)
    // No leaf should hold the overwhelming majority of tuples.
    val maxLeaf = tree.leaves.map(_.size).max
    assert(maxLeaf <= (n * 3) / 4, s"imbalanced: max leaf $maxLeaf of $n; ${rnd.nextInt(1)}")
  }

  test("cost function weights queries (Eq. 1)") {
    val n = 100
    val preds: Array[Pred] = Array(Pred.NotNull("a"))
    val support = Array(bm(0 until 50))
    val tree = QDTree.build(n, preds, support, singletonShapes(Seq(0), 1), minSize = 10)
    val light = tree.cost(Seq(RoutedQuery(Seq(Seq(0)), 1)))
    val heavy = tree.cost(Seq(RoutedQuery(Seq(Seq(0)), 10)))
    assert(heavy == light * 10)
  }
}
