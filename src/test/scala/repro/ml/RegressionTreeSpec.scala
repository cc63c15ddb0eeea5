package repro.ml

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class RegressionTreeSpec extends AnyFunSuite {
  private def rng = new Random(1)

  private def fitOn(x: Seq[Array[Double]], y: Seq[Array[Double]],
                    params: RegressionTree.Params = RegressionTree.Params()): RegressionTree.Node =
    RegressionTree.fit(x.toIndexedSeq, y.toIndexedSeq, params, rng)

  test("pure leaf when all targets identical") {
    val tree = fitOn(Seq(Array(1.0), Array(2.0), Array(3.0)), Seq.fill(3)(Array(5.0)))
    assert(tree.isInstanceOf[RegressionTree.Leaf])
    assert(tree.predict(Array(9.0)).sameElements(Array(5.0)))
  }

  test("splits a perfectly separable step function") {
    val x = Seq(Array(1.0), Array(2.0), Array(10.0), Array(11.0))
    val y = Seq(Array(0.0), Array(0.0), Array(100.0), Array(100.0))
    val tree = fitOn(x, y)
    assert(tree.predict(Array(0.0))(0) == 0.0)
    assert(tree.predict(Array(20.0))(0) == 100.0)
  }

  test("interpolates training points exactly with unbounded depth") {
    val x = (1 to 16).map(i => Array(i.toDouble))
    val y = (1 to 16).map(i => Array(i * 2.0))
    val tree = fitOn(x, y)
    x.zip(y).foreach { case (xi, yi) => assert(tree.predict(xi).sameElements(yi)) }
  }

  test("maxDepth = 1 forces a single leaf predicting the mean") {
    val x = (1 to 4).map(i => Array(i.toDouble))
    val y = (1 to 4).map(i => Array(i.toDouble))
    val tree = fitOn(x, y, RegressionTree.Params(maxDepth = 1))
    assert(tree.isInstanceOf[RegressionTree.Leaf])
    assert(math.abs(tree.predict(Array(0.0))(0) - 2.5) < 1e-12)
  }

  test("minSamplesLeaf is honoured") {
    val x = (1 to 6).map(i => Array(i.toDouble))
    val y = (1 to 6).map(i => Array(if (i <= 5) 0.0 else 100.0))
    // A leaf of 1 sample would isolate the outlier; minSamplesLeaf=2 forbids it.
    val tree = fitOn(x, y, RegressionTree.Params(minSamplesLeaf = 2))
    def leaves(n: RegressionTree.Node): Seq[RegressionTree.Leaf] = n match {
      case l: RegressionTree.Leaf             => Seq(l)
      case RegressionTree.Split(_, _, l, r)   => leaves(l) ++ leaves(r)
    }
    assert(leaves(tree).forall(_ => true)) // structure is valid
    // Best split under the constraint puts >= 2 samples in each side, so no
    // leaf can predict exactly 100.0 (the singleton).
    assert(!leaves(tree).exists(_.value(0) == 100.0))
  }

  test("multi-output: predicts joint means and splits on joint impurity") {
    val x = Seq(Array(0.0), Array(1.0), Array(10.0), Array(11.0))
    val y = Seq(Array(1.0, 10.0), Array(1.0, 10.0), Array(5.0, 50.0), Array(5.0, 50.0))
    val tree = fitOn(x, y)
    assert(tree.predict(Array(0.5)).sameElements(Array(1.0, 10.0)))
    assert(tree.predict(Array(10.5)).sameElements(Array(5.0, 50.0)))
  }

  test("splits on the informative feature among distractors") {
    val r = new Random(3)
    val x = (0 until 60).map(_ => Array(r.nextDouble(), r.nextDouble(), r.nextDouble()))
    val y = x.map(f => Array(if (f(1) < 0.5) 0.0 else 10.0))
    val tree = fitOn(x, y)
    tree match {
      case RegressionTree.Split(f, thr, _, _) =>
        assert(f == 1, s"expected split on feature 1, got $f")
        assert(math.abs(thr - 0.5) < 0.1)
      case _ => fail("expected a split at the root")
    }
  }

  test("depth and nodeCount are consistent") {
    val x = (1 to 8).map(i => Array(i.toDouble))
    val y = (1 to 8).map(i => Array(i.toDouble))
    val tree = fitOn(x, y)
    assert(tree.nodeCount == 15) // perfect binary tree over 8 distinct points
    assert(tree.depth == 4)
  }

  test("ragged target vectors are rejected") {
    intercept[IllegalArgumentException] {
      fitOn(Seq(Array(1.0), Array(2.0)), Seq(Array(1.0), Array(1.0, 2.0)))
    }
  }

  test("empty training set is rejected") {
    intercept[IllegalArgumentException] { fitOn(Seq.empty, Seq.empty) }
  }

  test("maxFeatures = 1 still fits (feature subsampling)") {
    val x = (1 to 20).map(i => Array(i.toDouble, (20 - i).toDouble))
    val y = (1 to 20).map(i => Array(i.toDouble))
    val tree = RegressionTree.fit(x, y, RegressionTree.Params(maxFeatures = 1), new Random(5))
    // Both features are informative (x2 = 20 - x1), so any subsample works.
    assert(tree.predict(Array(1.0, 19.0))(0) < tree.predict(Array(20.0, 0.0))(0))
  }
}
