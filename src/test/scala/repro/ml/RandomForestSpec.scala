package repro.ml

import java.nio.file.Files
import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class RandomForestSpec extends AnyFunSuite {

  private def syntheticData(n: Int, seed: Long): (IndexedSeq[Array[Double]], IndexedSeq[Array[Double]]) = {
    val r = new Random(seed)
    val x = (0 until n).map(_ => Array(r.nextDouble() * 10, r.nextDouble() * 10, r.nextDouble()))
    val y = x.map(f => Array(2.0 * f(0) + f(1), f(0) - f(1)))
    (x, y)
  }

  test("fits a smooth function with low error on training data") {
    val (x, y) = syntheticData(200, 1)
    val rf     = RandomForest.fit(x, y, IndexedSeq("a", "b", "noise"), RandomForest.Params(nTrees = 30))
    val mse    = RandomForest.mse(rf.predictAll(x), y)
    assert(mse < 2.0, s"training MSE too high: $mse")
  }

  test("generalizes to held-out points") {
    val (x, y)   = syntheticData(300, 2)
    val (tx, ty) = syntheticData(50, 99)
    val rf  = RandomForest.fit(x, y, IndexedSeq("a", "b", "noise"), RandomForest.Params(nTrees = 50))
    val mse = RandomForest.mse(rf.predictAll(tx), ty)
    assert(mse < 8.0, s"test MSE too high: $mse")
  }

  test("training is deterministic in the seed") {
    val (x, y) = syntheticData(60, 3)
    val names  = IndexedSeq("a", "b", "c")
    val rf1 = RandomForest.fit(x, y, names, RandomForest.Params(nTrees = 10, seed = 7))
    val rf2 = RandomForest.fit(x, y, names, RandomForest.Params(nTrees = 10, seed = 7))
    val probe = Array(5.0, 5.0, 0.5)
    assert(rf1.predict(probe).sameElements(rf2.predict(probe)))
  }

  test("different seeds give different forests") {
    val (x, y) = syntheticData(60, 3)
    val names  = IndexedSeq("a", "b", "c")
    val rf1 = RandomForest.fit(x, y, names, RandomForest.Params(nTrees = 10, seed = 7))
    val rf2 = RandomForest.fit(x, y, names, RandomForest.Params(nTrees = 10, seed = 8))
    val probes = (0 until 20).map(i => Array(i * 0.5, 10 - i * 0.5, 0.1))
    assert(probes.exists(p => !rf1.predict(p).sameElements(rf2.predict(p))))
  }

  test("predict rejects wrong feature width") {
    val (x, y) = syntheticData(20, 4)
    val rf = RandomForest.fit(x, y, IndexedSeq("a", "b", "c"), RandomForest.Params(nTrees = 3))
    intercept[IllegalArgumentException] { rf.predict(Array(1.0)) }
  }

  test("save/load roundtrip preserves predictions (ONNX-substitute path)") {
    val (x, y) = syntheticData(50, 5)
    val rf   = RandomForest.fit(x, y, IndexedSeq("a", "b", "c"), RandomForest.Params(nTrees = 10))
    val path = Files.createTempFile("rf", ".bin")
    rf.save(path)
    val loaded = RandomForest.load(path)
    val probe  = Array(3.0, 4.0, 0.2)
    assert(loaded.predict(probe).sameElements(rf.predict(probe)))
    assert(loaded.featureNames == rf.featureNames)
  }

  test("serializedSize is positive and matches the on-disk file size") {
    val (x, y) = syntheticData(50, 6)
    val rf   = RandomForest.fit(x, y, IndexedSeq("a", "b", "c"), RandomForest.Params(nTrees = 10))
    val path = Files.createTempFile("rf", ".bin")
    rf.save(path)
    assert(rf.serializedSize > 0)
    assert(math.abs(rf.serializedSize - Files.size(path)) < 200)
  }

  test("permutation importance ranks informative features above noise") {
    val (x, y) = syntheticData(200, 7)
    val rf  = RandomForest.fit(x, y, IndexedSeq("a", "b", "noise"), RandomForest.Params(nTrees = 30))
    val imp = RandomForest.permutationImportance(rf, x, y, nRepeats = 10, seed = 1)
    assert(imp(0) > imp(2), s"feature a should beat noise: $imp")
    assert(imp(1) > imp(2), s"feature b should beat noise: $imp")
  }

  test("permutation importance of a pure-noise feature is near zero") {
    val (x, y) = syntheticData(200, 8)
    val rf  = RandomForest.fit(x, y, IndexedSeq("a", "b", "noise"), RandomForest.Params(nTrees = 30))
    val imp = RandomForest.permutationImportance(rf, x, y, nRepeats = 10, seed = 2)
    assert(imp(2) < 0.2 * math.max(imp(0), imp(1)))
  }

  test("bootstrap=false with all features reproduces a deterministic fit") {
    val (x, y) = syntheticData(40, 9)
    val rf = RandomForest.fit(x, y, IndexedSeq("a", "b", "c"),
      RandomForest.Params(nTrees = 5, bootstrap = false))
    // Without bootstrap every tree sees identical data; all trees agree.
    val probe = Array(1.0, 2.0, 0.5)
    val preds = rf.trees.map(_.predict(probe)(0)).distinct
    assert(preds.size == 1)
  }

  test("multi-output predictions average across trees per output") {
    val x = IndexedSeq(Array(0.0), Array(1.0))
    val y = IndexedSeq(Array(0.0, 100.0), Array(10.0, 200.0))
    val rf = RandomForest.fit(x, y, IndexedSeq("f"), RandomForest.Params(nTrees = 50, seed = 3))
    val p  = rf.predict(Array(0.0))
    assert(p.length == 2)
    // Bootstrap means some trees saw only one sample; averages stay in range.
    assert(p(0) >= 0.0 && p(0) <= 10.0)
    assert(p(1) >= 100.0 && p(1) <= 200.0)
  }

  test("empty training set is rejected") {
    intercept[IllegalArgumentException] {
      RandomForest.fit(IndexedSeq.empty, IndexedSeq.empty, IndexedSeq("a"))
    }
  }
}
