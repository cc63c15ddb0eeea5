package repro.ml

import java.io.{ByteArrayOutputStream, FileInputStream, FileOutputStream, ObjectInputStream, ObjectOutputStream}
import java.nio.file.Path
import scala.util.Random

/** Bagged multi-output random-forest regressor.
  *
  * From-scratch substitute for scikit-learn's `RandomForestRegressor`
  * (paper §3.4 / §5.6): 100 estimators by default, bootstrap sampling,
  * all-features-per-split (sklearn's regression default), multi-output
  * leaves. Serialization via Java object streams stands in for the paper's
  * ONNX export — the property that matters (§4.3/§4.4) is a compact on-disk
  * artifact that loads once into the optimizer process and scores in-JVM in
  * well under a millisecond, which [[RandomForest.save]]/[[RandomForest.load]]
  * provide.
  */
final case class RandomForest(
    trees: IndexedSeq[RegressionTree.Node],
    featureNames: IndexedSeq[String],
    nOutputs: Int,
) extends Serializable {

  /** Mean of the per-tree predictions (the standard bagging aggregate). */
  def predict(x: Array[Double]): Array[Double] = {
    require(x.length == featureNames.length,
      s"expected ${featureNames.length} features, got ${x.length}")
    val acc = new Array[Double](nOutputs)
    var t = 0
    while (t < trees.length) {
      val p = trees(t).predict(x); var o = 0
      while (o < nOutputs) { acc(o) += p(o); o += 1 }
      t += 1
    }
    var o = 0
    while (o < nOutputs) { acc(o) /= trees.length; o += 1 }
    acc
  }

  def predictAll(xs: IndexedSeq[Array[Double]]): IndexedSeq[Array[Double]] = xs.map(predict)

  /** Serialized size in bytes — reported in the overheads experiment (T9)
    * against the paper's 0.8–1.1 MB pickle/ONNX sizes.
    */
  def serializedSize: Long = {
    val bos = new ByteArrayOutputStream()
    val oos = new ObjectOutputStream(bos)
    oos.writeObject(this); oos.close()
    bos.size().toLong
  }

  def save(path: Path): Unit = {
    val oos = new ObjectOutputStream(new FileOutputStream(path.toFile))
    try oos.writeObject(this) finally oos.close()
  }
}

object RandomForest {

  /** Hyper-parameters; defaults mirror sklearn's `RandomForestRegressor`
    * defaults (100 trees, bootstrap, all features considered per split).
    */
  final case class Params(
      nTrees: Int = 100,
      tree: RegressionTree.Params = RegressionTree.Params(),
      bootstrap: Boolean = true,
      seed: Long = 42L,
  )

  /** Train on `x(i) -> y(i)` with deterministic seeding so CV folds and
    * tests are reproducible.
    */
  def fit(
      x: IndexedSeq[Array[Double]],
      y: IndexedSeq[Array[Double]],
      featureNames: IndexedSeq[String],
      params: Params = Params(),
  ): RandomForest = {
    require(x.nonEmpty && x.length == y.length, s"bad input sizes: ${x.length} vs ${y.length}")
    require(x.head.length == featureNames.length, "featureNames must match feature width")
    val rng = new Random(params.seed)
    val trees = (0 until params.nTrees).map { _ =>
      val treeRng = new Random(rng.nextLong())
      val (bx, by) =
        if (params.bootstrap) {
          val idx = Array.fill(x.length)(treeRng.nextInt(x.length))
          (idx.toIndexedSeq.map(x), idx.toIndexedSeq.map(y))
        } else (x, y)
      RegressionTree.fit(bx, by, params.tree, treeRng)
    }
    RandomForest(trees, featureNames, y.head.length)
  }

  def load(path: Path): RandomForest = {
    val ois = new ObjectInputStream(new FileInputStream(path.toFile))
    try ois.readObject().asInstanceOf[RandomForest] finally ois.close()
  }

  /** Per-feature permutation importance (paper §5.7, [17]).
    *
    * For each feature, shuffle its column `nRepeats` times and measure the
    * increase in mean squared error (summed across outputs) of `model` on
    * `(x, y)` relative to the unpermuted baseline; the importance is the
    * mean increase. `loss` can be overridden (e.g. to an E(n)-style metric).
    */
  def permutationImportance(
      model: RandomForest,
      x: IndexedSeq[Array[Double]],
      y: IndexedSeq[Array[Double]],
      nRepeats: Int = 10,
      seed: Long = 0L,
      loss: (IndexedSeq[Array[Double]], IndexedSeq[Array[Double]]) => Double = mse,
  ): IndexedSeq[Double] = {
    require(x.nonEmpty, "empty importance dataset")
    val rng      = new Random(seed)
    val baseline = loss(model.predictAll(x), y)
    model.featureNames.indices.map { f =>
      val increases = (0 until nRepeats).map { _ =>
        val perm = rng.shuffle(x.indices.toList).toIndexedSeq
        val xPerm = x.indices.map { i =>
          val row = x(i).clone(); row(f) = x(perm(i))(f); row
        }
        loss(model.predictAll(xPerm), y) - baseline
      }
      increases.sum / nRepeats
    }
  }

  /** Mean squared error summed across output dimensions. */
  def mse(pred: IndexedSeq[Array[Double]], actual: IndexedSeq[Array[Double]]): Double = {
    var s = 0.0; var i = 0
    while (i < pred.length) {
      var o = 0
      while (o < pred(i).length) { val d = pred(i)(o) - actual(i)(o); s += d * d; o += 1 }
      i += 1
    }
    s / pred.length
  }
}
