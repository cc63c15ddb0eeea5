package repro.exp

import scala.util.Random
import repro.core.{ParameterModel, PlanFeaturizer, PpmKind}
import repro.ml.RandomForest
import repro.sim.SparklensEstimator

/** 10-repeated 5-fold cross-validation over query templates (paper §5.1):
  * each repeat shuffles the queries into k folds; each fold's queries form
  * the test set while the rest train the parameter models, so no test query
  * ever appears in its own training set.
  */
object CrossValidation {

  /** One train/test split with the models trained on it. */
  final case class TrainedFold(
      repeat: Int,
      fold: Int,
      trainIds: IndexedSeq[String],
      testIds: IndexedSeq[String],
      models: Map[PpmKind, ParameterModel],
      featureSubset: IndexedSeq[String],
  ) {
    /** Predicted `t(n)` curve for a query (test or train) at grid `ns`. */
    def predict(kind: PpmKind, q: QueryData, ns: Seq[Int]): IndexedSeq[(Int, Double)] =
      models(kind).predictCurve(PlanFeaturizer.project(q.features, featureSubset), ns)
  }

  /** Deterministic fold assignment: `repeats` shuffles of the id list, each
    * split into `k` near-equal folds.
    */
  def splits(ids: IndexedSeq[String], k: Int, repeats: Int, seed: Long): IndexedSeq[(Int, Int, IndexedSeq[String], IndexedSeq[String])] = {
    require(k >= 2 && ids.size >= k, s"need at least k=$k queries, got ${ids.size}")
    (0 until repeats).flatMap { r =>
      val rng      = new Random(seed + r)
      val shuffled = rng.shuffle(ids)
      (0 until k).map { f =>
        val test  = shuffled.zipWithIndex.collect { case (id, i) if i % k == f => id }
        val train = shuffled.filterNot(test.contains)
        (r, f, train, test)
      }
    }
  }

  /** Train parameter models for every (repeat, fold) split.
    *
    * Labels come from PPM fits to Sparklens estimates over `fitGrid`
    * (the paper's training-data augmentation, §4.1); features may be
    * restricted to a subset (ablation study, §5.7).
    */
  def trainFolds(
      workload: Workload,
      kinds: Seq[PpmKind] = PpmKind.all,
      k: Int = 5,
      repeats: Int = 10,
      seed: Long = 7L,
      featureSubset: IndexedSeq[String] = PlanFeaturizer.featureNames,
      fitGrid: IndexedSeq[Int] = WorkloadRunner.FitGrid,
      rfParams: RandomForest.Params = RandomForest.Params(),
  ): IndexedSeq[TrainedFold] = {
    val byId = workload.queries.map(q => q.query.id -> q).toMap
    splits(workload.queries.map(_.query.id), k, repeats, seed).map { case (r, f, trainIds, testIds) =>
      val examples = trainIds.map { id =>
        val q = byId(id)
        ParameterModel.TrainingExample(
          queryId = id,
          features = PlanFeaturizer.project(q.features, featureSubset),
          curve = SparklensEstimator.curve(q.profile, fitGrid),
        )
      }
      val models = kinds.map { kind =>
        kind -> ParameterModel.train(kind, examples, featureSubset, rfParams)
      }.toMap
      TrainedFold(r, f, trainIds, testIds, models, featureSubset)
    }
  }
}

/** The paper's accuracy metric and small statistical helpers. */
object Metrics {

  /** E(n) (Eq. 6): ratio of summed absolute time errors to summed actual
    * times over a query set, at one executor count.
    */
  def eN(pairs: Seq[(Double, Double)]): Double = {
    require(pairs.nonEmpty, "E(n) over empty set")
    val num = pairs.map { case (pred, actual) => math.abs(pred - actual) }.sum
    val den = pairs.map(_._2).sum
    if (den == 0.0) 0.0 else num / den
  }

  def mean(xs: Seq[Double]): Double = xs.sum / xs.size

  def stddev(xs: Seq[Double]): Double = {
    val m = mean(xs)
    math.sqrt(xs.map(x => (x - m) * (x - m)).sum / xs.size)
  }
}
