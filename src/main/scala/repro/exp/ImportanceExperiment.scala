package repro.exp

import repro.core.{PlanFeaturizer, PpmKind}
import repro.exp.CrossValidation.TrainedFold
import repro.ml.RandomForest
import repro.sim.SparklensEstimator

/** T8 — Figure 15 + §5.7: permutation feature importance of the parameter
  * models on the testing datasets, plus the F0–F3 feature-ablation study.
  *
  * Importance uses a variance-normalized parameter-space MSE (each PPM
  * parameter has a very different scale), matching scikit-learn's
  * R²-style scoring that the paper's permutation_importance defaults to.
  */
object ImportanceExperiment {

  final case class ImportanceResult(
      /** feature -> summed (over both models) average importance score. */
      scores: IndexedSeq[(String, Double)],
      perModel: Map[PpmKind, IndexedSeq[(String, Double)]],
  )

  def runImportance(
      workload: Workload,
      folds: IndexedSeq[TrainedFold],
      nRepeats: Int = 100,
      seed: Long = 5L,
  ): ImportanceResult = {
    val byId = workload.queries.map(q => q.query.id -> q).toMap
    val perModel = PpmKind.all.map { kind =>
      val perFeature = Array.fill(PlanFeaturizer.featureNames.size)(0.0)
      folds.zipWithIndex.foreach { case (fold, fi) =>
        val x = fold.testIds.map(id => byId(id).features)
        // Targets: the PPM parameters fitted on each test query's Sparklens
        // curve (the ground truth the model was trained to predict).
        val y = fold.testIds.map(id => kind.fit(SparklensEstimator.curve(byId(id).profile, WorkloadRunner.FitGrid)).params)
        val stds = (0 until y.head.length).map { o =>
          val vals = y.map(_(o)); math.max(Metrics.stddev(vals), 1e-9)
        }
        val loss = (pred: IndexedSeq[Array[Double]], actual: IndexedSeq[Array[Double]]) => {
          var s = 0.0
          for (i <- pred.indices; o <- pred(i).indices) {
            val d = (pred(i)(o) - actual(i)(o)) / stds(o); s += d * d
          }
          s / pred.size
        }
        val imp = RandomForest.permutationImportance(
          fold.models(kind).forest, x, y, nRepeats, seed + fi, loss)
        imp.indices.foreach(i => perFeature(i) += imp(i) / folds.size)
      }
      kind -> PlanFeaturizer.featureNames.zip(perFeature.toIndexedSeq).sortBy(-_._2)
    }.toMap
    val summed = PlanFeaturizer.featureNames.map { f =>
      f -> perModel.values.map(_.find(_._1 == f).get._2).sum
    }.sortBy(-_._2)
    ImportanceResult(summed, perModel)
  }

  def reportImportance(r: ImportanceResult): String = TextTable.render(
    "T8a — top 10 features by AE_PL + AE_AL permutation importance (Figure 15)",
    Seq("rank", "measured feature", "score", "paper rank (Fig 15)"),
    {
      val paperTop = Seq("input_bytes", "rows_processed", "max_depth", "num_operators", "Project", "Filter")
      r.scores.take(10).zipWithIndex.map { case ((f, s), i) =>
        Seq((i + 1).toString, f, f"$s%.4f", if (i < paperTop.size) paperTop(i) else "—")
      }
    },
  )

  // ----- ablation ---------------------------------------------------------

  final case class AblationResult(
      /** (featureSetName, kind) -> E(n) at each grid n on testing datasets. */
      eByN: Map[(String, PpmKind), IndexedSeq[(Int, Double)]],
  )

  val FeatureSets: IndexedSeq[(String, IndexedSeq[String])] = IndexedSeq(
    "F0" -> PlanFeaturizer.F0,
    "F1" -> PlanFeaturizer.F1,
    "F2" -> PlanFeaturizer.F2,
    "F3" -> PlanFeaturizer.F3,
  )

  def runAblation(
      workload: Workload,
      k: Int = 5,
      repeats: Int = 10,
      seed: Long = 7L,
      grid: IndexedSeq[Int] = WorkloadRunner.Grid,
  ): AblationResult = {
    val byId = workload.queries.map(q => q.query.id -> q).toMap
    val e = (for {
      (setName, subset) <- FeatureSets
      folds = CrossValidation.trainFolds(workload, PpmKind.all, k, repeats, seed, featureSubset = subset)
      kind <- PpmKind.all
    } yield {
      val byN = grid.map { n =>
        val vals = folds.map { fold =>
          Metrics.eN(fold.testIds.map { id =>
            val q = byId(id)
            (fold.predict(kind, q, grid).toMap.apply(n), q.actual.toMap.apply(n))
          })
        }
        n -> Metrics.mean(vals)
      }
      (setName, kind) -> byN
    }).toMap
    AblationResult(e)
  }

  def reportAblation(r: AblationResult): String = {
    val grid = r.eByN.head._2.map(_._1)
    val rows = for {
      kind            <- PpmKind.all.toIndexedSeq
      (setName, _)    <- FeatureSets
    } yield s"${kind.name}/$setName" +: r.eByN((setName, kind)).map { case (_, e) => TextTable.num3(e) }
    TextTable.render(
      "T8b — feature-ablation E(n) on testing datasets (§5.7)",
      "model/set" +: grid.map(n => s"E($n)"),
      rows,
    ) + TextTable.render(
      "T8c — paper reference at n=8 (§5.7)",
      Seq("model", "F0", "F1", "F2", "F3"),
      Seq(
        Seq("AE_PL (paper)", "0.27", "0.26", "0.35", "0.31"),
        Seq("AE_AL (paper)", "0.24", "0.24", "0.30", "0.27"),
      ),
    )
  }
}
