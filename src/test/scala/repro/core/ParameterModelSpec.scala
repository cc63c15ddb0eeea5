package repro.core

import java.nio.file.Files
import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.ml.RandomForest

class ParameterModelSpec extends AnyFunSuite {

  /** Synthetic workload: feature f0 determines the Amdahl parameters. */
  private def examples(n: Int, seed: Long): IndexedSeq[ParameterModel.TrainingExample] = {
    val r = new Random(seed)
    (0 until n).map { i =>
      val scale = 1.0 + r.nextDouble() * 9.0
      val s = 10.0 * scale
      val p = 100.0 * scale
      val curve = IndexedSeq(1, 2, 4, 8, 16, 32, 48).map(k => k -> (s + p / k))
      ParameterModel.TrainingExample(s"q$i", Array(scale, r.nextDouble()), curve)
    }
  }

  private val names = IndexedSeq("scale", "noise")

  test("trains and predicts Amdahl parameters from features") {
    val model = ParameterModel.train(PpmKind.Amdahl, examples(80, 1), names,
      RandomForest.Params(nTrees = 30))
    val ppm = model.predictPpm(Array(5.0, 0.5)).asInstanceOf[AmdahlPpm]
    // True params for scale=5: s=50, p=500.
    assert(math.abs(ppm.s - 50.0) / 50.0 < 0.3, s"s=${ppm.s}")
    assert(math.abs(ppm.p - 500.0) / 500.0 < 0.3, s"p=${ppm.p}")
  }

  test("trains power-law models too") {
    val model = ParameterModel.train(PpmKind.PowerLaw, examples(60, 2), names,
      RandomForest.Params(nTrees = 20))
    val ppm = model.predictPpm(Array(5.0, 0.5))
    assert(ppm.time(1) > ppm.time(48)) // decreasing curve predicted
  }

  test("predicted curves are monotone non-increasing (model constraint §3.1)") {
    val model = ParameterModel.train(PpmKind.Amdahl, examples(50, 3), names,
      RandomForest.Params(nTrees = 10))
    for (probe <- Seq(Array(1.0, 0.1), Array(9.0, 0.9))) {
      val c = model.predictCurve(probe, 1 to 48)
      c.zip(c.tail).foreach { case ((_, a), (_, b)) => assert(b <= a + 1e-9) }
    }
  }

  test("one training point per query (parametric approach, §3.4)") {
    val ex    = examples(10, 4)
    val model = ParameterModel.train(PpmKind.Amdahl, ex, names, RandomForest.Params(nTrees = 5))
    // The forest's training data had exactly ex.size rows; verify indirectly:
    // a model trained on duplicated curves per config would have many more
    // distinct leaf values. Here we just assert the model exists and scores.
    assert(model.predictPpm(Array(2.0, 0.2)).params.length == 2)
  }

  test("save/load roundtrip preserves predictions") {
    val model = ParameterModel.train(PpmKind.PowerLaw, examples(30, 5), names,
      RandomForest.Params(nTrees = 5))
    val path = Files.createTempFile("pm", ".bin")
    model.save(path)
    val loaded = ParameterModel.load(path)
    val probe  = Array(4.0, 0.4)
    assert(loaded.predictPpm(probe) == model.predictPpm(probe))
    assert(loaded.kind == PpmKind.PowerLaw)
  }

  test("kind resolution rejects unknown names") {
    val model = ParameterModel.train(PpmKind.Amdahl, examples(10, 6), names,
      RandomForest.Params(nTrees = 2))
    intercept[IllegalArgumentException] { model.copy(kindName = "bogus").kind }
  }

  test("training on an empty workload is rejected") {
    intercept[IllegalArgumentException] {
      ParameterModel.train(PpmKind.Amdahl, IndexedSeq.empty, names)
    }
  }
}
