package repro.exp

import org.scalatest.funsuite.AnyFunSuite

class CrossValidationSpec extends AnyFunSuite {
  private val ids = (1 to 20).map(i => s"q$i")

  test("each repeat's folds cover every query exactly once") {
    val sp = CrossValidation.splits(ids, k = 5, repeats = 3, seed = 1)
    assert(sp.size == 15)
    for (r <- 0 until 3) {
      val tests = sp.filter(_._1 == r).flatMap(_._4)
      assert(tests.sorted == ids.sorted)
    }
  }

  test("train and test sets are disjoint and exhaustive") {
    CrossValidation.splits(ids, k = 5, repeats = 2, seed = 2).foreach {
      case (_, _, train, testSet) =>
        assert(train.intersect(testSet).isEmpty)
        assert((train ++ testSet).sorted == ids.sorted)
    }
  }

  test("fold sizes are near-equal (80:20 split for k=5)") {
    CrossValidation.splits(ids, k = 5, repeats = 1, seed = 3).foreach {
      case (_, _, train, testSet) =>
        assert(testSet.size == 4)
        assert(train.size == 16)
    }
  }

  test("splits are deterministic in the seed") {
    val a = CrossValidation.splits(ids, 5, 2, seed = 9)
    val b = CrossValidation.splits(ids, 5, 2, seed = 9)
    assert(a == b)
  }

  test("different repeats shuffle differently") {
    val sp = CrossValidation.splits(ids, 5, 2, seed = 4)
    val r0 = sp.filter(_._1 == 0).map(_._4)
    val r1 = sp.filter(_._1 == 1).map(_._4)
    assert(r0 != r1)
  }

  test("too few queries for k folds is rejected") {
    intercept[IllegalArgumentException] {
      CrossValidation.splits(ids.take(3), k = 5, repeats = 1, seed = 1)
    }
  }
}

class MetricsSpec extends AnyFunSuite {

  test("E(n) is zero for perfect predictions") {
    assert(Metrics.eN(Seq((10.0, 10.0), (20.0, 20.0))) == 0.0)
  }

  test("E(n) is the ratio of summed absolute errors to summed actuals (Eq. 6)") {
    // |12-10| + |18-20| = 4; actuals sum 30 → 4/30.
    assert(math.abs(Metrics.eN(Seq((12.0, 10.0), (18.0, 20.0))) - 4.0 / 30.0) < 1e-12)
  }

  test("E(n) weights long queries more than short ones") {
    // Same relative error, but the long query dominates the sums.
    val e = Metrics.eN(Seq((110.0, 100.0), (1.1, 1.0)))
    assert(math.abs(e - 0.1) < 1e-9)
  }

  test("empty input is rejected") {
    intercept[IllegalArgumentException] { Metrics.eN(Seq.empty) }
  }

  test("mean and stddev basics") {
    assert(Metrics.mean(Seq(1.0, 2.0, 3.0)) == 2.0)
    assert(math.abs(Metrics.stddev(Seq(2.0, 4.0)) - 1.0) < 1e-12)
    assert(Metrics.stddev(Seq(5.0, 5.0)) == 0.0)
  }
}

class TextTableSpec extends AnyFunSuite {
  test("columns align and separators match widths") {
    val t = TextTable.format(Seq("a", "bb"), Seq(Seq("xxx", "y"), Seq("z", "wwww")))
    val lines = t.split("\n")
    assert(lines.length == 4)
    assert(lines.map(_.length).distinct.size == 1, s"ragged table:\n$t")
  }

  test("formatters render as expected") {
    assert(TextTable.pct(0.123) == "12.3%")
    assert(TextTable.num(1.234) == "1.23")
    assert(TextTable.num3(1.2344) == "1.234")
  }
}
