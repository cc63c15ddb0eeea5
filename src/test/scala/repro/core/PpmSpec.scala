package repro.core

import org.scalacheck.{Gen, Prop}
import repro.PropSpec

class PpmSpec extends PropSpec {

  // ----- model evaluation -------------------------------------------------

  test("AE_PL evaluates max(b*n^a, m)") {
    val ppm = PowerLawPpm(a = -1.0, b = 100.0, m = 10.0)
    assert(math.abs(ppm.time(1) - 100.0) < 1e-9)
    assert(math.abs(ppm.time(5) - 20.0) < 1e-9)
    assert(ppm.time(20) == 10.0) // saturated: 100/20 = 5 < m
  }

  test("AE_AL evaluates s + p/n") {
    val ppm = AmdahlPpm(s = 5.0, p = 100.0)
    assert(ppm.time(1) == 105.0)
    assert(ppm.time(4) == 30.0)
    assert(ppm.time(100) == 6.0)
  }

  test("both models reject n < 1") {
    intercept[IllegalArgumentException] { PowerLawPpm(-1, 10, 1).time(0) }
    intercept[IllegalArgumentException] { AmdahlPpm(1, 1).time(0.5) }
  }

  test("negative Amdahl components are rejected") {
    intercept[IllegalArgumentException] { AmdahlPpm(-1, 1) }
    intercept[IllegalArgumentException] { AmdahlPpm(1, -1) }
  }

  test("curve evaluates the grid in order") {
    val c = AmdahlPpm(0.0, 100.0).curve(Seq(1, 2, 4))
    assert(c == IndexedSeq(1 -> 100.0, 2 -> 50.0, 4 -> 25.0))
  }

  test("property: AE_PL is monotonically non-increasing") {
    val gen = for {
      a <- Gen.choose(-2.0, 0.0)
      b <- Gen.choose(1.0, 1000.0)
      m <- Gen.choose(0.0, 50.0)
    } yield PowerLawPpm(a, b, m)
    checkProp(Prop.forAll(gen) { ppm =>
      (1 until 48).forall(n => ppm.time(n + 1) <= ppm.time(n) + 1e-9)
    })
  }

  test("property: AE_AL is monotonically non-increasing") {
    val gen = for {
      s <- Gen.choose(0.0, 100.0)
      p <- Gen.choose(0.0, 1000.0)
    } yield AmdahlPpm(s, p)
    checkProp(Prop.forAll(gen) { ppm =>
      (1 until 48).forall(n => ppm.time(n + 1) <= ppm.time(n) + 1e-9)
    })
  }

  // ----- fitting ----------------------------------------------------------

  test("AE_PL fit recovers exact power-law points") {
    val truth  = PowerLawPpm(a = -0.7, b = 200.0, m = 0.0)
    val points = IndexedSeq(1, 2, 4, 8, 16, 32).map(n => n -> truth.time(n))
    val fit    = PpmKind.PowerLaw.fit(points).asInstanceOf[PowerLawPpm]
    assert(math.abs(fit.a - (-0.7)) < 1e-6)
    assert(math.abs(fit.b - 200.0) < 1e-3)
  }

  test("AE_PL fit recovers the saturation floor m") {
    val points = IndexedSeq(1 -> 100.0, 2 -> 50.0, 4 -> 25.0, 8 -> 20.0, 16 -> 20.0, 32 -> 20.0)
    val fit    = PpmKind.PowerLaw.fit(points).asInstanceOf[PowerLawPpm]
    assert(fit.m == 20.0)
    // Fitted over the non-saturating region only, so early points are honoured.
    assert(math.abs(fit.time(1) - 100.0) / 100.0 < 0.25)
  }

  test("AE_PL fit on a flat curve degenerates gracefully") {
    val fit = PpmKind.PowerLaw.fit(IndexedSeq(1 -> 10.0, 8 -> 10.0, 48 -> 10.0))
    assert(math.abs(fit.time(1) - 10.0) < 1e-9)
    assert(math.abs(fit.time(48) - 10.0) < 1e-9)
  }

  test("AE_AL fit recovers exact Amdahl points") {
    val truth  = AmdahlPpm(s = 12.0, p = 240.0)
    val points = IndexedSeq(1, 2, 4, 8, 16, 48).map(n => n -> truth.time(n))
    val fit    = PpmKind.Amdahl.fit(points).asInstanceOf[AmdahlPpm]
    assert(math.abs(fit.s - 12.0) < 1e-6)
    assert(math.abs(fit.p - 240.0) < 1e-6)
  }

  test("AE_AL fit clamps a spuriously negative serial component to zero") {
    // Superlinear-speedup-looking data would produce s < 0; monotonicity
    // requires the clamp.
    val points = IndexedSeq(1 -> 100.0, 2 -> 40.0, 4 -> 15.0, 8 -> 5.0)
    val fit    = PpmKind.Amdahl.fit(points).asInstanceOf[AmdahlPpm]
    assert(fit.s >= 0.0 && fit.p >= 0.0)
  }

  test("fitting an empty curve is rejected") {
    intercept[IllegalArgumentException] { PpmKind.PowerLaw.fit(IndexedSeq.empty) }
    intercept[IllegalArgumentException] { PpmKind.Amdahl.fit(IndexedSeq.empty) }
  }

  // ----- parameter (de)vectorization --------------------------------------

  test("params/fromParams roundtrip for AE_PL") {
    val ppm = PowerLawPpm(-0.5, 80.0, 7.0)
    val back = PpmKind.PowerLaw.fromParams(ppm.params)
    assert(back == ppm)
  }

  test("params/fromParams roundtrip for AE_AL") {
    val ppm  = AmdahlPpm(3.0, 50.0)
    val back = PpmKind.Amdahl.fromParams(ppm.params)
    assert(back == ppm)
  }

  test("fromParams clamps out-of-range RF extrapolations") {
    val pl = PpmKind.PowerLaw.fromParams(Array(0.3, -5.0, -2.0)).asInstanceOf[PowerLawPpm]
    assert(pl.a <= 0.0 && pl.b >= 0.0 && pl.m >= 0.0)
    val al = PpmKind.Amdahl.fromParams(Array(-4.0, -1.0)).asInstanceOf[AmdahlPpm]
    assert(al.s == 0.0 && al.p == 0.0)
  }

  test("fromParams rejects wrong arity") {
    intercept[IllegalArgumentException] { PpmKind.PowerLaw.fromParams(Array(1.0)) }
    intercept[IllegalArgumentException] { PpmKind.Amdahl.fromParams(Array(1.0, 2.0, 3.0)) }
  }

  test("paramNames align with params ordering") {
    assert(PpmKind.PowerLaw.paramNames == IndexedSeq("a", "b", "m"))
    assert(PowerLawPpm(-1, 2, 3).params.toSeq == Seq(-1.0, 2.0, 3.0))
    assert(PpmKind.Amdahl.paramNames == IndexedSeq("s", "p"))
    assert(AmdahlPpm(4, 5).params.toSeq == Seq(4.0, 5.0))
  }

  test("property: fitted AE_PL stays monotone on noisy decreasing curves") {
    val gen = for {
      b     <- Gen.choose(50.0, 500.0)
      a     <- Gen.choose(-1.5, -0.1)
      noise <- Gen.listOfN(6, Gen.choose(0.9, 1.1))
    } yield IndexedSeq(1, 3, 8, 16, 32, 48).zip(noise).map { case (n, eps) =>
      n -> math.max(b * math.pow(n, a), 5.0) * eps
    }
    checkProp(Prop.forAll(gen) { points =>
      val fit = PpmKind.PowerLaw.fit(points)
      (1 until 48).forall(n => fit.time(n + 1) <= fit.time(n) + 1e-9)
    })
  }
}
