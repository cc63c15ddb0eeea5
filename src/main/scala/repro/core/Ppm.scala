package repro.core

import repro.ml.LinearFit

/** Price-Performance Model (PPM, paper §3): a parametric function
  * `t(n) = f(n, scalars)` mapping computational resources (executor count
  * `n`, or total cores `k`, §3.3) to predicted query run time.
  *
  * Both concrete models are monotonically non-increasing in `n` by
  * construction, the constraint the paper imposes (§3.1).
  */
sealed trait Ppm {

  /** Predicted run time with `n` executors (or total cores). */
  def time(n: Double): Double

  /** Scalar parameters in the order of [[PpmKind.paramNames]] — the
    * regression targets of the parameter model `g` (§3.4).
    */
  def params: Array[Double]

  def kind: PpmKind

  /** Predicted times over a grid of candidate configurations. This is the
    * cheap step the paper contrasts with re-scoring an ML model per
    * configuration: the parameter model is scored once, then `f` is merely
    * evaluated (§3.4).
    */
  def curve(ns: Seq[Int]): IndexedSeq[(Int, Double)] = ns.iterator.map(n => n -> time(n)).toIndexedSeq
}

/** AE_PL (§3.1, Eq. 3): power law with saturation, `t(n) = max(b·n^a, m)`.
  * `a` is expected to be negative (time falls with resources) and `m` is a
  * lower bound on the running time (the saturation floor).
  */
final case class PowerLawPpm(a: Double, b: Double, m: Double) extends Ppm {
  require(m >= 0, s"saturation floor must be non-negative, got $m")
  override def time(n: Double): Double = {
    require(n >= 1, s"executor count must be >= 1, got $n")
    math.max(b * math.pow(n, a), m)
  }
  override def params: Array[Double] = Array(a, b, m)
  override def kind: PpmKind         = PpmKind.PowerLaw
}

/** AE_AL (§3.1, Eq. 4): Amdahl's-Law model, `t(n) = s + p/n` — a fixed
  * serial component `s` plus perfectly scalable work `p`.
  */
final case class AmdahlPpm(s: Double, p: Double) extends Ppm {
  require(s >= 0 && p >= 0, s"Amdahl components must be non-negative, got s=$s p=$p")
  override def time(n: Double): Double = {
    require(n >= 1, s"executor count must be >= 1, got $n")
    s + p / n
  }
  override def params: Array[Double] = Array(s, p)
  override def kind: PpmKind         = PpmKind.Amdahl
}

/** The PPM family selector, also responsible for (de)vectorizing parameters
  * for the ML parameter model.
  */
sealed trait PpmKind {
  def name: String
  def paramNames: IndexedSeq[String]
  def fromParams(params: Array[Double]): Ppm

  /** Fit this family to observed/estimated `(n, t)` points (paper §3.4). */
  def fit(points: IndexedSeq[(Int, Double)]): Ppm
}

object PpmKind {
  val all: Seq[PpmKind] = Seq(PowerLaw, Amdahl)

  /** AE_PL fitting (§3.4): `m` is the minimum time over all configurations;
    * `log t = log b + a·log n` is fit by OLS over the non-saturating region
    * `n ∈ [1, n_m]` (the paper's Eq. 5 writes `n·log a`, a typo for the
    * log-log form that `t = b·n^a` actually linearizes to).
    */
  case object PowerLaw extends PpmKind {
    override val name        = "AE_PL"
    override val paramNames  = IndexedSeq("a", "b", "m")
    override def fromParams(params: Array[Double]): Ppm = {
      require(params.length == 3, s"AE_PL needs 3 params, got ${params.length}")
      // The RF may extrapolate slightly out of the valid region; clamp to a
      // monotone non-increasing instance rather than failing the query.
      PowerLawPpm(a = math.min(params(0), 0.0), b = math.max(params(1), 0.0), m = math.max(params(2), 0.0))
    }
    override def fit(points: IndexedSeq[(Int, Double)]): Ppm = {
      require(points.nonEmpty, "cannot fit PPM on zero points")
      val sorted = points.sortBy(_._1)
      val m      = sorted.map(_._2).min
      // Non-saturating region: up to (and including) the first n that
      // reaches the floor; beyond it t(n) = m by definition.
      val tol     = 1e-9 + 1e-6 * m
      val nm      = sorted.find(_._2 <= m + tol).map(_._1).getOrElse(sorted.last._1)
      val region  = sorted.filter(_._1 <= nm)
      val usable  = region.filter(_._2 > 0)
      if (usable.length < 2) PowerLawPpm(a = 0.0, b = m, m = m)
      else {
        val f = LinearFit.fit(usable.map(p => math.log(p._1.toDouble)), usable.map(p => math.log(p._2)))
        PowerLawPpm(a = math.min(f.slope, 0.0), b = math.exp(f.intercept), m = m)
      }
    }
  }

  /** AE_AL fitting (§3.4): OLS of `t` against `1/n`; the intercept is the
    * serial fraction `s` and the slope the scalable work `p`. Components are
    * clamped at 0 to preserve the monotonicity constraint when the data is
    * noisy.
    */
  case object Amdahl extends PpmKind {
    override val name        = "AE_AL"
    override val paramNames  = IndexedSeq("s", "p")
    override def fromParams(params: Array[Double]): Ppm = {
      require(params.length == 2, s"AE_AL needs 2 params, got ${params.length}")
      AmdahlPpm(s = math.max(params(0), 0.0), p = math.max(params(1), 0.0))
    }
    override def fit(points: IndexedSeq[(Int, Double)]): Ppm = {
      require(points.nonEmpty, "cannot fit PPM on zero points")
      val f = LinearFit.fit(points.map(p => 1.0 / p._1), points.map(_._2))
      AmdahlPpm(s = math.max(f.intercept, 0.0), p = math.max(f.slope, 0.0))
    }
  }
}
