package repro.data

import repro.planner._

/** The 13-query evaluation workload (paper §9.1).
  *
  * Q1–Q5: SP queries with selectivity ≈5% → ≈80% (step ≈15%), expressed
  * as ranges over each dataset's uniformly-distributed year attribute.
  * Q9: `MOD(id, 10) < 1` — the random 10% selection used for scalability.
  * Q10–Q13: overlapping ranges, each containing the previous QE plus
  * ~30% more entities (Link-Index experiment, starting at 38%).
  */
object Workload {

  /** Selectivity steps of Q1..Q5. */
  val SpSelectivities: Seq[Double] = Seq(0.05, 0.20, 0.35, 0.50, 0.80)

  /** Selectivity steps of Q10..Q13 (|QE| of Q10 = 760K/2M = 38%). */
  val LiSelectivities: Seq[Double] = Seq(0.38, 0.494, 0.642, 0.835)

  /** Year attribute + domain per dataset family. */
  private val yearOf: Map[String, (String, Int, Int)] = Map(
    "ppl"  -> (("byear", 1900, 100)),
    "oagp" -> (("year", 1920, 100)),
    "oap"  -> (("startyear", 2000, 20)),
    "dsd"  -> (("year", 1970, 50)),
  )

  private def family(dataset: String): (String, Int, Int) =
    yearOf.collectFirst { case (k, v) if dataset.startsWith(k) => v }
      .getOrElse(throw new IllegalArgumentException(s"no workload family for $dataset"))

  /** Range predicate selecting ≈`frac` of the dataset. */
  def rangeFor(dataset: String, frac: Double): Pred = {
    val (attr, min, span) = family(dataset)
    RangePred(attr, min, min + math.max(1, math.ceil(span * frac).toInt) - 1)
  }

  /** Q1..Q5 for a dataset (1-based index). */
  def sp(dataset: String, q: Int): Pred = {
    require(q >= 1 && q <= 5, s"Q$q is not an SP sweep query")
    rangeFor(dataset, SpSelectivities(q - 1))
  }

  /** Q9 = MOD(id, 10) < 1. */
  def q9: Pred = ModLtPred(10, 1)

  /** Q10..Q13 (index 10..13): overlapping ranges for the LI experiment. */
  def li(dataset: String, q: Int): Pred = {
    require(q >= 10 && q <= 13, s"Q$q is not an LI query")
    rangeFor(dataset, LiSelectivities(q - 10))
  }
}
