package repro.exp

import repro.core.PlanFeaturizer

/** T2 — paper Table 2: the parameter-model feature list. Structural
  * reproduction: prints each feature our featurizer extracts, its paper
  * description, and its value on a sample query from the built workload.
  */
object FeatureTableExperiment {

  private val descriptions: Map[String, String] = Map(
    "num_operators"  -> "Total number of operators in the query plan",
    "max_depth"      -> "Maximum depth of query plan",
    "num_sources"    -> "Number of input data sources used by the query",
    "input_bytes"    -> "Estimated total bytes of input data used by the query",
    "rows_processed" -> "Estimated total rows processed by all operators",
    "Other"          -> "Count of operators outside the 14 tracked kinds",
  )

  def report(workload: Workload): String = {
    val sample = workload.queries.head
    val rows = PlanFeaturizer.featureNames.zipWithIndex.map { case (f, i) =>
      val desc = descriptions.getOrElse(f, s"Count of $f operators in the query plan")
      Seq(f, desc, f"${sample.features(i)}%.0f")
    }
    TextTable.render(
      s"T2 — parameter-model features (paper Table 2); sample values for ${sample.query.id}",
      Seq("feature", "description", s"value (${sample.query.id})"),
      rows,
    )
  }
}
