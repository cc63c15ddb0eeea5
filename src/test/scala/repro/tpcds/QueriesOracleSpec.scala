package repro.tpcds

import repro.{Oracle, SparkSpec}

/** Result-correctness oracle: every query template is executed on Spark SQL
  * and on DuckDB over identical inputs and the canonicalized results must
  * match exactly. One variant per template keeps runtime bounded while still
  * covering every SQL shape in the workload.
  */
class QueriesOracleSpec extends SparkSpec {
  private val sf = 0.002

  private lazy val tables: Map[String, org.apache.spark.sql.DataFrame] = {
    val ts = TpcdsLite.tables(spark, sf).view.mapValues(_.cache()).toMap
    ts.foreach { case (name, df) => df.createOrReplaceTempView(name) }
    ts
  }

  for (q <- Queries.oneVariantPerTemplate) {
    test(s"${q.id} (${q.templateId}) matches DuckDB") {
      val inputs = q.tables.map(t => t -> tables(t))
      Oracle.assertEquivalent(spark.sql(q.sql), q.sql, inputs: _*)
    }
  }

  // A second variant for a few join-heavy templates, exercising different
  // filter constants through the same oracle.
  for (q <- Seq("q002", "q022", "q038", "q102")) {
    val query = Queries.byId(q)
    test(s"$q (${query.templateId}, extra variant) matches DuckDB") {
      val inputs = query.tables.map(t => t -> tables(t))
      Oracle.assertEquivalent(spark.sql(query.sql), query.sql, inputs: _*)
    }
  }
}
