package repro.core

import repro.SparkSpec
import repro.tpcds.{Queries, TpcdsLite}

class PlanFeaturizerSpec extends SparkSpec {

  private def idx(name: String): Int = PlanFeaturizer.featureNames.indexOf(name)

  private lazy val views = TpcdsLite.registerViews(spark, 0.002)

  test("feature vector has the declared width") {
    views
    val f = PlanFeaturizer.featurize(spark.sql("SELECT 1 AS x"))
    assert(f.length == PlanFeaturizer.featureNames.size)
  }

  test("feature names include the paper's Table 2 aggregates") {
    Seq("num_operators", "max_depth", "num_sources", "input_bytes", "rows_processed")
      .foreach(n => assert(PlanFeaturizer.featureNames.contains(n)))
    assert(PlanFeaturizer.operatorKinds.size == 14)
  }

  test("a two-table join counts one Join and two sources") {
    views
    val f = PlanFeaturizer.featurize(
      spark.sql("SELECT COUNT(*) AS c FROM store_sales JOIN item ON ss_item_sk = i_item_sk"))
    assert(f(idx("Join")) == 1.0)
    assert(f(idx("num_sources")) == 2.0)
  }

  test("a three-table join counts two Joins") {
    views
    val f = PlanFeaturizer.featurize(spark.sql(
      """SELECT COUNT(*) AS c FROM store_sales
         JOIN item ON ss_item_sk = i_item_sk
         JOIN date_dim ON ss_sold_date_sk = d_date_sk"""))
    assert(f(idx("Join")) == 2.0)
    assert(f(idx("num_sources")) == 3.0)
  }

  test("filters survive into the optimized plan counts") {
    views
    val f = PlanFeaturizer.featurize(
      spark.sql("SELECT ss_item_sk FROM store_sales WHERE ss_quantity > 10"))
    assert(f(idx("Filter")) >= 1.0)
  }

  test("aggregates are counted") {
    views
    val f = PlanFeaturizer.featurize(
      spark.sql("SELECT ss_item_sk, COUNT(*) AS c FROM store_sales GROUP BY ss_item_sk"))
    assert(f(idx("Aggregate")) >= 1.0)
  }

  test("sorts are counted") {
    views
    val f = PlanFeaturizer.featurize(
      spark.sql("SELECT ss_item_sk FROM store_sales ORDER BY ss_item_sk"))
    assert(f(idx("Sort")) == 1.0)
  }

  test("unions are counted") {
    views
    val f = PlanFeaturizer.featurize(spark.sql(
      "SELECT ss_item_sk AS k FROM store_sales UNION ALL SELECT ws_item_sk AS k FROM web_sales"))
    assert(f(idx("Union")) == 1.0)
  }

  test("max depth grows with plan complexity") {
    views
    val simple  = PlanFeaturizer.featurize(spark.sql("SELECT ss_item_sk FROM store_sales"))
    val complex = PlanFeaturizer.featurize(spark.sql(
      """SELECT i_category, SUM(ss_quantity) AS q FROM store_sales
         JOIN item ON ss_item_sk = i_item_sk WHERE ss_quantity > 5
         GROUP BY i_category ORDER BY i_category"""))
    assert(complex(idx("max_depth")) > simple(idx("max_depth")))
    assert(complex(idx("num_operators")) > simple(idx("num_operators")))
  }

  test("input bytes are positive and grow with more sources") {
    views
    val one = PlanFeaturizer.featurize(spark.sql("SELECT COUNT(*) AS c FROM store_sales"))
    val two = PlanFeaturizer.featurize(
      spark.sql("SELECT COUNT(*) AS c FROM store_sales JOIN item ON ss_item_sk = i_item_sk"))
    assert(one(idx("input_bytes")) > 0.0)
    assert(two(idx("input_bytes")) > one(idx("input_bytes")))
  }

  test("rows processed are positive for every workload query") {
    views
    Queries.oneVariantPerTemplate.foreach { q =>
      val f = PlanFeaturizer.featurize(spark.sql(q.sql))
      assert(f(idx("rows_processed")) > 0.0, q.id)
    }
  }

  test("featurization is deterministic for a fixed plan") {
    views
    val q = Queries.byId("q001")
    val a = PlanFeaturizer.featurize(spark.sql(q.sql))
    val b = PlanFeaturizer.featurize(spark.sql(q.sql))
    assert(a.sameElements(b))
  }

  test("ablation subsets project the right columns") {
    val full = PlanFeaturizer.featureNames.indices.map(_.toDouble).toArray
    val f2   = PlanFeaturizer.project(full, PlanFeaturizer.F2)
    assert(f2.length == 2)
    assert(f2(0) == idx("input_bytes").toDouble)
    assert(f2(1) == idx("rows_processed").toDouble)
  }

  test("F1/F2/F3 follow the paper's definitions") {
    assert(PlanFeaturizer.F1.size == 6)
    assert(PlanFeaturizer.F2 == IndexedSeq("input_bytes", "rows_processed"))
    assert(PlanFeaturizer.F3.toSet == PlanFeaturizer.F1.toSet -- PlanFeaturizer.F2.toSet)
  }

  test("projecting unknown features is rejected") {
    intercept[IllegalArgumentException] {
      PlanFeaturizer.project(new Array[Double](PlanFeaturizer.featureNames.size), IndexedSeq("nope"))
    }
  }
}
