package repro.sparkint

import repro.{Oracle, SparkSpec}

/** Every TPC-H-lite query must produce DuckDB-identical results on Spark —
  * this is the correctness bed for all CLEO-changed plans.
  */
class TpchLiteSpec extends SparkSpec {

  private lazy val tables = TpchLite.register(spark, 0.004)

  for (q <- TpchLite.queries; param <- Seq(1, 4)) {
    test(s"${q.name} (param $param) matches the DuckDB oracle") {
      val registered = tables // force view registration before spark.sql
      val sql = q.sql(param)
      Oracle.assertEquivalent(spark.sql(sql), sql, q.tables.map(t => t -> registered(t)): _*)
    }
  }

  test("queries reference only registered tables") {
    TpchLite.queries.foreach { q =>
      q.tables.foreach(t => assert(tables.contains(t), s"${q.name} references $t"))
    }
  }

  test("parameterization changes the result") {
    tables // force view registration
    val q = TpchLite.queries.find(_.name == "Q1").get
    val a = spark.sql(q.sql(1)).collect().map(_.toString).toSet
    val b = spark.sql(q.sql(9)).collect().map(_.toString).toSet
    assert(a != b, "different date cuts must change Q1's aggregates")
  }
}
