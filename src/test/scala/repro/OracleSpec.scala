package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the DuckDB oracle itself. */
class OracleSpec extends SparkSpec {

  test("oracle accepts an equivalent aggregate") {
    import spark.implicits._
    val df = Seq((1, 10.0), (1, 20.0), (2, 5.0)).toDF("k", "v")
    val agg = df.groupBy($"k").agg(sum($"v") as "s").select($"k", $"s")
    Oracle.assertEquivalent(agg,
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> df)
  }

  test("oracle rejects a wrong result") {
    import spark.implicits._
    val df = Seq((1, 10.0), (2, 5.0)).toDF("k", "v")
    val wrong = df.select($"k", ($"v" * 2) as "s")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, CAST(v AS DOUBLE) AS s FROM t", "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq((1, 10.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select($"k"), "SELECT k, v FROM t", "t" -> df)
    }
  }

  test("oracle tolerates summation-order float noise") {
    import spark.implicits._
    val df = (1 to 1000).map(i => (i % 7, i * 1.000001)).toDF("k", "v")
    val agg = df.groupBy($"k").agg(sum($"v") as "s")
    Oracle.assertEquivalent(agg,
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> df)
  }
}
