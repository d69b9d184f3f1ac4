package repro.sparkint

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData

/** TPC-H-lite query set for the real-Spark retrofit experiment
  * (Section 6.6.2 analog). Queries are written in the SQL subset shared by
  * Spark SQL and DuckDB (explicit casts) so the DuckDB oracle can verify
  * result equality of CLEO-changed plans on identical input.
  *
  * Each query is parameterized (dates/type cuts) like the paper's runs with
  * "randomly chosen different parameters".
  */
object TpchLite {

  final case class Query(name: String, tables: Seq[String], sql: Int => String)

  private def dateCut(param: Int): String = {
    val days = 400 + (param * 97) % 1600
    java.time.LocalDate.of(1992, 1, 1).plusDays(days).toString
  }
  private def dateLo(param: Int): String = {
    val days = 100 + (param * 53) % 800
    java.time.LocalDate.of(1992, 1, 1).plusDays(days).toString
  }
  private def segment(param: Int): String =
    Seq("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")(param % 5)
  private def ptype(param: Int): String =
    Seq("STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO")(param % 6)

  val queries: Seq[Query] = Seq(
    Query("Q1", Seq("lineitem"), p => s"""
      SELECT l_returnflag AS rf, l_linestatus AS ls,
             SUM(CAST(l_quantity AS DOUBLE)) AS sum_qty,
             SUM(CAST(l_extendedprice AS DOUBLE)) AS sum_price,
             AVG(CAST(l_discount AS DOUBLE)) AS avg_disc,
             COUNT(*) AS cnt
      FROM lineitem
      WHERE CAST(l_shipdate AS DATE) <= DATE '${dateCut(p)}'
      GROUP BY l_returnflag, l_linestatus"""),

    Query("Q3", Seq("customer", "orders", "lineitem"), p => s"""
      SELECT CAST(o.o_orderkey AS BIGINT) AS okey,
             SUM(CAST(l.l_extendedprice AS DOUBLE) * (1 - CAST(l.l_discount AS DOUBLE))) AS revenue
      FROM customer c
      JOIN orders o ON CAST(c.c_custkey AS BIGINT) = CAST(o.o_custkey AS BIGINT)
      JOIN lineitem l ON CAST(l.l_orderkey AS BIGINT) = CAST(o.o_orderkey AS BIGINT)
      WHERE c.c_mktsegment = '${segment(p)}'
        AND CAST(o.o_orderdate AS DATE) < DATE '${dateCut(p)}'
        AND CAST(l.l_shipdate AS DATE) > DATE '${dateLo(p)}'
      GROUP BY o.o_orderkey"""),

    Query("Q5", Seq("customer", "orders", "lineitem"), p => s"""
      SELECT CAST(c.c_nationkey AS INT) AS nk,
             SUM(CAST(l.l_extendedprice AS DOUBLE) * (1 - CAST(l.l_discount AS DOUBLE))) AS revenue
      FROM customer c
      JOIN orders o ON CAST(c.c_custkey AS BIGINT) = CAST(o.o_custkey AS BIGINT)
      JOIN lineitem l ON CAST(l.l_orderkey AS BIGINT) = CAST(o.o_orderkey AS BIGINT)
      WHERE CAST(o.o_orderdate AS DATE) >= DATE '${dateLo(p)}'
        AND CAST(o.o_orderdate AS DATE) < DATE '${dateCut(p)}'
      GROUP BY c.c_nationkey"""),

    Query("Q8", Seq("part", "lineitem", "orders"), p => s"""
      SELECT YEAR(CAST(o.o_orderdate AS DATE)) AS oy,
             SUM(CAST(l.l_extendedprice AS DOUBLE) * (1 - CAST(l.l_discount AS DOUBLE))) AS revenue
      FROM part pt
      JOIN lineitem l ON CAST(pt.p_partkey AS BIGINT) = CAST(l.l_partkey AS BIGINT)
      JOIN orders o ON CAST(l.l_orderkey AS BIGINT) = CAST(o.o_orderkey AS BIGINT)
      WHERE pt.p_type = '${ptype(p)}'
      GROUP BY YEAR(CAST(o.o_orderdate AS DATE))"""),

    Query("Q12", Seq("orders", "lineitem"), p => s"""
      SELECT l.l_linestatus AS ls, COUNT(*) AS cnt,
             SUM(CAST(o.o_totalprice AS DOUBLE)) AS total
      FROM orders o
      JOIN lineitem l ON CAST(o.o_orderkey AS BIGINT) = CAST(l.l_orderkey AS BIGINT)
      WHERE CAST(l.l_shipdate AS DATE) >= DATE '${dateLo(p)}'
        AND CAST(l.l_shipdate AS DATE) < DATE '${dateCut(p)}'
      GROUP BY l.l_linestatus"""),

    Query("Q14", Seq("lineitem", "part"), p => s"""
      SELECT SUM(CASE WHEN pt.p_type = 'PROMO'
                      THEN CAST(l.l_extendedprice AS DOUBLE) * (1 - CAST(l.l_discount AS DOUBLE))
                      ELSE 0.0 END) AS promo,
             SUM(CAST(l.l_extendedprice AS DOUBLE) * (1 - CAST(l.l_discount AS DOUBLE))) AS total
      FROM lineitem l
      JOIN part pt ON CAST(l.l_partkey AS BIGINT) = CAST(pt.p_partkey AS BIGINT)
      WHERE CAST(l.l_shipdate AS DATE) >= DATE '${dateLo(p)}'
        AND CAST(l.l_shipdate AS DATE) < DATE '${dateCut(p)}'"""),
  )

  /** Generates and registers the TPC-H-lite tables as cached temp views. */
  def register(spark: SparkSession, sf: Double): Map[String, DataFrame] = {
    val tables = Map(
      "lineitem" -> SynthData.lineitem(spark, sf),
      "orders"   -> SynthData.orders(spark, sf),
      "customer" -> SynthData.customer(spark, sf),
      "part"     -> SynthData.part(spark, sf),
    )
    tables.foreach { case (name, df) =>
      val cached = df.cache()
      cached.count() // materialize before timing
      cached.createOrReplaceTempView(name)
    }
    tables
  }
}
