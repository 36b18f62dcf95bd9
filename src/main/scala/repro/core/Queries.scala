package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.DecimalType

import repro.scan.QueryProfile

/** TPC-H Queries 1 and 6 — the paper's evaluation queries (Sections 5.2–5.4)
  * — as Spark DataFrame (Catalyst) transformations, plus the equivalent
  * DuckDB SQL used by the oracle.
  *
  * Sum aggregates are computed in DECIMAL on both engines so that the
  * cross-engine comparison is exact (float summation order would otherwise
  * flake the oracle); averages are computed in DOUBLE and rounded to four
  * decimals on both sides.
  */
object Queries {

  /** Q1's date predicate: l_shipdate <= 1998-12-01 minus 90 days. */
  val Q1CutoffDate = "1998-09-02"
  /** Q6's shipdate year. */
  val Q6DateLo = "1994-01-01"
  val Q6DateHi = "1995-01-01"

  private val price = DecimalType(12, 2)
  private val rate  = DecimalType(4, 2)
  private val qty   = DecimalType(18, 6)

  /** TPC-H Q1: pricing summary report (selects ~98 % of LINEITEM). */
  def q1(lineitem: DataFrame): DataFrame = {
    val l    = lineitem.filter(col("l_shipdate") <= lit(Q1CutoffDate).cast("date"))
    val ep   = col("l_extendedprice").cast(price)
    val disc = col("l_discount").cast(rate)
    val tax  = col("l_tax").cast(rate)
    l.groupBy(col("l_returnflag"), col("l_linestatus"))
      .agg(
        sum(col("l_quantity").cast(qty))                          as "sum_qty",
        sum(ep)                                                   as "sum_base_price",
        sum(ep * (lit(1).cast(rate) - disc))                      as "sum_disc_price",
        sum(ep * (lit(1).cast(rate) - disc) * (lit(1).cast(rate) + tax)) as "sum_charge",
        round(avg(col("l_quantity").cast("double")), 4)           as "avg_qty",
        round(avg(col("l_extendedprice").cast("double")), 4)      as "avg_price",
        round(avg(col("l_discount").cast("double")), 4)           as "avg_disc",
        count(lit(1))                                             as "count_order",
      )
      .orderBy(col("l_returnflag"), col("l_linestatus"))
  }

  /** DuckDB-side Q1 over the VARCHAR-typed oracle table. */
  val q1DuckSql: String =
    s"""SELECT l_returnflag, l_linestatus,
       |  sum(CAST(l_quantity AS DECIMAL(18,6)))                                  AS sum_qty,
       |  sum(CAST(l_extendedprice AS DECIMAL(12,2)))                             AS sum_base_price,
       |  sum(CAST(l_extendedprice AS DECIMAL(12,2))
       |      * (CAST(1 AS DECIMAL(4,2)) - CAST(l_discount AS DECIMAL(4,2))))     AS sum_disc_price,
       |  sum(CAST(l_extendedprice AS DECIMAL(12,2))
       |      * (CAST(1 AS DECIMAL(4,2)) - CAST(l_discount AS DECIMAL(4,2)))
       |      * (CAST(1 AS DECIMAL(4,2)) + CAST(l_tax AS DECIMAL(4,2))))          AS sum_charge,
       |  round(avg(CAST(l_quantity AS DOUBLE)), 4)                               AS avg_qty,
       |  round(avg(CAST(l_extendedprice AS DOUBLE)), 4)                          AS avg_price,
       |  round(avg(CAST(l_discount AS DOUBLE)), 4)                               AS avg_disc,
       |  count(*)                                                                AS count_order
       |FROM lineitem
       |WHERE l_shipdate <= '$Q1CutoffDate'
       |GROUP BY l_returnflag, l_linestatus""".stripMargin

  /** TPC-H Q6: forecasting revenue change (selects ~2 % of LINEITEM). */
  def q6(lineitem: DataFrame): DataFrame =
    lineitem
      .filter(
        col("l_shipdate") >= lit(Q6DateLo).cast("date") &&
        col("l_shipdate") <  lit(Q6DateHi).cast("date") &&
        col("l_discount").between(0.05, 0.07) &&
        col("l_quantity") < 24)
      .agg(sum(col("l_extendedprice").cast(price) * col("l_discount").cast(rate)) as "revenue")

  /** DuckDB-side Q6 over the VARCHAR-typed oracle table. */
  val q6DuckSql: String =
    s"""SELECT sum(CAST(l_extendedprice AS DECIMAL(12,2))
       |         * CAST(l_discount AS DECIMAL(4,2))) AS revenue
       |FROM lineitem
       |WHERE l_shipdate >= '$Q6DateLo' AND l_shipdate < '$Q6DateHi'
       |  AND CAST(l_discount AS DOUBLE) BETWEEN 0.05 AND 0.07
       |  AND CAST(l_quantity AS DOUBLE) < 24""".stripMargin

  // ---------------------------------------------------------------------
  // Query profiles for the scan/cost models. The normalized key domain is
  // SynthData's l_shipdate range: 1992-01-01 + [0, 2557) days.
  // ---------------------------------------------------------------------

  /** Days between 1992-01-01 and a date, normalized by the 2557-day span. */
  def normalizedShipdate(date: String): Double = {
    val epoch = java.time.LocalDate.parse("1992-01-01")
    val d     = java.time.LocalDate.parse(date)
    java.time.temporal.ChronoUnit.DAYS.between(epoch, d).toDouble / 2557.0
  }

  val Q1Columns: Set[String] = Set("l_quantity", "l_extendedprice", "l_discount", "l_tax",
    "l_returnflag", "l_linestatus", "l_shipdate")
  val Q6Columns: Set[String] = Set("l_shipdate", "l_discount", "l_quantity", "l_extendedprice")

  /** Q1 keeps ~95-98 % of the sorted key range — only the trailing files
    * prune (Fig 11: ~2 % of workers return immediately).
    */
  val Q1Profile: QueryProfile =
    QueryProfile("Q1", Q1Columns, 0.0, normalizedShipdate(Q1CutoffDate), rowSelectivity = 0.98)

  /** Q6 touches one year out of seven — ~85 % of files prune. */
  val Q6Profile: QueryProfile =
    QueryProfile("Q6", Q6Columns, normalizedShipdate(Q6DateLo), normalizedShipdate(Q6DateHi),
      rowSelectivity = 0.02)
}
