package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}
import org.apache.spark.sql.expressions.Window

/** The paper's §3.2 aggregation dataflow, expressed as Spark DataFrame
  * transformations (the paper uses a DuckDB CTE; semantics identical and
  * oracle-checked against DuckDB in the tests).
  *
  * From segmented trips, two aggregates are derived at an H3 resolution:
  *  - per-cell statistics (node attributes), and
  *  - per-(lag_cl, cl) transition statistics (edge list).
  *
  * `exact = true` uses exact distinct counts (deterministic — used by the
  * DuckDB oracle tests); `false` uses approx_count_distinct as the paper.
  */
object CellStats {

  /** Assign each report its cell `cl` and predecessor cell `lag_cl` along
    * the trip sequence. Requires HexGrid UDFs registered.
    */
  def withCells(trips: DataFrame, res: Int): DataFrame = {
    val w = Window.partitionBy("trip_id").orderBy("t")
    trips
      .withColumn("cl", F.call_udf("h3_cell", F.col("lat"), F.col("lon"), F.lit(res)))
      .withColumn("lag_cl", F.lag("cl", 1).over(w))
  }

  /** Per-cell node statistics: record count, distinct vessels, and median
    * lon/lat/sog/cog (the data-driven `w` projection of §3.3).
    */
  def cellTable(trips: DataFrame, res: Int, exact: Boolean = false): DataFrame = {
    val vessels =
      if (exact) F.countDistinct("vessel_id") else F.approx_count_distinct("vessel_id")
    withCells(trips, res).groupBy("cl").agg(
      F.count(F.lit(1)).as("cnt"),
      vessels.as("vessels"),
      F.expr("percentile(lon, 0.5)").as("med_lon"),
      F.expr("percentile(lat, 0.5)").as("med_lat"),
      F.expr("percentile(sog, 0.5)").as("med_sog"),
      F.expr("percentile(cog, 0.5)").as("med_cog"))
  }

  /** Per-(lag_cl, cl) edge statistics: distinct-trip transition counts and
    * the hex-grid distance of the transition. Self-transitions excluded.
    */
  def edgeTable(trips: DataFrame, res: Int, exact: Boolean = false): DataFrame = {
    val transitions =
      if (exact) F.countDistinct("trip_id") else F.approx_count_distinct("trip_id")
    withCells(trips, res)
      .filter(F.col("lag_cl").isNotNull && F.col("lag_cl") =!= F.col("cl"))
      .groupBy("lag_cl", "cl").agg(transitions.as("transitions"))
      .withColumn("dist", F.call_udf("h3_dist", F.col("lag_cl"), F.col("cl")))
  }
}
