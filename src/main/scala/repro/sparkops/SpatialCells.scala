package repro.sparkops

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Grid

/** Points → cell-based datasets as a Spark dataflow (Defs. 4–5).
  *
  * Cell encoding is exposed as the SQL function `z_cell(x, y)` (registered
  * per grid), so the conversion is an ordinary Catalyst projection and the
  * result — `(source_id, dataset_id, cell)` distinct — feeds both the
  * pure-dataflow joinable search and the per-source DITS build.
  */
object SpatialCells {

  /** Register `z_cell` for `grid` on this session and return its name.
    * The name carries θ so differently-gridded registrations coexist.
    */
  def registerZCell(spark: SparkSession, grid: Grid): String = {
    val name = s"z_cell_${grid.theta}"
    spark.udf.register(name, (x: Double, y: Double) => grid.cellOf(x, y))
    name
  }

  /** `(source_id, dataset_id, x, y)` → distinct `(source_id, dataset_id,
    * cell)` under `grid` — the cell-based dataset relation (Def. 5).
    */
  def toCells(points: DataFrame, grid: Grid): DataFrame = {
    val spark = points.sparkSession
    val fn = registerZCell(spark, grid)
    points
      .select(col("source_id"), col("dataset_id"),
              call_udf(fn, col("x"), col("y")).as("cell"))
      .distinct()
  }

  /** Per-dataset cell arrays: `(source_id, dataset_id, cells ARRAY<LONG>)`
    * with cells sorted — the collection DITS builds from.
    */
  def toCellSets(cells: DataFrame): DataFrame =
    cells.groupBy("source_id", "dataset_id")
      .agg(sort_array(collect_set(col("cell"))).as("cells"))
}
