package repro.sparkops

import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{Grid, SynthSpatial}
import org.apache.spark.sql.functions._

/** DataFrame cell conversion (Defs. 4–5 as dataflow) agrees with the core
  * grid and with DuckDB over the same points.
  */
class SparkCellsSpec extends SparkSpec {

  private val theta = 8
  private val grid = Grid.world(theta)
  private lazy val specs = SynthSpatial.testSources(2, 12, 25)
  private lazy val points = SynthData.spatialSources(spark, specs).cache()
  private lazy val cells = SpatialCells.toCells(points, grid).cache()

  test("toCells matches the core grid per dataset") {
    val got = cells.collect()
      .groupBy(r => (r.getInt(0), r.getInt(1)))
      .view.mapValues(_.map(_.getLong(2)).sorted.toSeq).toMap
    val exp = specs.flatMap { spec =>
      SynthSpatial.cellSource(spec, grid).map { case (id, cs) =>
        (spec.sourceId, id) -> cs.toSeq
      }
    }.toMap
    assert(got == exp)
  }

  test("every generated point maps into its dataset's cell set") {
    val spec = specs.head
    val ds = SynthSpatial.dataset(spec, 3)
    val cs = grid.cellSet(ds.points).toSet
    ds.points.foreach(p => assert(cs.contains(grid.cellOf(p.x, p.y))))
  }

  test("oracle: per-dataset distinct cell counts match DuckDB") {
    val got = cells.groupBy(col("source_id"), col("dataset_id"))
      .agg(count(col("cell")).as("n_cells"))
    Oracle.assertEquivalent(got,
      """SELECT source_id, dataset_id, COUNT(DISTINCT cell) AS n_cells
        |FROM cells GROUP BY source_id, dataset_id""".stripMargin,
      "cells" -> cells)
  }

  test("toCellSets produces sorted distinct arrays consistent with toCells") {
    val sets = SpatialCells.toCellSets(cells).collect()
    sets.foreach { r =>
      val arr = r.getSeq[Long](2)
      assert(arr == arr.sorted && arr.distinct == arr)
    }
    val totalFromSets = sets.map(_.getSeq[Long](2).length).sum
    assert(totalFromSets == cells.count())
  }

  test("z_cell is registered and usable from SQL") {
    val fn = SpatialCells.registerZCell(spark, grid)
    points.limit(50).createOrReplaceTempView("pts")
    val viaSql = spark.sql(s"SELECT $fn(x, y) AS cell FROM pts").collect().map(_.getLong(0))
    val direct = points.limit(50).collect().map(r => grid.cellOf(r.getDouble(2), r.getDouble(3)))
    assert(viaSql.sorted.toSeq == direct.sorted.toSeq)
  }

  test("spatialSource is deterministic in the seed") {
    val a = SynthData.spatialSource(spark, specs.head, seed = 7L).collect().toSeq
    val b = SynthData.spatialSource(spark, specs.head, seed = 7L).collect().toSeq
    assert(a.sortBy(_.toString) == b.sortBy(_.toString))
  }
}
