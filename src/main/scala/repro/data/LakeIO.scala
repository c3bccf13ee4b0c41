package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Parquet persistence for a data lake (distributed substrate).
  *
  * The lake is stored in long format — one record per cell:
  * `(table, baseId, rowId, baseRowId, colIdx, header, baseCol, numeric, value)`
  * — which Spark reads/writes in parallel and which reassembles losslessly
  * into [[SimpleTable]]s. `value` is null for outer-union pads.
  */
object LakeIO {

  final case class CellRow(
      table: String,
      baseId: Int,
      rowId: Int,
      baseRowId: Int,
      colIdx: Int,
      header: String,
      baseCol: Int,
      numeric: Boolean,
      value: String,
  )

  /** Tables → long-format DataFrame. */
  def toDF(spark: SparkSession, tables: Seq[SimpleTable]): DataFrame = {
    import spark.implicits._
    val cells = tables.flatMap { t =>
      t.rows.indices.flatMap { i =>
        t.cols.indices.map { j =>
          val c = t.cols(j)
          CellRow(t.name, t.baseId, i, t.baseRowIds(i), j, c.header, c.baseCol, c.numeric,
                  t.rows(i)(j).orNull)
        }
      }
    }
    spark.createDataset(cells).toDF()
  }

  def write(spark: SparkSession, tables: Seq[SimpleTable], path: String): Unit =
    toDF(spark, tables).write.mode("overwrite").parquet(path)

  def read(spark: SparkSession, path: String): Vector[SimpleTable] =
    fromDF(spark.read.parquet(path))

  /** Long-format DataFrame → tables (order-stable reconstruction). */
  def fromDF(df: DataFrame): Vector[SimpleTable] = {
    val rows = df.select("table", "baseId", "rowId", "baseRowId", "colIdx", "header",
                         "baseCol", "numeric", "value")
      .collect()
    rows.groupBy(_.getString(0)).toVector.sortBy(_._1).map { case (name, cells) =>
      val baseId = cells.head.getInt(1)
      val colSpecs = cells
        .groupBy(_.getInt(4))
        .toVector.sortBy(_._1)
        .map { case (_, cs) =>
          val c = cs.head
          ColumnSpec(c.getString(5), c.getInt(6), c.getBoolean(7))
        }
      val byRow = cells.groupBy(_.getInt(2)).toVector.sortBy(_._1)
      val tableRows = byRow.map { case (_, rcs) =>
        rcs.sortBy(_.getInt(4)).map(r => Option(r.getAs[String]("value"))).toVector
      }
      val provenance = byRow.map(_._2.head.getInt(3))
      SimpleTable(name, baseId, colSpecs, tableRows, provenance)
    }
  }
}
