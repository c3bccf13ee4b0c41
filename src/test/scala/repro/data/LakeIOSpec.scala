package repro.data

import java.nio.file.Files
import repro.{Oracle, SparkSpec}

class LakeIOSpec extends SparkSpec {
  private lazy val tables = Generators.ugenLite.lake.take(6)

  test("toDF produces one record per cell") {
    val df = LakeIO.toDF(spark, tables)
    val expected = tables.map(t => t.nRows.toLong * t.nCols).sum
    assert(df.count() == expected)
  }

  test("parquet round-trip is lossless") {
    val dir = Files.createTempDirectory("lake").resolve("p").toString
    LakeIO.write(spark, tables, dir)
    val back = LakeIO.read(spark, dir)
    assert(back.map(_.name).sorted == tables.map(_.name).sorted)
    back.foreach { t =>
      val orig = tables.find(_.name == t.name).get
      assert(t.cols == orig.cols)
      assert(t.rows == orig.rows)
      assert(t.baseRowIds == orig.baseRowIds)
      assert(t.baseId == orig.baseId)
    }
  }

  test("null pads survive the round-trip") {
    val padded = SimpleTable("padded", 9,
      Vector(ColumnSpec("a", 0, numeric = false), ColumnSpec("b", 1, numeric = false)),
      Vector(Vector(Some("x"), None), Vector(None, Some("y"))), Vector(0, 1))
    val dir = Files.createTempDirectory("lake2").resolve("p").toString
    LakeIO.write(spark, Seq(padded), dir)
    val back = LakeIO.read(spark, dir)
    assert(back.head.rows == padded.rows)
  }

  test("oracle: per-table tuple counts match DuckDB over the long format") {
    // `table` is a DuckDB keyword — alias the column for the oracle.
    val df = LakeIO.toDF(spark, tables).withColumnRenamed("table", "tbl")
    val agg = df.where("colIdx = 0").groupBy("tbl")
      .count().withColumnRenamed("count", "n")
    Oracle.assertEquivalent(agg,
      "SELECT tbl, count(*) AS n FROM lake WHERE colIdx = '0' GROUP BY tbl",
      "lake" -> df)
  }

  test("oracle: distinct header inventory matches DuckDB") {
    val df = LakeIO.toDF(spark, tables).withColumnRenamed("table", "tbl")
    val sel = df.select("tbl", "header").distinct()
    Oracle.assertEquivalent(sel,
      "SELECT DISTINCT tbl, header FROM lake",
      "lake" -> df)
  }

  test("fromDF preserves column order by colIdx") {
    val df = LakeIO.toDF(spark, tables)
    val back = LakeIO.fromDF(df)
    back.foreach { t =>
      val orig = tables.find(_.name == t.name).get
      assert(t.headers == orig.headers)
    }
  }
}
