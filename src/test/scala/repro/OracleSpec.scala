package repro

import org.apache.spark.sql.functions._

/** Self-tests for the DuckDB oracle: it must accept equivalent results and
  * reject wrong ones — otherwise every oracle-based test is meaningless.
  */
class OracleSpec extends SparkSpec {

  private def df(rows: (Double, Double)*) = {
    import spark.implicits._
    rows.toSeq.toDF("k", "v")
  }

  test("accepts an identical result") {
    val t = df((1.0, 10.0), (2.0, 20.0))
    Oracle.assertEquivalent(t, "SELECT k, v FROM t", "t" -> t)
  }

  test("accepts results regardless of row order") {
    val t = df((1.0, 10.0), (2.0, 20.0))
    Oracle.assertEquivalent(t.orderBy(col("v").desc), "SELECT k, v FROM t", "t" -> t)
  }

  test("rejects a wrong value") {
    val t = df((1.0, 10.0))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df((1.0, 11.0)), "SELECT k, v FROM t", "t" -> t)
    }
  }

  test("rejects missing and extra rows") {
    val t = df((1.0, 10.0), (2.0, 20.0))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df((1.0, 10.0)), "SELECT k, v FROM t", "t" -> t)
    }
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df((1.0, 10.0), (2.0, 20.0), (3.0, 30.0)),
        "SELECT k, v FROM t", "t" -> t)
    }
  }

  test("rejects a column-name mismatch") {
    val t = df((1.0, 10.0))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(t.withColumnRenamed("v", "w"), "SELECT k, v FROM t", "t" -> t)
    }
  }

  test("canonicalizes DuckDB varchar numbers against Spark doubles") {
    val t = df((1.0, 10.0), (10.0, 2.0))
    // Group-by key passes through DuckDB as VARCHAR; must still compare equal.
    Oracle.assertEquivalent(
      t.groupBy("k").agg(sum("v").cast("double").as("s")),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k",
      "t" -> t)
  }
}
