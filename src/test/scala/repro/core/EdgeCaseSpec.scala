package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types.{DoubleType, StructField, StructType}
import repro.{Oracle, SparkSpec}
import repro.mpc.MpcBackend

/** Degenerate inputs through the full pipeline: empty relations, single
  * rows, all-duplicate keys, filters that keep nothing.
  */
class EdgeCaseSpec extends SparkSpec {

  private val pA = Party("a"); private val pB = Party("b")

  private def df(rows: Seq[(Double, Double)]): DataFrame = {
    val st = StructType(Seq(StructField("k", DoubleType), StructField("v", DoubleType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => org.apache.spark.sql.Row(r._1, r._2))), st)
  }

  private def run(dag: Dag, inputs: Map[String, DataFrame]): ExecResult =
    new Executor(spark, MpcBackend.sharemind(Set(pA, pB)))
      .run(Compiler.compile(dag, CompileConfig.default), inputs)

  private def aggDag(): Dag = {
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .sum(Seq("k"), "v", "s").writeTo("out", pA)
    dag
  }

  test("both inputs empty: empty result, no crash") {
    val res = run(aggDag(), Map("t" -> df(Seq.empty), "u" -> df(Seq.empty)))
    assert(res.outputs("out").count() == 0)
  }

  test("one side empty") {
    val inputs = Map("t" -> df(Seq((1.0, 5.0), (1.0, 6.0))), "u" -> df(Seq.empty))
    val res = run(aggDag(), inputs)
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
      "t" -> inputs("t"), "u" -> inputs("u"))
  }

  test("single-row relations everywhere") {
    val inputs = Map("t" -> df(Seq((1.0, 5.0))), "u" -> df(Seq((1.0, 7.0))))
    val res = run(aggDag(), inputs)
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
      "t" -> inputs("t"), "u" -> inputs("u"))
  }

  test("all rows share one key (a single group)") {
    val inputs = Map(
      "t" -> df((1 to 9).map(i => (7.0, i.toDouble))),
      "u" -> df((1 to 5).map(i => (7.0, i.toDouble))))
    val res = run(aggDag(), inputs)
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
      "t" -> inputs("t"), "u" -> inputs("u"))
  }

  test("a filter that keeps nothing yields an empty aggregate") {
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .filter("v", CmpOp.Gt, 1e6)
      .sum(Seq("k"), "v", "s").writeTo("out", pA)
    val res = run(dag, Map("t" -> df(Seq((1.0, 5.0))), "u" -> df(Seq((2.0, 6.0)))))
    assert(res.outputs("out").count() == 0)
  }

  test("join with no matching keys is empty") {
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    table("t", pA, col("k"), col("v"))
      .join(table("u", pB, col("k"), col("w")), Seq("k"), Seq("k"))
      .writeTo("out", pA)
    val res = run(dag, Map(
      "t" -> df(Seq((1.0, 5.0))),
      "u" -> df(Seq((2.0, 6.0))).toDF("k", "w")))
    assert(res.outputs("out").count() == 0)
  }

  test("negative values survive sharing, sorting and aggregation") {
    val inputs = Map(
      "t" -> df(Seq((1.0, -5.0), (2.0, -7.0), (1.0, 3.0))),
      "u" -> df(Seq((2.0, -1.0))))
    val res = run(aggDag(), inputs)
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
      "t" -> inputs("t"), "u" -> inputs("u"))
  }

  test("limit larger than the relation returns everything") {
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .sum(Seq("k"), "v", "s").sortBy("s", ascending = false).limit(100)
      .writeTo("out", pA)
    val inputs = Map("t" -> df(Seq((1.0, 5.0), (2.0, 6.0))), "u" -> df(Seq((3.0, 7.0))))
    val res = run(dag, inputs)
    assert(res.outputs("out").count() == 3)
  }
}
