package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.mpc.MpcBackend

/** Integration tests over the TPC-H-lite generators: realistic OLAP shapes
  * (selective filters, joins on foreign keys, skewed keys) through the full
  * compile-and-execute pipeline, oracle-checked.
  */
class TpchLiteSpec extends SparkSpec {

  private val pA = Party("a"); private val pB = Party("b")

  private def run(dag: Dag, config: CompileConfig,
      inputs: Map[String, org.apache.spark.sql.DataFrame]): ExecResult =
    new Executor(spark, MpcBackend.sharemind(Set(pA, pB)))
      .run(Compiler.compile(dag, config), inputs)

  // Two "parties" each hold a horizontal slice of lineitem. Quantities and
  // prices are floored to integers so MPC fixed-point sums are bit-exact
  // against the oracle.
  private def lineitemParts() = {
    val li = SynthData.lineitem(spark, sf = 0.0005).select(
      col("l_orderkey"), col("l_linenumber"),
      col("l_quantity").cast("long").cast("double").as("l_quantity"),
      col("l_extendedprice").cast("long").cast("double").as("l_extendedprice"))
    (li.where(col("l_orderkey") % 2 === 0), li.where(col("l_orderkey") % 2 === 1))
  }

  test("pricing-summary-style query (filter + grouped sum) matches DuckDB") {
    val (liA, liB) = lineitemParts()
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    val cols = Seq("l_orderkey", "l_linenumber", "l_quantity", "l_extendedprice")
    val a = table("liA", pA, cols.map(col(_)): _*)
    val b = table("liB", pB, cols.map(col(_)): _*)
    concat(a, b)
      .filter("l_quantity", CmpOp.Leq, 25)
      .sum(Seq("l_linenumber"), over = "l_quantity", out = "sum_qty")
      .writeTo("out", pA)
    val res = run(dag, CompileConfig.default, Map("liA" -> liA, "liB" -> liB))
    Oracle.assertEquivalent(res.outputs("out"),
      """SELECT l_linenumber, SUM(CAST(l_quantity AS DOUBLE)) AS sum_qty
        |FROM (SELECT * FROM liA UNION ALL SELECT * FROM liB)
        |WHERE CAST(l_quantity AS DOUBLE) <= 25 GROUP BY l_linenumber""".stripMargin,
      "liA" -> liA, "liB" -> liB)
    // The heavy lifting stayed outside MPC (filter + pre-aggregation local).
    assert(res.metrics.closedRows < 20,
      s"only per-party partials may enter MPC: ${res.metrics.closedRows}")
  }

  test("orders x customer foreign-key join across parties matches DuckDB") {
    val ord = SynthData.orders(spark, sf = 0.0003)
      .select("o_orderkey", "o_custkey").limit(150)
    val cust = SynthData.customer(spark, sf = 0.003)
      .select("c_custkey", "c_nationkey").limit(150)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    table("ord", pA, col("o_orderkey"), col("o_custkey"))
      .join(table("cust", pB, col("c_custkey"), col("c_nationkey")),
        Seq("o_custkey"), Seq("c_custkey"))
      .count(Seq("c_nationkey"), out = "orders_per_nation")
      .writeTo("out", pA)
    val res = run(dag, CompileConfig.default, Map("ord" -> ord, "cust" -> cust))
    Oracle.assertEquivalent(res.outputs("out"),
      """SELECT c_nationkey, CAST(COUNT(*) AS DOUBLE) AS orders_per_nation
        |FROM ord JOIN cust ON ord.o_custkey = cust.c_custkey
        |GROUP BY c_nationkey""".stripMargin,
      "ord" -> ord, "cust" -> cust)
  }

  test("skewed (zipf) keys aggregate correctly under MPC") {
    val z1 = SynthData.zipfKeys(spark, 150, nKeys = 20, seed = 1)
      .select(col("k"), (col("v") * 100).cast("long").cast("double").as("v"))
    val z2 = SynthData.zipfKeys(spark, 150, nKeys = 20, seed = 2)
      .select(col("k"), (col("v") * 100).cast("long").cast("double").as("v"))
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("z1", pA, col("k"), col("v")), table("z2", pB, col("k"), col("v")))
      .count(Seq("k"), out = "c")
      .writeTo("out", pA)
    // mpcOnly: the aggregation itself runs obliviously over the skewed keys.
    val res = run(dag, CompileConfig.mpcOnly, Map("z1" -> z1, "z2" -> z2))
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, CAST(COUNT(*) AS DOUBLE) AS c FROM (SELECT * FROM z1 UNION ALL SELECT * FROM z2) GROUP BY k",
      "z1" -> z1, "z2" -> z2)
  }

  test("min/max pricing extremes per line number match DuckDB") {
    val (liA, liB) = lineitemParts()
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    val cols = Seq("l_orderkey", "l_linenumber", "l_quantity", "l_extendedprice")
    concat(table("liA", pA, cols.map(col(_)): _*), table("liB", pB, cols.map(col(_)): _*))
      .project("l_linenumber", "l_quantity")
      .aggregate(Seq("l_linenumber"), AggFn.Max, Some("l_quantity"), "max_qty")
      .writeTo("out", pA)
    val res = run(dag, CompileConfig.default, Map("liA" -> liA, "liB" -> liB))
    Oracle.assertEquivalent(res.outputs("out"),
      """SELECT l_linenumber, MAX(CAST(l_quantity AS DOUBLE)) AS max_qty
        |FROM (SELECT * FROM liA UNION ALL SELECT * FROM liB) GROUP BY l_linenumber""".stripMargin,
      "liA" -> liA, "liB" -> liB)
  }
}
