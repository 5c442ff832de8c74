package repro.core

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.data.Generators
import repro.mpc.{ColumnLeak, MpcBackend}
import repro.queries._

/** End-to-end execution of compiled plans: results are diffed against DuckDB
  * (via [[repro.Oracle]]) or a cleartext Spark reference, for every
  * compilation mode (full rewrites, hybrid, MPC-only), plus leakage and
  * metrics checks.
  */
class ExecutorSpec extends SparkSpec {

  private val pA = Party("a"); private val pB = Party("b"); private val pC = Party("c")

  private def run(dag: Dag, config: CompileConfig, inputs: Map[String, DataFrame],
      parties: Set[Party]): ExecResult = {
    val plan = Compiler.compile(dag, config)
    new Executor(spark, MpcBackend.sharemind(parties)).run(plan, inputs)
  }

  private def firstDouble(df: DataFrame): Double = df.collect().head.getDouble(0)

  // ------------------------------------------------- small ad-hoc queries

  private def twoPartyKeyed(n: Int): Map[String, DataFrame] = Map(
    "t" -> Generators.keyed(spark, n, 10, seed = 1),
    "u" -> Generators.keyed(spark, n, 10, seed = 2),
  )

  test("cross-party grouped sum (split aggregation) matches DuckDB") {
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    val t = table("t", pA, col("k"), col("v"))
    val u = table("u", pB, col("k"), col("v"))
    concat(t, u).sum(Seq("k"), "v", "s").writeTo("out", pA)
    val res = run(dag, CompileConfig.default, twoPartyKeyed(200), Set(pA, pB))
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
      "t" -> twoPartyKeyed(200)("t"), "u" -> twoPartyKeyed(200)("u"))
  }

  test("the same query under mpcOnly produces identical results") {
    val inputs = twoPartyKeyed(60)
    def build(): Dag = {
      val dag = new Dag
      val q = new Dsl(dag)
      import q._
      concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
        .sum(Seq("k"), "v", "s").writeTo("out", pA)
      dag
    }
    val full = run(build(), CompileConfig.default, inputs, Set(pA, pB))
    val mpc = run(build(), CompileConfig.mpcOnly, inputs, Set(pA, pB))
    Oracle.assertEquivalent(mpc.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
      "t" -> inputs("t"), "u" -> inputs("u"))
    assert(full.metrics.closedRows < mpc.metrics.closedRows,
      "push-down must shrink what enters MPC")
    assert(full.metrics.mpcModeledSeconds < mpc.metrics.mpcModeledSeconds)
  }

  test("cross-party join matches DuckDB") {
    val inputs = twoPartyKeyed(40)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    table("t", pA, col("k"), col("v"))
      .join(table("u", pB, col("k"), col("v2")), Seq("k"), Seq("k"))
      .writeTo("out", pA)
    val in2 = Map("t" -> inputs("t"), "u" -> inputs("u").toDF("k", "v2"))
    val res = run(dag, CompileConfig.default, in2, Set(pA, pB))
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT t.k AS k, t.v AS v, u.v2 AS v2 FROM t JOIN u ON t.k = u.k",
      "t" -> in2("t"), "u" -> in2("u"))
  }

  test("filters, distinct and global count compose correctly under MPC") {
    val inputs = twoPartyKeyed(80)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .filter("v", CmpOp.Leq, 500)
      .project("k")
      .distinct
      .aggregate(Seq.empty, AggFn.Count, None, "c")
      .writeTo("out", pA)
    // Distinct splitting + filters pushed down: still must match.
    val res = run(dag, CompileConfig.default, inputs, Set(pA, pB))
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT CAST(COUNT(DISTINCT k) AS DOUBLE) AS c FROM (SELECT * FROM t UNION ALL SELECT * FROM u) WHERE CAST(v AS DOUBLE) <= 500",
      "t" -> inputs("t"), "u" -> inputs("u"))
  }

  test("min and max aggregations match DuckDB") {
    val inputs = twoPartyKeyed(100)
    for ((fn, sql) <- Seq((AggFn.Min, "MIN"), (AggFn.Max, "MAX"))) {
      val dag = new Dag
      val q = new Dsl(dag)
      import q._
      concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
        .aggregate(Seq("k"), fn, Some("v"), "m").writeTo("out", pA)
      val res = run(dag, CompileConfig.default, inputs, Set(pA, pB))
      Oracle.assertEquivalent(res.outputs("out"),
        s"SELECT k, $sql(CAST(v AS DOUBLE)) AS m FROM (SELECT * FROM t UNION ALL SELECT * FROM u) GROUP BY k",
        "t" -> inputs("t"), "u" -> inputs("u"))
    }
  }

  test("single-party query runs fully in the clear (zero MPC)") {
    val inputs = twoPartyKeyed(100)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    table("t", pA, col("k"), col("v")).filter("v", CmpOp.Gt, 100)
      .sum(Seq("k"), "v", "s").writeTo("out", pA)
    val res = run(dag, CompileConfig.default, inputs, Set(pA))
    assert(res.metrics.closedRows == 0L)
    assert(res.metrics.mpcModeledSeconds == 0.0)
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS s FROM t WHERE CAST(v AS DOUBLE) > 100 GROUP BY k",
      "t" -> inputs("t"))
  }

  test("push-up: scalar multiply evaluated at the recipient still yields correct results") {
    val inputs = twoPartyKeyed(50)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .aggregate(Seq.empty, AggFn.Sum, Some("v"), "s")
      .multiplyBy("s3", "s", 3.0)
      .writeTo("out", pC)
    val res = run(dag, CompileConfig.default, inputs, Set(pA, pB, pC))
    Oracle.assertEquivalent(res.outputs("out"),
      "SELECT SUM(CAST(v AS DOUBLE)) AS s, SUM(CAST(v AS DOUBLE)) * 3 AS s3 FROM (SELECT * FROM t UNION ALL SELECT * FROM u)",
      "t" -> inputs("t"), "u" -> inputs("u"))
  }

  test("the MPC-row safety cap triggers") {
    val inputs = twoPartyKeyed(300)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .sortBy("v").limit(5).writeTo("out", pA)
    val plan = Compiler.compile(dag, CompileConfig.default)
    val ex = new Executor(spark, MpcBackend.sharemind(Set(pA, pB)), maxCloseRows = 100)
    assertThrows[IllegalArgumentException](ex.run(plan, inputs))
  }

  // --------------------------------------------------- market concentration

  test("market concentration: per-company revenue matches DuckDB bit-for-bit") {
    val inputs = MarketConcentration.InputNames.zipWithIndex.map { case (nm, i) =>
      nm -> Generators.taxiTrips(spark, 2000, seed = 100 + i)
    }.toMap
    val res = run(MarketConcentration.buildRevenueOnly(), CompileConfig.default, inputs,
      Set(pA, pB, pC))
    Oracle.assertEquivalent(res.outputs("rev"), MarketConcentration.revenueSql,
      inputs.toSeq: _*)
  }

  test("market concentration: full HHI matches the cleartext reference within fixed-point tolerance") {
    val inputs = MarketConcentration.InputNames.zipWithIndex.map { case (nm, i) =>
      nm -> Generators.taxiTrips(spark, 2000, seed = 100 + i)
    }.toMap
    inputs.foreach { case (nm, df) => df.createOrReplaceTempView(nm) }
    val expected = firstDouble(spark.sql(MarketConcentration.referenceSql))
    val res = run(MarketConcentration.build(), CompileConfig.default, inputs, Set(pA, pB, pC))
    val got = firstDouble(res.outputs(MarketConcentration.OutputName))
    assert(math.abs(got - expected) < 1e-3, s"hhi got=$got expected=$expected")
    assert(res.metrics.closedRows < 100, "only a handful of rows may enter MPC")
  }

  test("market concentration under mpcOnly matches too (tiny input)") {
    val inputs = MarketConcentration.InputNames.zipWithIndex.map { case (nm, i) =>
      nm -> Generators.taxiTrips(spark, 150, seed = 200 + i)
    }.toMap
    inputs.foreach { case (nm, df) => df.createOrReplaceTempView(nm) }
    val expected = firstDouble(spark.sql(MarketConcentration.referenceSql))
    val res = run(MarketConcentration.build(), CompileConfig.mpcOnly, inputs, Set(pA, pB, pC))
    val got = firstDouble(res.outputs(MarketConcentration.OutputName))
    assert(math.abs(got - expected) < 1e-3, s"hhi got=$got expected=$expected")
  }

  // --------------------------------------------------------- credit scores

  private def creditInputs(nDemo: Int, nScores: Int): Map[String, DataFrame] = Map(
    "demographics" -> Generators.demographics(spark, nDemo, nZips = 8),
    "scores1" -> Generators.creditScores(spark, nScores, nDemo, seed = 301),
    "scores2" -> Generators.creditScores(spark, nScores, nDemo, seed = 302),
  )

  test("credit regulation (hybrid): totals and counts per ZIP match DuckDB") {
    val inputs = creditInputs(300, 200)
    val res = run(CreditRegulation.build(trustRegulator = true, withAvg = false),
      CompileConfig.default, inputs, Set(pA, pB, pC))
    Oracle.assertEquivalent(res.outputs(CreditRegulation.OutputName),
      CreditRegulation.referenceSqlExact, inputs.toSeq: _*)
  }

  test("credit regulation without trust (full MPC) produces the same rows") {
    val inputs = creditInputs(60, 40)
    val res = run(CreditRegulation.build(trustRegulator = false, withAvg = false),
      CompileConfig.default, inputs, Set(pA, pB, pC))
    Oracle.assertEquivalent(res.outputs(CreditRegulation.OutputName),
      CreditRegulation.referenceSqlExact, inputs.toSeq: _*)
  }

  test("credit regulation with average: fixed-point division within tolerance") {
    val inputs = creditInputs(200, 150)
    inputs.foreach { case (nm, df) => df.createOrReplaceTempView(nm) }
    val expected = spark.sql(CreditRegulation.referenceSqlAvg)
      .collect().map(r => r.getDouble(0) -> r.getDouble(3)).toMap
    val res = run(CreditRegulation.build(trustRegulator = true, withAvg = true),
      CompileConfig.default, inputs, Set(pA, pB, pC))
    val got = res.outputs(CreditRegulation.OutputName)
      .collect().map(r => r.getDouble(0) -> r.getDouble(3)).toMap
    assert(got.keySet == expected.keySet)
    got.foreach { case (zip, avg) =>
      assert(math.abs(avg - expected(zip)) < 1e-3, s"zip=$zip got=$avg want=${expected(zip)}")
    }
  }

  test("credit regulation leakage: SSNs only to the regulator, scores to nobody") {
    val inputs = creditInputs(120, 80)
    val res = run(CreditRegulation.build(trustRegulator = true, withAvg = false),
      CompileConfig.default, inputs, Set(pA, pB, pC))
    val cols = res.leakage.columns
    assert(cols.nonEmpty, "the hybrid ops must have revealed key columns")
    assert(cols.forall(_.to == Set(pA)), s"all column reveals must target the STP: $cols")
    assert(!cols.exists(_.column.contains("score")), "score values must never be revealed")
    // Without annotations there are no column reveals at all.
    val res2 = run(CreditRegulation.build(trustRegulator = false, withAvg = false),
      CompileConfig.default, creditInputs(60, 40), Set(pA, pB, pC))
    assert(res2.leakage.columns.isEmpty)
  }

  // --------------------------------------------------------------- aspirin

  private def aspirinInputs(n: Int): Map[String, DataFrame] = Map(
    "diag1" -> Generators.diagnoses(spark, n, party = 0, nCodes = 4),
    "diag2" -> Generators.diagnoses(spark, n, party = 1, nCodes = 4),
    "med1" -> Generators.medications(spark, n, party = 0, nCodes = 4),
    "med2" -> Generators.medications(spark, n, party = 1, nCodes = 4),
  )

  test("aspirin count (public join + sort elim) matches DuckDB") {
    val inputs = aspirinInputs(400)
    val res = run(AspirinCount.build(), CompileConfig.smcqlCompat, inputs,
      Set(AspirinCount.pH1, AspirinCount.pH2))
    Oracle.assertEquivalent(res.outputs(AspirinCount.OutputName), AspirinCount.referenceSql,
      inputs.toSeq: _*)
  }

  test("aspirin count: exactly the matched rows enter MPC; keys leak to all") {
    val inputs = aspirinInputs(400)
    val d = inputs("diag1").unionAll(inputs("diag2")).select("patient")
    val m = inputs("med1").unionAll(inputs("med2")).select("patient").toDF("p2")
    val pairs = d.join(m, d("patient") === m("p2")).count()
    val res = run(AspirinCount.build(), CompileConfig.smcqlCompat, inputs,
      Set(AspirinCount.pH1, AspirinCount.pH2))
    assert(res.metrics.closedRows == 2 * pairs,
      s"public join must close exactly the matched rows: ${res.metrics.closedRows} vs 2*$pairs")
    assert(res.leakage.columns.exists(_.column == "left:patient"))
  }

  test("aspirin count under mpcOnly matches (tiny input)") {
    val inputs = aspirinInputs(40)
    val res = run(AspirinCount.build(), CompileConfig.mpcOnly, inputs,
      Set(AspirinCount.pH1, AspirinCount.pH2))
    Oracle.assertEquivalent(res.outputs(AspirinCount.OutputName), AspirinCount.referenceSql,
      inputs.toSeq: _*)
  }

  // ------------------------------------------------------------ comorbidity

  test("comorbidity counts match DuckDB") {
    val inputs = Map(
      "cdiag1" -> Generators.comorbidityDiagnoses(spark, 300, party = 0),
      "cdiag2" -> Generators.comorbidityDiagnoses(spark, 300, party = 1))
    val res = run(Comorbidity.buildCountsOnly(), CompileConfig.default, inputs,
      Set(Comorbidity.pH1, Comorbidity.pH2))
    Oracle.assertEquivalent(res.outputs("counts"), Comorbidity.referenceSqlCounts,
      inputs.toSeq: _*)
  }

  test("comorbidity top-10 returns the ten most common diagnoses") {
    val inputs = Map(
      "cdiag1" -> Generators.comorbidityDiagnoses(spark, 250, party = 0),
      "cdiag2" -> Generators.comorbidityDiagnoses(spark, 250, party = 1))
    inputs.foreach { case (nm, df) => df.createOrReplaceTempView(nm) }
    val ref = spark.sql(Comorbidity.referenceSqlCounts).collect()
      .map(r => r.getDouble(0) -> r.getDouble(1)).toMap
    val res = run(Comorbidity.build(), CompileConfig.default, inputs,
      Set(Comorbidity.pH1, Comorbidity.pH2))
    val got = res.outputs(Comorbidity.OutputName).collect()
      .map(r => r.getDouble(0) -> r.getDouble(1))
    assert(got.length == Comorbidity.TopK)
    // Counts must be the 10 largest (ties at the cut-off may pick either key).
    val wantCounts = ref.values.toSeq.sorted(Ordering[Double].reverse).take(Comorbidity.TopK)
    assert(got.map(_._2).toSeq.sorted(Ordering[Double].reverse) == wantCounts)
    got.foreach { case (diag, cnt) => assert(ref(diag) == cnt, s"diag=$diag") }
  }

  // ---------------------------------------------------------------- metrics

  test("metrics distinguish modeled MPC time from real wall time") {
    val inputs = twoPartyKeyed(150)
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    concat(table("t", pA, col("k"), col("v")), table("u", pB, col("k"), col("v")))
      .sum(Seq("k"), "v", "s").writeTo("out", pA)
    val res = run(dag, CompileConfig.default, inputs, Set(pA, pB))
    assert(res.metrics.wallSeconds > 0)
    assert(res.metrics.mpcModeledSeconds > 0)
    assert(res.metrics.closedRows > 0)
    assert(res.metrics.reportedSeconds > 0)
    assert(res.metrics.cost.muls > 0)
  }
}
