package repro.smcql

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.data.Generators
import repro.queries.{AspirinCount, AspirinSliced}

/** SMCQL baseline and the Conclave+slicing driver: result correctness vs.
  * the cleartext reference, slicing invariants, and the cost relationships
  * the §7.4 comparison rests on.
  */
class SmcqlSpec extends SparkSpec {

  private def aspirinInputs(n: Long, overlap: Double = 0.05) = Map(
    "diag1" -> Generators.diagnoses(spark, n, party = 0, overlap = overlap, nCodes = 4),
    "diag2" -> Generators.diagnoses(spark, n, party = 1, overlap = overlap, nCodes = 4),
    "med1" -> Generators.medications(spark, n, party = 0, overlap = overlap, nCodes = 4),
    "med2" -> Generators.medications(spark, n, party = 1, overlap = overlap, nCodes = 4))

  private def referenceCount(inputs: Map[String, org.apache.spark.sql.DataFrame]): Long = {
    inputs.foreach { case (nm, df) => df.createOrReplaceTempView(nm) }
    spark.sql(AspirinCount.referenceSql).collect().head.getDouble(0).toLong
  }

  test("slicing partitions keys by party presence") {
    val inputs = aspirinInputs(300)
    val sliced = Slicing.slice(spark,
      Seq(Map("diag" -> inputs("diag1"), "med" -> inputs("med1")),
        Map("diag" -> inputs("diag2"), "med" -> inputs("med2"))), "patient")
    // Shared keys appear on both parties; local parts contain none of them.
    val p0Keys = inputs("diag1").select("patient").unionAll(inputs("med1").select("patient"))
      .distinct().collect().map(_.getDouble(0)).toSet
    val p1Keys = inputs("diag2").select("patient").unionAll(inputs("med2").select("patient"))
      .distinct().collect().map(_.getDouble(0)).toSet
    assert(sliced.sharedKeys == (p0Keys intersect p1Keys))
    sliced.localParts.zipWithIndex.foreach { case (rels, i) =>
      rels.values.foreach { df =>
        val keys = df.select("patient").distinct().collect().map(_.getDouble(0)).toSet
        assert((keys intersect sliced.sharedKeys).isEmpty, s"party $i local slice has shared keys")
      }
    }
  }

  test("slicing loses no rows") {
    val inputs = aspirinInputs(250)
    val sliced = Slicing.slice(spark,
      Seq(Map("diag" -> inputs("diag1")), Map("diag" -> inputs("diag2"))), "patient")
    val total = inputs("diag1").count() + inputs("diag2").count()
    val split = sliced.localParts.map(_("diag").count()).sum +
      sliced.sharedParts.map(_("diag").count()).sum
    assert(split == total)
  }

  test("SMCQL aspirin count matches the cleartext reference") {
    val inputs = aspirinInputs(200)
    val r = SmcqlAspirin.run(spark, inputs)
    assert(r.count == referenceCount(inputs), s"smcql=$r")
  }

  test("Conclave+slicing aspirin count matches the cleartext reference") {
    val inputs = aspirinInputs(200)
    val r = AspirinSliced.run(spark, inputs)
    assert(r.count == referenceCount(inputs), s"conclave=$r")
  }

  test("SMCQL and Conclave+slicing agree with each other (property over sizes)") {
    for (n <- Seq(50L, 120L, 350L)) {
      val inputs = aspirinInputs(n)
      val a = AspirinSliced.run(spark, inputs).count
      val b = SmcqlAspirin.run(spark, inputs).count
      assert(a == b, s"n=$n conclave=$a smcql=$b")
    }
  }

  test("SMCQL pays one circuit setup per shared slice") {
    val inputs = aspirinInputs(300)
    val r = SmcqlAspirin.run(spark, inputs)
    assert(r.slices > 0)
    assert(r.mpcModeledSeconds >= r.slices * repro.mpc.CostParams.ObliVM.setup)
  }

  test("Conclave+slicing is far cheaper than SMCQL on modeled MPC time") {
    val inputs = aspirinInputs(400)
    val c = AspirinSliced.run(spark, inputs)
    val s = SmcqlAspirin.run(spark, inputs)
    assert(c.mpcModeledSeconds * 5 < s.mpcModeledSeconds,
      s"conclave=${c.mpcModeledSeconds}s smcql=${s.mpcModeledSeconds}s")
  }

  test("SMCQL comorbidity top-k matches the Conclave result") {
    val inputs = Map(
      "cdiag1" -> Generators.comorbidityDiagnoses(spark, 200, party = 0),
      "cdiag2" -> Generators.comorbidityDiagnoses(spark, 200, party = 1))
    val s = SmcqlComorbidity.run(spark, inputs)
    inputs.foreach { case (nm, df) => df.createOrReplaceTempView(nm) }
    val ref = spark.sql(repro.queries.Comorbidity.referenceSqlCounts).collect()
      .map(r => r.getDouble(0) -> r.getDouble(1)).toMap
    assert(s.top.length == repro.queries.Comorbidity.TopK)
    s.top.foreach { case (diag, cnt) => assert(ref(diag) == cnt) }
    val wantCounts = ref.values.toSeq.sorted(Ordering[Double].reverse).take(s.top.length)
    assert(s.top.map(_._2).sorted(Ordering[Double].reverse) == wantCounts)
  }

  test("SMCQL comorbidity costs more than Conclave's secret-sharing run") {
    val inputs = Map(
      "cdiag1" -> Generators.comorbidityDiagnoses(spark, 400, party = 0),
      "cdiag2" -> Generators.comorbidityDiagnoses(spark, 400, party = 1))
    val s = SmcqlComorbidity.run(spark, inputs)
    val c = repro.eval.Bench.runConclave(spark, repro.queries.Comorbidity.build(),
      repro.core.CompileConfig.default, inputs,
      Set(repro.queries.Comorbidity.pH1, repro.queries.Comorbidity.pH2))
    assert(c.metrics.mpcModeledSeconds < s.mpcModeledSeconds,
      s"conclave=${c.metrics.mpcModeledSeconds}s smcql=${s.mpcModeledSeconds}s")
  }
}
