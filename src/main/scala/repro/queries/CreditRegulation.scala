package repro.queries

import repro.core._

/** Credit-card regulation query — paper §2.1, Listing 1, evaluated in §7.3
  * (Fig. 6).
  *
  * The regulator (party A) holds demographics (SSN → ZIP); two credit
  * agencies (B, C) hold score books keyed by SSN. The query joins
  * demographics with the concatenated scores on SSN and computes the
  * average score per ZIP, revealed to the regulator.
  *
  * The agencies annotate their SSN columns with trust for the regulator
  * (Listing 1 line 8), so Conclave rewrites the join into a *hybrid join*
  * and both grouped aggregations into *hybrid aggregations* with A as the
  * STP — without the annotations the whole query must run under MPC, since
  * its first operator is a cross-party join (§7.3).
  */
object CreditRegulation {

  val pA: Party = Party("a"); val pB: Party = Party("b"); val pC: Party = Party("c")
  val InputNames: Seq[String] = Seq("demographics", "scores1", "scores2")
  val OutputName = "avg_scores"

  /** Build the query DAG.
    * @param trustRegulator attach the paper's trust annotations (hybrid path)
    * @param withAvg        include the final fixed-point division by count;
    *                       disable for the bit-exact oracle variant
    */
  def build(trustRegulator: Boolean = true, withAvg: Boolean = true): Dag = {
    val dag = new Dag
    val q = new Dsl(dag)
    import q._
    val ssnTrust = if (trustRegulator) Set(pA) else Set.empty[Party]
    val demo = table("demographics", pA, col("ssn"), col("zip"))
    val s1 = table("scores1", pB, col("ssn", trust = ssnTrust), col("score"))
    val s2 = table("scores2", pC, col("ssn", trust = ssnTrust), col("score"))
    val scores = concat(s1, s2)
    val joined = demo.join(scores, Seq("ssn"), Seq("ssn"))
    val byZip = joined.count(Seq("zip"), out = "cnt")
    val totals = joined.sum(Seq("zip"), over = "score", out = "total")
    val merged = totals.join(byZip, Seq("zip"), Seq("zip"))
    val out = if (withAvg) merged.divide("avg_score", "total", "cnt") else merged
    out.writeTo(OutputName, pA)
    dag
  }

  /** Cleartext reference (exact variant, without the average division). */
  val referenceSqlExact: String =
    """WITH s AS (SELECT * FROM scores1 UNION ALL SELECT * FROM scores2),
      |j AS (
      |  SELECT d.zip AS zip, CAST(s.score AS DOUBLE) AS score
      |  FROM demographics d JOIN s ON d.ssn = s.ssn
      |)
      |SELECT zip, SUM(score) AS total, CAST(COUNT(*) AS DOUBLE) AS cnt
      |FROM j GROUP BY zip
      |""".stripMargin

  /** Cleartext reference including the average (tolerance-checked). */
  val referenceSqlAvg: String =
    """WITH s AS (SELECT * FROM scores1 UNION ALL SELECT * FROM scores2),
      |j AS (
      |  SELECT d.zip AS zip, CAST(s.score AS DOUBLE) AS score
      |  FROM demographics d JOIN s ON d.ssn = s.ssn
      |)
      |SELECT zip, SUM(score) AS total, CAST(COUNT(*) AS DOUBLE) AS cnt,
      |       SUM(score) / COUNT(*) AS avg_score
      |FROM j GROUP BY zip
      |""".stripMargin
}
