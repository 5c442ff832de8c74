package repro.bench

import repro.SparkSpec
import repro.eval._

/** Table T2 (paper Fig. 4): market concentration (HHI).
  *
  * Paper shape: Sharemind-only exceeds an hour at 100k input rows, while
  * Conclave stays near-interactive (roughly linear, <20 min at 1B on the
  * authors' clusters); insecure Spark is comparable to Conclave.
  */
class Fig4MarketConcBench extends SparkSpec {

  private val sizes = Seq(1000L, 10000L, 100000L)

  test("T2 market concentration: Conclave ~Spark-speed, Sharemind-only blows up") {
    val pts = Fig4MarketConc.run(spark, sizes)
    println(Bench.table("T2 (Fig. 4) — market concentration (HHI)", pts))

    def s(sys: String, n: Long): Double =
      pts.find(p => p.system == sys && p.size == n).flatMap(_.seconds)
        .getOrElse(fail(s"no point $sys@$n"))

    // Conclave stays near-interactive at every size.
    sizes.foreach(n => assert(s("conclave", n) < 60, s"conclave@$n = ${s("conclave", n)}"))
    // Sharemind-only is already far slower at 10k and >paper-hour at 100k.
    assert(s("sharemind-mpc", 10000) > 10 * s("conclave", 10000))
    assert(s("sharemind-mpc", 100000) > 1800, s"100k: ${s("sharemind-mpc", 100000)}")
    // Insecure Spark is in the same league as Conclave (within 10x).
    assert(s("insecure-spark", 100000) < 10 * math.max(1.0, s("conclave", 100000)))
  }
}
