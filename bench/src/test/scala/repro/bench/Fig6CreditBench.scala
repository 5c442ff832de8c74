package repro.bench

import repro.SparkSpec
import repro.eval._

/** Table T4 (paper Fig. 6): credit-card regulation query.
  *
  * Paper shape: pure Sharemind fails to scale past ~3k total records (does
  * not finish 30k within two hours), while Conclave's hybrid join +
  * aggregations process 300k records in under 25 minutes.
  */
class Fig6CreditBench extends SparkSpec {

  private val sizes = Seq(300L, 3000L, 30000L)

  test("T4 credit regulation: hybrid operators are the difference between feasible and not") {
    val pts = Fig6Credit.run(spark, sizes)
    println(Bench.table("T4 (Fig. 6) — credit-card regulation (total records)", pts))

    def s(sys: String, n: Long): Option[Double] =
      pts.find(p => p.system == sys && p.size == n).flatMap(_.seconds)

    val hyb3k = s("conclave-hybrid", 3000).get
    val mpc3k = s("sharemind-mpc", 3000).get
    assert(hyb3k * 5 < mpc3k, s"hybrid=$hyb3k mpc=$mpc3k at 3k")

    val hyb30k = s("conclave-hybrid", 30000).get
    val mpc30k = s("sharemind-mpc", 30000)
    // Paper: pure MPC does not complete 30k within two hours.
    assert(mpc30k.forall(_ > 1800),
      s"sharemind at 30k must be near/over the cap: $mpc30k")
    assert(hyb30k < 1500, s"conclave-hybrid at 30k must stay feasible: $hyb30k")
  }
}
