package repro.bench

import repro.SparkSpec
import repro.eval._

/** Table T3 (paper Fig. 5): hybrid operator benchmarks.
  *
  * Paper shape: the hybrid join is asymptotically better than the MPC join
  * (O((n+m)log(n+m)) vs O(n^2)); the public join avoids MPC altogether and
  * scales further; the hybrid aggregation beats the sorting-network MPC
  * aggregation.
  */
class Fig5HybridBench extends SparkSpec {

  private val joinSizes = Seq(1000L, 10000L, 50000L)
  // Power-of-two sizes keep the sorting network's padding out of the
  // asymptotic-gap comparison (50k pads to 64k, 10k to 16k otherwise).
  private val aggSizes = Seq(1024L, 8192L, 65536L)

  private def s(pts: Seq[BenchPoint], sys: String, n: Long): Option[Double] =
    pts.find(p => p.system == sys && p.size == n).flatMap(_.seconds)

  test("T3a joins: hybrid beats MPC, public beats hybrid") {
    val pts = Fig5Hybrid.runJoins(joinSizes)
    println(Bench.table("T3a (Fig. 5a) — join operator variants (rows per party)", pts))
    val mpc10k = s(pts, "mpc-join", 10000).get
    val hyb10k = s(pts, "hybrid-join", 10000).get
    val pub10k = s(pts, "public-join", 10000).get
    assert(hyb10k * 5 < mpc10k, s"hybrid=$hyb10k mpc=$mpc10k")
    assert(pub10k < hyb10k, s"public=$pub10k hybrid=$hyb10k")
    // Paper: MPC join >20min at 10k/party; hybrid join ~10min at 200k.
    assert(mpc10k > 500, s"mpc join anchor: $mpc10k")
    // At 50k the MPC join is already past the 2h cap, the hybrid is not.
    assert(pts.exists(p => p.system == "mpc-join" && p.size == 50000 && p.note == ">2h"))
    assert(s(pts, "hybrid-join", 50000).exists(_ < Bench.TimeoutSeconds))
  }

  test("T3b aggregations: hybrid avoids the sorting network") {
    val pts = Fig5Hybrid.runAggs(aggSizes)
    println(Bench.table("T3b (Fig. 5b) — aggregation operator variants (rows per party)", pts))
    val mpc8k = s(pts, "mpc-agg", 8192).get
    val hyb8k = s(pts, "hybrid-agg", 8192).get
    assert(hyb8k * 3 < mpc8k, s"hybrid=$hyb8k mpc=$mpc8k")
    // The gap must widen with size (asymptotic, not constant-factor).
    val mpc64k = s(pts, "mpc-agg", 65536).get
    val hyb64k = s(pts, "hybrid-agg", 65536).get
    assert(mpc64k / hyb64k > mpc8k / hyb8k, "hybrid advantage grows with n")
  }
}
