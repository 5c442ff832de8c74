package repro.bench

import repro.SparkSpec
import repro.eval._

/** Table T1 (paper Fig. 1): operator microbenchmarks.
  *
  * Shape assertions mirror the paper's findings: MPC backends scale poorly
  * (superlinear joins, OOMing garbled circuits) while cleartext Spark
  * handles orders of magnitude more data in seconds.
  */
class Fig1MicrobenchBench extends SparkSpec {

  private val aggSizes = Seq(1000L, 3000L, 10000L, 30000L)
  private val joinSizes = Seq(300L, 1000L, 3000L, 10000L)
  private val projSizes = Seq(10000L, 100000L, 300000L, 1000000L)
  private val sparkSizes = Seq(10000L, 100000L, 1000000L)

  private def secondsOf(points: Seq[BenchPoint], sys: String, size: Long): Double =
    points.find(p => p.system == sys && p.size == size).flatMap(_.seconds)
      .getOrElse(fail(s"no measured point for $sys@$size"))

  test("T1a aggregation: MPC is orders of magnitude slower than Spark and superlinear") {
    val pts = Fig1Microbench.run(spark, Fig1Microbench.AggOp, aggSizes, sparkSizes)
    println(Bench.table("T1a (Fig. 1a) — aggregation microbenchmark", pts))
    val sm1k = secondsOf(pts, "sharemind", 1000)
    val sm30k = secondsOf(pts, "sharemind", 30000)
    assert(sm30k / sm1k > 20, s"sorting network must be superlinear: $sm1k -> $sm30k")
    // Fig. 5 caption anchor: ~10 minutes at 30k records.
    assert(sm30k > 120 && sm30k < 2400, s"30k aggregation anchor: $sm30k s")
    val spark1m = secondsOf(pts, "spark", 1000000)
    assert(spark1m < sm30k, "Spark at 1M beats Sharemind at 30k")
  }

  test("T1b join: quadratic MPC cost; Obliv-C worse than Sharemind") {
    val pts = Fig1Microbench.run(spark, Fig1Microbench.JoinOp, joinSizes, sparkSizes)
    println(Bench.table("T1b (Fig. 1b) — join microbenchmark", pts))
    val sm1k = secondsOf(pts, "sharemind", 1000)
    val sm10k = secondsOf(pts, "sharemind", 10000)
    assert(sm10k / sm1k > 50, s"join must scale ~quadratically: $sm1k -> $sm10k")
    // Fig. 5 caption anchor: >20 minutes at 10k+10k records.
    assert(sm10k > 200, s"10k join anchor: $sm10k s")
    val oc10k = secondsOf(pts, "obliv-c", 10000)
    assert(oc10k > sm10k, "garbled-circuit join slower than secret sharing")
  }

  test("T1c projection: linear but heavy under MPC; Obliv-C OOMs at 1M") {
    val pts = Fig1Microbench.run(spark, Fig1Microbench.ProjectOp, projSizes, sparkSizes)
    println(Bench.table("T1c (Fig. 1c) — projection microbenchmark", pts))
    val sm300k = secondsOf(pts, "sharemind", 300000)
    val sm1m = secondsOf(pts, "sharemind", 1000000)
    assert(sm1m / sm300k > 2 && sm1m / sm300k < 5, "projection is ~linear")
    // Fig. 1c anchor: >10 minutes beyond 3M records => ~200s at 1M.
    assert(sm1m > 100 && sm1m < 1000, s"1M projection anchor: $sm1m s")
    val oom = pts.find(p => p.system == "obliv-c" && p.size == 1000000).get
    assert(oom.seconds.isEmpty && oom.note == "OOM", s"Obliv-C must OOM at 1M: $oom")
    val ok300k = pts.find(p => p.system == "obliv-c" && p.size == 300000).get
    assert(ok300k.seconds.nonEmpty, "Obliv-C survives 300k (the paper's limit)")
  }
}
