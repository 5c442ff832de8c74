package repro.eval

import org.scalatest.funsuite.AnyFunSuite

/** Benchmark harness plumbing: table rendering, timeout estimates, and the
  * BenchPoint cell format used in EXPERIMENTS.md.
  */
class EvalSpec extends AnyFunSuite {

  test("BenchPoint renders seconds, notes, and failures") {
    assert(BenchPoint("s", 10, Some(1.234)).cell == "1.2")
    assert(BenchPoint("s", 10, Some(1.234), "warm").cell == "1.2 (warm)")
    assert(BenchPoint("s", 10, None, "OOM").cell == "OOM")
    assert(BenchPoint("s", 10, None, ">2h").cell == ">2h")
  }

  test("Bench.table lays out sizes x systems with gaps as dashes") {
    val t = Bench.table("demo", Seq(
      BenchPoint("sys1", 100, Some(1.0)),
      BenchPoint("sys2", 100, Some(2.0)),
      BenchPoint("sys1", 1000, None, "OOM")))
    val lines = t.linesIterator.toSeq
    assert(lines.head == "### demo")
    assert(lines(1).contains("sys1") && lines(1).contains("sys2"))
    assert(lines(2).startsWith("100") && lines(2).contains("1.0") && lines(2).contains("2.0"))
    assert(lines(3).startsWith("1000") && lines(3).contains("OOM") && lines(3).contains("—"))
  }

  test("Bench.timed measures elapsed wall time") {
    val (v, secs) = Bench.timed { Thread.sleep(30); 42 }
    assert(v == 42 && secs >= 0.02 && secs < 5.0)
  }

  test("aggregation estimate grows superlinearly and respects the cap") {
    val e1 = Fig4MarketConc.estimateAggSeconds(10000)
    val e2 = Fig4MarketConc.estimateAggSeconds(100000)
    assert(e2 > 10 * e1)
    assert(Fig4MarketConc.estimateAggSeconds(10000000) > Bench.TimeoutSeconds)
  }

  test("ObliVM sort estimate reproduces the paper's one-hour-plus anchor") {
    // ~4k pre-aggregated rows entering MPC (20k total at 10% distinct keys,
    // both parties) must land beyond an hour (§7.4: SMCQL >1h at the 20k mark).
    assert(Fig7Smcql.estimateOblivmSort(4000) > 3600)
    assert(Fig7Smcql.estimateOblivmSort(100) < 60)
  }

  test("microbenchmark pre-checks skip hopeless sizes without executing") {
    val pts = Fig1Microbench.run(null, Fig1Microbench.JoinOp, Seq(1000000L), Seq.empty)
    assert(pts.forall(p => p.seconds.isEmpty && p.note == ">2h"),
      s"1M-record MPC join must be pre-checked to >2h: $pts")
  }
}
