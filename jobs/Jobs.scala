package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval._

/** Shared session bootstrap for the spark-submit entrypoints. */
object JobSession {
  def create(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Parse sizes from args, else use the default. */
  def sizes(args: Array[String], default: Seq[Long]): Seq[Long] =
    if (args.isEmpty) default else args.toSeq.map(_.toLong)
}

/** Table T1 (Fig. 1): operator microbenchmarks across backends. */
object T1Microbench {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("t1-microbench")
    try {
      println(Bench.table("T1a (Fig. 1a) — aggregation",
        Fig1Microbench.run(spark, Fig1Microbench.AggOp,
          Fig1Microbench.AggSizes, Fig1Microbench.SparkSizes)))
      println(Bench.table("T1b (Fig. 1b) — join",
        Fig1Microbench.run(spark, Fig1Microbench.JoinOp,
          Fig1Microbench.JoinSizes, Fig1Microbench.SparkSizes)))
      println(Bench.table("T1c (Fig. 1c) — projection",
        Fig1Microbench.run(spark, Fig1Microbench.ProjectOp,
          Fig1Microbench.ProjectSizes, Fig1Microbench.SparkSizes)))
    } finally spark.stop()
  }
}

/** Table T2 (Fig. 4): market concentration (HHI) end-to-end. */
object T2MarketConcentration {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("t2-market-concentration")
    try {
      val sizes = JobSession.sizes(args, Fig4MarketConc.DefaultSizes)
      println(Bench.table("T2 (Fig. 4) — market concentration", Fig4MarketConc.run(spark, sizes)))
    } finally spark.stop()
  }
}

/** Table T3 (Fig. 5): hybrid operator benchmarks. */
object T3HybridOperators {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("t3-hybrid-operators")
    try {
      val sizes = JobSession.sizes(args, Fig5Hybrid.JoinSizes)
      println(Bench.table("T3a (Fig. 5a) — join operators", Fig5Hybrid.runJoins(sizes)))
      println(Bench.table("T3b (Fig. 5b) — aggregation operators", Fig5Hybrid.runAggs(sizes)))
    } finally spark.stop()
  }
}

/** Table T4 (Fig. 6): credit-card regulation end-to-end. */
object T4CreditRegulation {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("t4-credit-regulation")
    try {
      val sizes = JobSession.sizes(args, Fig6Credit.DefaultSizes)
      println(Bench.table("T4 (Fig. 6) — credit-card regulation", Fig6Credit.run(spark, sizes)))
    } finally spark.stop()
  }
}

/** Table T5 (Fig. 7a): aspirin count, Conclave vs. SMCQL. */
object T5AspirinCount {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("t5-aspirin-count")
    try {
      val sizes = JobSession.sizes(args, Fig7Smcql.AspirinSizes)
      println(Bench.table("T5 (Fig. 7a) — aspirin count", Fig7Smcql.runAspirin(spark, sizes)))
    } finally spark.stop()
  }
}

/** Table T6 (Fig. 7b): comorbidity, Conclave vs. SMCQL. */
object T6Comorbidity {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("t6-comorbidity")
    try {
      val sizes = JobSession.sizes(args, Fig7Smcql.ComorbiditySizes)
      println(Bench.table("T6 (Fig. 7b) — comorbidity", Fig7Smcql.runComorbidity(spark, sizes)))
    } finally spark.stop()
  }
}
