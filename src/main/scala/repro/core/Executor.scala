package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, StructField, StructType}
import repro.mpc._

/** Execution metrics for one compiled query run.
  *
  * MPC steps execute in an in-process simulator, so their *real* time is
  * meaningless; the reported query runtime substitutes the backend cost
  * model's simulated seconds for the simulator's real seconds, while
  * cleartext (Spark) work is measured as real wall-clock.
  */
final case class ExecMetrics(
    wallSeconds: Double,
    mpcRealSeconds: Double,
    mpcModeledSeconds: Double,
    closedRows: Long,
    cost: CostSnapshot,
) {
  /** Modeled end-to-end runtime: real cleartext time + modeled MPC time. */
  def reportedSeconds: Double = math.max(0.0, wallSeconds - mpcRealSeconds) + mpcModeledSeconds
}

final case class ExecResult(
    outputs: Map[String, DataFrame],
    metrics: ExecMetrics,
    leakage: LeakageLog,
)

/** Interprets a compiled plan: cleartext stages run as per-party Spark
  * DataFrame pipelines; MPC stages run on the [[MpcBackend]]. Data crosses
  * the frontier through `close` (collect + secret-share, logged as a
  * cardinality leak) and `reveal`.
  */
final class Executor(
    spark: SparkSession,
    backend: MpcBackend,
    /** Safety cap on rows crossing into the MPC simulator. */
    maxCloseRows: Long = 5_000_000L,
) {

  private sealed trait RelValue
  private final case class ClearRel(parts: Map[Party, DataFrame]) extends RelValue
  private final case class SecureRel(rel: SharedRelation) extends RelValue

  private var mpcRealNs: Long = 0L
  private var closedRows: Long = 0L

  private def timedMpc[A](body: => A): A = {
    val t0 = System.nanoTime()
    try body
    finally mpcRealNs += System.nanoTime() - t0
  }

  def run(plan: Compiler.Plan, inputs: Map[String, DataFrame]): ExecResult = {
    mpcRealNs = 0L; closedRows = 0L
    val t0 = System.nanoTime()
    val cache = scala.collection.mutable.HashMap.empty[Int, RelValue]
    val outputs = scala.collection.mutable.LinkedHashMap.empty[String, DataFrame]

    plan.dag.topo.foreach { n =>
      val value = eval2(n, inputs, n.children.map(c => cache(c.id)).toSeq)
      cache(n.id) = value
      n.kind match {
        case OpKind.Output(name, recipients) =>
          val out = value match {
            case ClearRel(parts) => parts.values.head
            case SecureRel(_)    => sys.error("output must be cleartext after reveal")
          }
          backend.leakage.record(RelationLeak(name, recipients))
          outputs(name) = out.cache()
          outputs(name).count() // force materialization inside the timed window
        case _ => ()
      }
    }
    val wall = (System.nanoTime() - t0) / 1e9
    ExecResult(
      outputs.toMap,
      ExecMetrics(wall, mpcRealNs / 1e9, backend.meter.modeledSeconds, closedRows,
        backend.meter.snapshot),
      backend.leakage,
    )
  }

  // ----------------------------------------------------------- clear helpers

  private def inputDf(inputs: Map[String, DataFrame], relName: String, cols: Seq[InCol]): DataFrame = {
    val df = inputs.getOrElse(relName, sys.error(s"no input DataFrame provided for '$relName'"))
    df.select(cols.map(c => col(c.name).cast(DoubleType).as(c.name)): _*)
  }

  private def cmpColumn(df: DataFrame, c: String, cmp: CmpOp, rhs: Either[String, Double]) = {
    val l = col(c)
    val r = rhs.fold(col, lit(_))
    cmp match {
      case CmpOp.Eq  => l === r
      case CmpOp.Neq => l =!= r
      case CmpOp.Lt  => l < r
      case CmpOp.Leq => l <= r
      case CmpOp.Gt  => l > r
      case CmpOp.Geq => l >= r
    }
  }

  private def clearOp(n: Node, dfs: Seq[DataFrame]): DataFrame = n.kind match {
    case OpKind.Project(cols) => dfs.head.select(cols.map(col): _*)
    case OpKind.Filter(c, cmp, rhs) => dfs.head.where(cmpColumn(dfs.head, c, cmp, rhs))
    case OpKind.Agg(group, fn, aggCol, out, _) =>
      val aggExpr = (fn match {
        case AggFn.Sum   => sum(col(aggCol.get))
        case AggFn.Count => count(lit(1))
        case AggFn.Min   => min(col(aggCol.get))
        case AggFn.Max   => max(col(aggCol.get))
      }).cast(DoubleType).as(out)
      if (group.isEmpty) dfs.head.agg(aggExpr)
      else dfs.head.groupBy(group.map(col): _*).agg(aggExpr)
    case OpKind.Join(lk, rk) =>
      val l = dfs(0).alias("l"); val r = dfs(1).alias("r")
      val cond = lk.zip(rk).map { case (a, b) => col(s"l.$a") === col(s"r.$b") }.reduce(_ && _)
      val lRest = dfs(0).columns.filterNot(lk.contains)
      val rRest = dfs(1).columns.filterNot(rk.contains)
      l.join(r, cond, "inner").select(
        lk.map(c => col(s"l.$c").as(c)) ++
          lRest.map(c => col(s"l.$c").as(c)) ++ rRest.map(c => col(s"r.$c").as(c)): _*)
    case OpKind.Arith(fn, out, lhs, rhs) =>
      val r = rhs.fold(col, lit(_))
      val expr = fn match {
        case ArithFn.Add => col(lhs) + r
        case ArithFn.Sub => col(lhs) - r
        case ArithFn.Mul => col(lhs) * r
        case ArithFn.Div => col(lhs) / r
      }
      dfs.head.withColumn(out, expr.cast(DoubleType))
    case OpKind.ConstCol(name, v) => dfs.head.withColumn(name, lit(v).cast(DoubleType))
    case OpKind.Sort(c, asc)      => dfs.head.orderBy(if (asc) col(c).asc else col(c).desc)
    case OpKind.Limit(k)          => dfs.head.limit(k)
    case OpKind.Distinct(_)       => dfs.head.distinct()
    case OpKind.Concat            => dfs.reduce(_ unionAll _)
    case other                    => sys.error(s"clearOp cannot evaluate ${other.label}")
  }

  // ------------------------------------------------------------ mpc helpers

  private def mCmp(c: CmpOp): MCmp = c match {
    case CmpOp.Eq => MCmp.Eq; case CmpOp.Neq => MCmp.Neq
    case CmpOp.Lt => MCmp.Lt; case CmpOp.Leq => MCmp.Leq
    case CmpOp.Gt => MCmp.Gt; case CmpOp.Geq => MCmp.Geq
  }

  private def mAgg(fn: AggFn): MAggFn = fn match {
    case AggFn.Sum => MAggFn.Sum; case AggFn.Count => MAggFn.Count
    case AggFn.Min => MAggFn.Min; case AggFn.Max => MAggFn.Max
  }

  private def collectRows(df: DataFrame): Seq[Seq[Double]] = {
    val rows = df.collect().toSeq.map(r =>
      (0 until r.length).map(i => if (r.isNullAt(i)) 0.0 else r.getDouble(i)))
    closedRows += rows.length
    require(closedRows <= maxCloseRows,
      s"safety cap: $closedRows rows crossed into the MPC simulator (max $maxCloseRows)")
    rows
  }

  private def close(name: String, schema: Seq[String], df: DataFrame): SharedRelation = {
    val rows = collectRows(df)
    timedMpc(backend.close(name, schema, rows))
  }

  private def asSecure(n: Node, v: RelValue): SharedRelation = v match {
    case SecureRel(rel) => rel
    case ClearRel(parts) =>
      val shared = parts.toSeq.sortBy(_._1).map { case (p, df) =>
        close(s"#${n.id}@${p.name}", n.schema, df)
      }
      if (shared.length == 1) shared.head else timedMpc(backend.concat(shared))
  }

  private def df(schema: Seq[String], rows: Seq[Seq[Double]]): DataFrame = {
    val st = StructType(schema.map(StructField(_, DoubleType, nullable = false)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => Row.fromSeq(r)), math.max(1, rows.length / 50000 + 1)),
      st)
  }

  /** Cleartext view of a child value at `party` (revealing MPC data if the
    * compiler lifted this consumer above the frontier).
    */
  private def asClearAt(n: Node, party: Party, v: RelValue, child: Node): DataFrame = v match {
    case ClearRel(parts) if parts.contains(party) && parts.size == 1 => parts(party)
    case ClearRel(parts) =>
      // A pushed-up (reversible) operator consuming a still-partitioned
      // relation: its input is revealed to the evaluating recipient anyway,
      // so the parties send their partitions in the clear.
      backend.leakage.record(RelationLeak(s"#${child.id}", Set(party)))
      parts.values.reduce(_ unionAll _)
    case SecureRel(rel) =>
      val rows = timedMpc(backend.reveal(s"#${child.id}", rel, Set(party)))
      df(child.schema, rows)
  }

  // -------------------------------------------------------------- evaluate

  private def eval2(n: Node, inputs: Map[String, DataFrame], childVals: Seq[RelValue]): RelValue =
    n.kind match {
      case OpKind.Input(relName, cols, owner) =>
        ClearRel(Map(owner -> inputDf(inputs, relName, cols)))

      case OpKind.Output(_, recipients) =>
        childVals.head match {
          case ClearRel(parts) if parts.size == 1 => ClearRel(parts)
          case ClearRel(parts) =>
            // A partitioned cleartext relation revealed directly: each party
            // sends its partition to the recipients in the clear.
            ClearRel(Map(parts.keys.head -> parts.values.reduce(_ unionAll _)))
          case SecureRel(rel) =>
            val rows = timedMpc(backend.reveal(s"#${n.children.head.id}", rel, recipients))
            ClearRel(recipients.map(_ -> df(n.schema, rows)).toMap)
        }

      case _ if !n.isMpc =>
        // Cleartext operator at its owner (or at the recipient, post-reveal).
        val at = n.owner.getOrElse(sys.error(s"cleartext node without owner: $n"))
        val dfs = n.children.zip(childVals).map { case (c, v) => asClearAt(n, at, v, c) }
        ClearRel(Map(at -> clearOp(n, dfs.toSeq)))

      case OpKind.Concat if childVals.forall(_.isInstanceOf[ClearRel]) =>
        // Partitioned concat over still-cleartext partitions: defer the
        // secret-sharing until an MPC consumer actually needs it, so public
        // joins can reveal keys straight from local data and close only the
        // matching rows (§5.3 / §7.4).
        val merged = scala.collection.mutable.LinkedHashMap.empty[Party, DataFrame]
        childVals.map(_.asInstanceOf[ClearRel]).foreach(_.parts.foreach { case (p, partDf) =>
          merged(p) = merged.get(p).map(_ unionAll partDf).getOrElse(partDf)
        })
        ClearRel(merged.toMap)

      case OpKind.Concat =>
        val shared = n.children.zip(childVals).map { case (c, v) => asSecure(c, v) }
        SecureRel(timedMpc(backend.concat(shared.toSeq)))

      case OpKind.PublicJoin(lk, rk, host)
          if childVals.forall(_.isInstanceOf[ClearRel]) =>
        SecureRel(publicJoinFromClear(n, lk, rk, host, childVals))

      case _ =>
        // Generic MPC operator.
        val shared = n.children.zip(childVals).map { case (c, v) => asSecure(c, v) }
        val name = s"#${n.id}"
        val out = timedMpc(n.kind match {
          case OpKind.Project(cols)       => backend.project(shared.head, cols)
          case OpKind.Filter(c, cmp, rhs) =>
            rhs.fold(c2 => backend.filterCol(shared.head, c, mCmp(cmp), c2),
                     v => backend.filterLit(shared.head, c, mCmp(cmp), v))
          case OpKind.Agg(group, fn, aggCol, out2, _) =>
            if (group.isEmpty) backend.globalAggregate(shared.head, aggCol, mAgg(fn), out2)
            else backend.aggregate(name, shared.head, group, aggCol, mAgg(fn), out2, n.preSorted)
          case OpKind.HybridAgg(group, fn, aggCol, out2, stp) =>
            backend.hybridAggregate(name, shared.head, group, aggCol, mAgg(fn), out2, stp)
          case OpKind.Join(lk, rk) =>
            backend.join(name, shared(0), shared(1), lk, rk)
          case OpKind.HybridJoin(lk, rk, stp) =>
            backend.hybridJoin(name, shared(0), shared(1), lk, rk, stp)
          case OpKind.PublicJoin(lk, rk, host) =>
            backend.publicJoin(name, shared(0), shared(1), lk, rk, host)
          case OpKind.Arith(fn, out2, lhs, rhs) =>
            val mfn = fn match {
              case ArithFn.Add => MArith.Add; case ArithFn.Sub => MArith.Sub
              case ArithFn.Mul => MArith.Mul; case ArithFn.Div => MArith.Div
            }
            backend.arith(shared.head, mfn, out2, lhs, rhs.left.map(identity))
          case OpKind.ConstCol(cn, v) => backend.constCol(shared.head, cn, v)
          case OpKind.Sort(c, asc)    => backend.sort(shared.head, Seq((c, asc)))
          case OpKind.Limit(k)        => backend.limit(backend.compact(name, shared.head), k)
          case OpKind.Distinct(_)     => backend.distinct(shared.head, n.preSorted)
          case other                  => sys.error(s"MPC executor cannot evaluate ${other.label}")
        })
        SecureRel(out)
    }

  /** Public join over still-cleartext inputs: the key columns are public, so
    * the parties exchange keys in the clear, compute the match pairs, and
    * secret-share *only the matching rows* — this is what lets Conclave +
    * slicing send just the overlapping patient IDs into MPC (§7.4).
    * The result is ordered by join key (exploited by sort elimination).
    */
  private def publicJoinFromClear(
      n: Node, lk: Seq[String], rk: Seq[String], host: Party,
      childVals: Seq[RelValue]): SharedRelation = {
    val Seq(lc, rc) = childVals.map(_.asInstanceOf[ClearRel])
    val lSchema = n.children(0).schema
    val rSchema = n.children(1).schema
    val all = backend.allParties
    lk.foreach(k => backend.leakage.record(ColumnLeak(s"#${n.id}", s"left:$k", all)))
    rk.foreach(k => backend.leakage.record(ColumnLeak(s"#${n.id}", s"right:$k", all)))

    // Collect each party's partition (a partitioned concat defers here).
    def gather(c: ClearRel): IndexedSeq[IndexedSeq[Double]] =
      c.parts.toSeq.sortBy(_._1).flatMap { case (_, partDf) =>
        partDf.collect().toSeq.map(r => (0 until r.length).map(i => r.getDouble(i)): IndexedSeq[Double])
      }.toIndexedSeq
    val lRows = gather(lc)
    val rRows = gather(rc)
    val lkIdx = lk.map(lSchema.indexOf)
    val rkIdx = rk.map(rSchema.indexOf)
    val byKey = lRows.indices.groupBy(i => lkIdx.map(lRows(i)))
    import scala.math.Ordering.Implicits.seqOrdering
    val pairs = (for {
      j <- rRows.indices
      key = rkIdx.map(rRows(j))
      i <- byKey.getOrElse(key, Seq.empty)
    } yield (key, i, j)).sortBy(_._1: Seq[Double])
    backend.leakage.record(CardinalityLeak(s"#${n.id}", pairs.length.toLong, all))

    // Each side secret-shares *only its matched rows*, in the public pair
    // order — unmatched rows never enter MPC.
    val lRest = lSchema.indices.filterNot(lkIdx.contains)
    val rRest = rSchema.indices.filterNot(rkIdx.contains)
    val outSchema = lk ++ lRest.map(lSchema) ++ rRest.map(rSchema)
    closedRows += 2L * pairs.length
    require(closedRows <= maxCloseRows,
      s"safety cap: $closedRows rows crossed into the MPC simulator (max $maxCloseRows)")
    timedMpc {
      val lShared = backend.close(s"#${n.id}:left",
        lk ++ lRest.map(lSchema),
        pairs.map { case (_, i, _) => lkIdx.map(lRows(i)) ++ lRest.map(lRows(i)) })
      val rShared = backend.close(s"#${n.id}:right",
        rRest.map(rSchema),
        pairs.map { case (_, _, j) => rRest.map(rRows(j)).toSeq })
      SharedRelation(
        outSchema.toVector,
        lShared.rows.lazyZip(rShared.rows).map(_ ++ _).toVector,
        None)
    }
  }

}
