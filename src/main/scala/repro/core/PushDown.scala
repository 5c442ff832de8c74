package repro.core

/** MPC frontier push-down (paper §5.2).
  *
  * Starting from a plan where everything cross-party runs under MPC, this
  * pass moves work below the `concat` boundary so it runs locally, per
  * party, in the clear:
  *
  *  - *distributive operators* (project, filter, row-wise arithmetic,
  *    constant columns) commute with concat:
  *    op(R_A | R_B | …) ≡ op(R_A) | op(R_B) | …;
  *  - *aggregations* split into per-party local pre-aggregations plus a
  *    small secondary MPC aggregation (sum/count→sum of partials,
  *    min→min, max→max);
  *  - *distinct* splits into local distincts plus an MPC distinct.
  *
  * Splits produce MPC inputs whose sizes are data-dependent (a party's
  * distinct-key count), so they require the parties' consent
  * (`allowCardinalityLeak`). Group-less aggregations always produce exactly
  * one row per party — data-independent — and are split unconditionally.
  */
object PushDown {

  def apply(dag: Dag, config: CompileConfig): Unit = {
    var changed = true
    while (changed) {
      changed = false
      Ownership.annotate(dag)
      // A concat is a push-down site when it still sits under MPC, all of
      // its operands are locally computable, and it has a single consumer.
      val sites = dag.nodes.filter { c =>
        c.kind == OpKind.Concat && c.isMpc &&
          c.children.forall(_.owner.isDefined) && c.parents.length == 1
      }
      sites.foreach { c =>
        val p = c.parents.head
        if (tryPush(dag, config, c, p)) changed = true
      }
    }
    Ownership.annotate(dag)
  }

  /** Attempt to push parent `p` below concat `c`; true if the DAG changed. */
  private def tryPush(dag: Dag, config: CompileConfig, c: Node, p: Node): Boolean = p.kind match {
    case _: OpKind.Project | _: OpKind.ConstCol =>
      distribute(dag, c, p); true
    case _: OpKind.Filter if config.pushFiltersDown =>
      distribute(dag, c, p); true
    case _: OpKind.Arith =>
      distribute(dag, c, p); true
    case OpKind.Agg(group, fn, aggCol, out, secondary) if !secondary =>
      val dataIndependent = group.isEmpty // one row per party, always
      if (dataIndependent || config.allowCardinalityLeak) {
        splitAgg(dag, c, p, group, fn, aggCol, out); true
      } else false
    case OpKind.Distinct(secondary) if !secondary && config.allowCardinalityLeak =>
      splitDistinct(dag, c, p); true
    case _ => false
  }

  /** op(concat(r_i)) → concat(op(r_i)). */
  private def distribute(dag: Dag, c: Node, p: Node): Unit = {
    val locals = c.children.toSeq.map(r => dag.newNode(p.kind, Seq(r)))
    val newConcat = dag.newNode(OpKind.Concat, locals)
    dag.replaceWith(p, newConcat)
  }

  /** agg(concat(r_i)) → secondaryAgg(concat(localAgg(r_i))). */
  private def splitAgg(dag: Dag, c: Node, p: Node, group: Seq[String], fn: AggFn,
      aggCol: Option[String], out: String): Unit = {
    val locals = c.children.toSeq.map { r =>
      dag.newNode(OpKind.Agg(group, fn, aggCol, out), Seq(r))
    }
    val newConcat = dag.newNode(OpKind.Concat, locals)
    // Partial counts are combined by summing; other functions self-combine.
    val fn2 = fn match {
      case AggFn.Count => AggFn.Sum
      case other       => other
    }
    val secondary =
      dag.newNode(OpKind.Agg(group, fn2, Some(out), out, secondary = true), Seq(newConcat))
    dag.replaceWith(p, secondary)
  }

  /** distinct(concat(r_i)) → distinct(concat(localDistinct(r_i))). */
  private def splitDistinct(dag: Dag, c: Node, p: Node): Unit = {
    val locals = c.children.toSeq.map(r => dag.newNode(OpKind.Distinct(), Seq(r)))
    val newConcat = dag.newNode(OpKind.Concat, locals)
    val secondary = dag.newNode(OpKind.Distinct(secondary = true), Seq(newConcat))
    dag.replaceWith(p, secondary)
  }
}
