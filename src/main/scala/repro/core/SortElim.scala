package repro.core

/** Oblivious-sort tracking and elimination (paper §5.4, stage 5).
  *
  * Traverses the DAG tracking the column each intermediate relation is
  * sorted by (if any): order-preserving operators (filter, row-wise
  * arithmetic, projections retaining the column, limit) propagate it;
  * shuffling operators (joins, aggregations, concat) reset it — except the
  * public join, whose cleartext host returns results in key order.
  *
  * Consumers that sort internally are marked `preSorted` when their input is
  * already ordered compatibly, letting the executor skip the O(n log² n)
  * oblivious sorting network (the §7.4 aspirin-count optimization that
  * reduces the MPC from O(n log n) to O(n)); redundant explicit sort nodes
  * are removed outright.
  */
object SortElim {

  def apply(dag: Dag, config: CompileConfig): Unit = {
    if (!config.sortElimination) return
    var changed = true
    while (changed) {
      changed = false
      dag.topo.foreach { n =>
        val in = n.children.headOption.flatMap(_.sortedBy)
        n.sortedBy = n.kind match {
          case _: OpKind.Input  => None
          case _: OpKind.Output => in
          case OpKind.Concat    => None // interleaves partitions
          case OpKind.Project(cols) => in.filter { case (c, _) => cols.contains(c) }
          case _: OpKind.Filter => in // validity-column filters preserve order
          case _: OpKind.Arith | _: OpKind.ConstCol => in
          case OpKind.Limit(_) => in
          case OpKind.Sort(col, asc) =>
            if (in.contains((col, asc)) && n.parents.nonEmpty) {
              dag.splice(n) // redundant oblivious sort
              changed = true
            }
            Some((col, asc))
          case OpKind.PublicJoin(lk, _, _) => Some((lk.head, true)) // host sorts by key
          case _: OpKind.Join | _: OpKind.HybridJoin => None // shuffled outputs
          case _: OpKind.Agg | _: OpKind.HybridAgg   => None // shuffled before reveal
          case OpKind.Distinct(_) =>
            // Our oblivious distinct preserves input order (validity-only).
            in
        }
        // preSorted consumers: skip the internal oblivious sort.
        n.kind match {
          case OpKind.Agg(group, _, _, _, _) if group.length == 1 =>
            n.preSorted = in.contains((group.head, true))
          case OpKind.Distinct(_) =>
            // Safe when equal rows are guaranteed adjacent: the relation has
            // exactly one column and is sorted by it.
            n.preSorted = in.isDefined &&
              n.children.head.schema.length == 1 &&
              in.exists(_._1 == n.children.head.schema.head)
          case _ => ()
        }
      }
    }
  }
}
