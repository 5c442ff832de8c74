package repro.core

/** Pass 2 of §5.1: propagate per-column trust sets through the DAG.
  *
  * A party is trusted with an intermediate column if it is entrusted with
  * enough input data to compute that column in the clear. For each operator,
  * each result column's trust set is the intersection of the trust sets of
  * the operand columns it depends on — both the columns contributing its
  * rows and the columns deciding how rows are combined, filtered or
  * reordered (group-by keys, join keys, sort keys, filter predicates).
  *
  * This maintains Conclave's invariant: a column is only ever revealed to a
  * party that could derive it from input columns it is authorized to learn.
  */
object Trust {

  def annotate(dag: Dag): Unit = {
    val all = dag.parties
    dag.topo.foreach { n =>
      n.trust = n.kind match {
        case OpKind.Input(_, cols, owner) =>
          cols.map { c =>
            c.name -> (if (c.public) all else c.trust + owner)
          }.toMap

        case OpKind.Output(_, recipients) =>
          // Recipients learn the whole output relation in the clear.
          n.children.head.trust.map { case (c, t) => c -> (t ++ recipients) }

        case OpKind.Concat =>
          val schemas = n.children.map(_.trust)
          n.schema.map { c =>
            c -> schemas.map(_.getOrElse(c, Set.empty[Party])).reduce(_ intersect _)
          }.toMap

        case OpKind.Project(cols) =>
          cols.map(c => c -> n.children.head.trust(c)).toMap

        case OpKind.Filter(col, _, rhs) =>
          val ct = n.children.head.trust
          val predTrust = ct(col) ++ Set.empty[Party]
          val predAll = rhs.left.toSeq.foldLeft(predTrust)((t, c2) => t intersect ct(c2))
          ct.map { case (c, t) => c -> (t intersect predAll) }

        case OpKind.Agg(group, _, aggCol, out, _) =>
          aggTrust(n, group, aggCol, out)
        case OpKind.HybridAgg(group, _, aggCol, out, _) =>
          aggTrust(n, group, aggCol, out)

        case OpKind.Join(lk, rk)          => joinTrust(n, lk, rk)
        case OpKind.HybridJoin(lk, rk, _) => joinTrust(n, lk, rk)
        case OpKind.PublicJoin(lk, rk, _) => joinTrust(n, lk, rk)

        case OpKind.Arith(_, out, lhs, rhs) =>
          val ct = n.children.head.trust
          val outT = rhs.left.toSeq.foldLeft(ct(lhs))((t, c2) => t intersect ct(c2))
          // Row-wise arithmetic neither filters nor reorders: other columns
          // keep their trust; the result column intersects its operands.
          ct ++ Map(out -> outT)

        case OpKind.ConstCol(name, _) =>
          n.children.head.trust ++ Map(name -> all) // a public constant

        case OpKind.Sort(col, _) =>
          val ct = n.children.head.trust
          ct.map { case (c, t) => c -> (t intersect ct(col)) }

        case OpKind.Limit(_) => n.children.head.trust

        case OpKind.Distinct(_) =>
          // Deduplication combines rows based on every column.
          val ct = n.children.head.trust
          val allCols = ct.values.foldLeft(all)(_ intersect _)
          ct.map { case (c, _) => c -> allCols }
      }
    }
  }

  private def aggTrust(n: Node, group: Seq[String], aggCol: Option[String], out: String)
      : Map[String, Set[Party]] = {
    val ct = n.children.head.trust
    val groupTrust =
      if (group.isEmpty) Set.empty[Party] else group.map(ct).reduce(_ intersect _)
    val outT = aggCol match {
      case Some(a) if group.nonEmpty => ct(a) intersect groupTrust
      case Some(a)                   => ct(a) // global fold over one column
      case None if group.nonEmpty    => groupTrust // count depends on keys only
      case None                      => Set.empty[Party] // global count: conservative
    }
    group.map(g => g -> groupTrust).toMap + (out -> outT)
  }

  private def joinTrust(n: Node, lk: Seq[String], rk: Seq[String]): Map[String, Set[Party]] = {
    val lt = n.children(0).trust
    val rt = n.children(1).trust
    val keyTrust = (lk.map(lt) ++ rk.map(rt)).reduce(_ intersect _)
    val lRest = n.children(0).schema.filterNot(lk.contains)
    val rRest = n.children(1).schema.filterNot(rk.contains)
    (lk.map(c => c -> (lt(c) intersect keyTrust)) ++
      lRest.map(c => c -> (lt(c) intersect keyTrust)) ++
      rRest.map(c => c -> (rt(c) intersect keyTrust))).toMap
  }
}
