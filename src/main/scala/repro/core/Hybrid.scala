package repro.core

/** Hybrid operator rewrite (paper §5.3, stage 4).
  *
  * Replaces MPC joins and grouped aggregations with their hybrid or public
  * variants when the propagated trust sets authorize it:
  *
  *  - *public join* when the key columns on both sides are trusted by every
  *    party (the keys may be revealed to all; a deterministically chosen
  *    host computes the join in the clear);
  *  - *hybrid join* when both key columns share at least one trusted party,
  *    which becomes the selectively-trusted party (STP);
  *  - *hybrid aggregation* when the group-by columns' trust set contains a
  *    party, which becomes the STP.
  *
  * Only a single STP may exist per execution (§3.2): the pass picks the
  * party that enables the most rewrites (ties broken by party order) and
  * applies only the rewrites that party authorizes.
  */
object Hybrid {

  def apply(dag: Dag, config: CompileConfig): Unit = {
    if (!config.useHybrid) return
    Trust.annotate(dag)
    val all = dag.parties

    // Collect candidates: node -> set of possible STPs (excluding public
    // joins, which need no STP and are always applied).
    final case class Candidate(node: Node, stps: Set[Party])
    val candidates = dag.topo.flatMap { n =>
      if (!n.isMpc) None
      else n.kind match {
        case OpKind.Join(lk, rk) =>
          val lt = n.children(0).trust; val rt = n.children(1).trust
          val keyTrust = (lk.map(lt) ++ rk.map(rt)).reduce(_ intersect _)
          if (keyTrust.nonEmpty) Some(Candidate(n, keyTrust)) else None
        case OpKind.Agg(group, _, _, _, _) if group.nonEmpty =>
          val ct = n.children.head.trust
          val groupTrust = group.map(ct).reduce(_ intersect _)
          if (groupTrust.nonEmpty) Some(Candidate(n, groupTrust)) else None
        case _ => None
      }
    }

    // Public joins: keys trusted by everyone.
    val host = all.toSeq.min
    candidates.foreach { c =>
      c.node.kind match {
        case OpKind.Join(lk, rk) if all.subsetOf(c.stps) =>
          c.node.kind = OpKind.PublicJoin(lk, rk, host)
        case _ => ()
      }
    }
    val remaining = candidates.filterNot(_.node.kind.isInstanceOf[OpKind.PublicJoin])
    if (remaining.isEmpty) return

    // Choose the single STP enabling the most rewrites (deterministic).
    val stp = remaining.flatMap(_.stps).groupBy(identity).toSeq
      .map { case (p, xs) => (p, xs.length) }
      .minBy { case (p, cnt) => (-cnt, p) }._1

    remaining.filter(_.stps.contains(stp)).foreach { c =>
      c.node.kind = c.node.kind match {
        case OpKind.Join(lk, rk)                       => OpKind.HybridJoin(lk, rk, stp)
        case OpKind.Agg(group, fn, aggCol, out, _)     => OpKind.HybridAgg(group, fn, aggCol, out, stp)
        case other                                     => other
      }
    }
  }
}
