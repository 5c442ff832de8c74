package repro.core

/** Pass 1 of §5.1: propagate relation ownership and derive the initial MPC
  * frontier.
  *
  * A party "owns" an intermediate relation if it can derive it locally from
  * its own data alone. Ownership propagates down the DAG: a unary operator
  * inherits its child's owner; a multi-input operator is owned only if all
  * inputs share one owner. Operators whose output has no owner *must* run
  * under MPC.
  */
object Ownership {

  def annotate(dag: Dag): Unit = {
    dag.topo.foreach { n =>
      n.kind match {
        case OpKind.Input(_, _, owner) =>
          n.owner = Some(owner)
        case _ =>
          val owners = n.children.map(_.owner)
          n.owner = if (owners.nonEmpty && owners.forall(_ == owners.head)) owners.head else None
      }
      n.isMpc = n.kind match {
        case _: OpKind.Input  => false
        case _: OpKind.Output => false
        case _                => n.owner.isEmpty
      }
    }
  }

  /** Force the whole query under MPC (the paper's "Sharemind-only"
    * baselines): ownership is still derived, but every inner operator is
    * marked MPC so inputs are secret-shared immediately.
    */
  def forceAllMpc(dag: Dag): Unit = {
    annotate(dag)
    dag.topo.foreach { n =>
      n.kind match {
        case _: OpKind.Input | _: OpKind.Output => ()
        case _                                  => n.isMpc = true
      }
    }
  }
}
