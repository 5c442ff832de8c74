package repro.core

/** Stage 6 (first half): partition the DAG at every transition between local
  * cleartext processing and MPC.
  *
  * Each maximal connected subgraph of operators with the same execution
  * mode — (cleartext, owner) or MPC — becomes one stage. The executor
  * dispatches cleartext stages to Spark (per party) and MPC stages to the
  * MPC backend; stage ids are also used for reporting (`Dag.describe`).
  */
object Partition {

  final case class Stage(id: Int, mpc: Boolean, owner: Option[Party], nodes: Seq[Node])

  def apply(dag: Dag): Seq[Stage] = {
    var next = 0
    val assignment = scala.collection.mutable.LinkedHashMap.empty[Int, (Boolean, Option[Party])]
    dag.topo.foreach { n =>
      val mode = (n.isMpc, if (n.isMpc) None else n.owner)
      n.stage = n.children.find { c =>
        (c.isMpc, if (c.isMpc) None else c.owner) == mode
      } match {
        case Some(c) => c.stage
        case None    => val id = next; next += 1; assignment(id) = mode; id
      }
    }
    val byStage = dag.topo.groupBy(_.stage)
    assignment.toSeq.map { case (id, (mpc, owner)) =>
      Stage(id, mpc, owner, byStage.getOrElse(id, Seq.empty))
    }
  }
}
