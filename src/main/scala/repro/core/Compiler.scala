package repro.core

/** The Conclave query compiler: runs the six compilation stages of §5 over
  * an operator DAG. All parties run this deterministically and arrive at the
  * same plan.
  */
object Compiler {

  final case class Plan(dag: Dag, stages: Seq[Partition.Stage]) {
    def describe: String = dag.describe
    def mpcNodes: Seq[Node] = dag.topo.filter(_.isMpc)
  }

  def compile(dag: Dag, config: CompileConfig = CompileConfig.default): Plan = {
    // Stage 1: propagate input/output locations; derive the initial frontier.
    if (config.rewrites) {
      Ownership.annotate(dag)
      // Stage 2: rewrite to shrink the MPC — frontier push-down and push-up.
      PushDown(dag, config)
      PushUp(dag, config)
      // Stage 3: propagate trust annotations.
      Trust.annotate(dag)
      // Stage 4: insert hybrid protocol operators where authorized.
      Hybrid(dag, config)
      // Stage 5: eliminate redundant oblivious sorts.
      SortElim(dag, config)
    } else {
      // Baseline mode: the entire query runs under MPC.
      Ownership.forceAllMpc(dag)
      Trust.annotate(dag)
    }
    // Stage 6: partition into per-backend stages (execution + reporting).
    Plan(dag, Partition(dag))
  }
}
