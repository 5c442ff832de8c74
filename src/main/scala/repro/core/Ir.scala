package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** Comparison operators in query predicates. */
sealed trait CmpOp
object CmpOp {
  case object Eq extends CmpOp
  case object Neq extends CmpOp
  case object Lt extends CmpOp
  case object Leq extends CmpOp
  case object Gt extends CmpOp
  case object Geq extends CmpOp
}

/** Aggregation functions. */
sealed trait AggFn
object AggFn {
  case object Sum extends AggFn
  case object Count extends AggFn
  case object Min extends AggFn
  case object Max extends AggFn
}

/** Row-wise arithmetic functions. */
sealed trait ArithFn
object ArithFn {
  case object Add extends ArithFn
  case object Sub extends ArithFn
  case object Mul extends ArithFn
  case object Div extends ArithFn
}

/** An input-relation column definition with its optional trust annotation
  * (paper §4.3). `trust` lists parties authorized to see the column in the
  * clear; `public` marks the column readable by every party.
  */
final case class InCol(name: String, trust: Set[Party] = Set.empty, public: Boolean = false)

/** Relational operator payloads. Operators reference columns by name only;
  * graph structure lives in [[Node]].
  */
sealed trait OpKind { def label: String }
object OpKind {
  final case class Input(relName: String, cols: Seq[InCol], owner: Party) extends OpKind {
    def label = s"input:$relName@$owner"
  }
  final case class Output(relName: String, recipients: Set[Party]) extends OpKind {
    def label = s"output:$relName->${recipients.toSeq.sorted.mkString(",")}"
  }
  case object Concat extends OpKind { def label = "concat" }
  final case class Project(cols: Seq[String]) extends OpKind {
    def label = s"project(${cols.mkString(",")})"
  }
  final case class Filter(col: String, cmp: CmpOp, rhs: Either[String, Double]) extends OpKind {
    def label = s"filter($col $cmp ${rhs.fold(identity, _.toString)})"
  }
  /** `secondary` marks the upper half of a split aggregation so the
    * push-down pass does not split it again.
    */
  final case class Agg(group: Seq[String], fn: AggFn, aggCol: Option[String], out: String,
      secondary: Boolean = false) extends OpKind {
    def label = s"agg($fn ${aggCol.getOrElse("*")} by ${group.mkString(",")} as $out)"
  }
  final case class Join(lKeys: Seq[String], rKeys: Seq[String]) extends OpKind {
    def label = s"join(${lKeys.mkString(",")}=${rKeys.mkString(",")})"
  }
  final case class Arith(fn: ArithFn, out: String, lhs: String, rhs: Either[String, Double])
      extends OpKind {
    def label = s"arith($out = $lhs $fn ${rhs.fold(identity, _.toString)})"
  }
  final case class ConstCol(name: String, value: Double) extends OpKind {
    def label = s"const($name=$value)"
  }
  final case class Sort(col: String, ascending: Boolean = true) extends OpKind {
    def label = s"sort($col ${if (ascending) "asc" else "desc"})"
  }
  final case class Limit(n: Int) extends OpKind { def label = s"limit($n)" }
  final case class Distinct(secondary: Boolean = false) extends OpKind { def label = "distinct" }

  // Rewrite-introduced hybrid operators (paper §5.3).
  final case class HybridJoin(lKeys: Seq[String], rKeys: Seq[String], stp: Party) extends OpKind {
    def label = s"hybridJoin(${lKeys.mkString(",")}=${rKeys.mkString(",")} stp=$stp)"
  }
  final case class PublicJoin(lKeys: Seq[String], rKeys: Seq[String], host: Party) extends OpKind {
    def label = s"publicJoin(${lKeys.mkString(",")}=${rKeys.mkString(",")} host=$host)"
  }
  final case class HybridAgg(group: Seq[String], fn: AggFn, aggCol: Option[String], out: String,
      stp: Party) extends OpKind {
    def label = s"hybridAgg($fn ${aggCol.getOrElse("*")} by ${group.mkString(",")} as $out stp=$stp)"
  }
}

/** A node of the operator DAG.
  *
  * The graph is mutable — Conclave's compilation is a sequence of annotation
  * and rewrite passes over one shared graph (the original system does the
  * same). Analysis results (`isMpc`, `owner`, `trust`, `sortedBy`, …) are
  * stored on the node and recomputed by their passes.
  */
final class Node private[core] (val id: Int, var kind: OpKind) {
  val children = ArrayBuffer.empty[Node] // inputs, in operand order
  val parents = ArrayBuffer.empty[Node]  // consumers

  /** Must this operator run under MPC? (Set by ownership / push passes.) */
  var isMpc: Boolean = true

  /** Party able to compute this relation locally from its own data, if any.
    * For operators lifted above the frontier by push-up, the recipient that
    * evaluates them in the clear after the reveal.
    */
  var owner: Option[Party] = None

  /** Per-column trust sets (paper §5.1, second pass). */
  var trust: Map[String, Set[Party]] = Map.empty

  /** Column the relation's rows are known to be ordered by, if any (§5.4). */
  var sortedBy: Option[(String, Boolean)] = None

  /** Set by sort elimination: the operator may skip its oblivious sort. */
  var preSorted: Boolean = false

  /** Execution stage id assigned by partitioning (reporting only). */
  var stage: Int = -1

  def schema: Seq[String] = Ir.schemaOf(kind, children.map(_.schema).toSeq)

  override def toString: String = s"#$id ${kind.label}${if (isMpc) " [mpc]" else ""}"
}

object Ir {
  /** Output schema of `kind` given its children's schemas. */
  def schemaOf(kind: OpKind, childSchemas: Seq[Seq[String]]): Seq[String] = kind match {
    case OpKind.Input(_, cols, _) => cols.map(_.name)
    case OpKind.Output(_, _)      => childSchemas.head
    case OpKind.Concat =>
      require(childSchemas.nonEmpty && childSchemas.forall(_ == childSchemas.head),
        s"concat schema mismatch: $childSchemas")
      childSchemas.head
    case OpKind.Project(cols) =>
      cols.foreach(c => require(childSchemas.head.contains(c), s"project: no column $c"))
      cols
    case OpKind.Filter(col, _, rhs) =>
      require(childSchemas.head.contains(col), s"filter: no column $col")
      rhs.left.foreach(c => require(childSchemas.head.contains(c), s"filter: no column $c"))
      childSchemas.head
    case OpKind.Agg(group, _, aggCol, out, _) =>
      (group ++ aggCol).foreach(c => require(childSchemas.head.contains(c), s"agg: no column $c"))
      group :+ out
    case OpKind.HybridAgg(group, _, aggCol, out, _) =>
      (group ++ aggCol).foreach(c => require(childSchemas.head.contains(c), s"agg: no column $c"))
      group :+ out
    case OpKind.Join(lk, rk)          => joinSchema(childSchemas, lk, rk)
    case OpKind.HybridJoin(lk, rk, _) => joinSchema(childSchemas, lk, rk)
    case OpKind.PublicJoin(lk, rk, _) => joinSchema(childSchemas, lk, rk)
    case OpKind.Arith(_, out, lhs, rhs) =>
      require(childSchemas.head.contains(lhs), s"arith: no column $lhs")
      rhs.left.foreach(c => require(childSchemas.head.contains(c), s"arith: no column $c"))
      if (childSchemas.head.contains(out)) childSchemas.head else childSchemas.head :+ out
    case OpKind.ConstCol(name, _) =>
      require(!childSchemas.head.contains(name), s"const: column $name exists")
      childSchemas.head :+ name
    case OpKind.Sort(col, _) =>
      require(childSchemas.head.contains(col), s"sort: no column $col")
      childSchemas.head
    case OpKind.Limit(_)    => childSchemas.head
    case OpKind.Distinct(_) => childSchemas.head
  }

  private def joinSchema(childSchemas: Seq[Seq[String]], lk: Seq[String], rk: Seq[String]): Seq[String] = {
    require(childSchemas.length == 2, "join needs two inputs")
    val Seq(l, r) = childSchemas
    lk.foreach(c => require(l.contains(c), s"join: left has no column $c"))
    rk.foreach(c => require(r.contains(c), s"join: right has no column $c"))
    require(lk.length == rk.length && lk.nonEmpty, "join key arity mismatch")
    lk ++ l.filterNot(lk.contains) ++ r.filterNot(rk.contains)
  }
}

/** The operator DAG plus structural edit helpers used by rewrite passes. */
final class Dag {
  private val _nodes = ArrayBuffer.empty[Node]
  private var nextId = 0

  def nodes: Seq[Node] = _nodes.toSeq

  def newNode(kind: OpKind, children: Seq[Node] = Seq.empty): Node = {
    val n = new Node(nextId, kind)
    nextId += 1
    children.foreach { c => n.children += c; c.parents += n }
    _nodes += n
    n
  }

  def inputs: Seq[Node] = nodes.filter(_.kind.isInstanceOf[OpKind.Input])
  def outputs: Seq[Node] = nodes.filter(_.kind.isInstanceOf[OpKind.Output])

  /** All parties participating in the query (owners and recipients). */
  def parties: Set[Party] =
    inputs.map(_.kind.asInstanceOf[OpKind.Input].owner).toSet ++
      outputs.flatMap(_.kind.asInstanceOf[OpKind.Output].recipients)

  /** Nodes in topological order (children before parents). */
  def topo: Seq[Node] = {
    val seen = mutable.HashSet.empty[Int]
    val order = ArrayBuffer.empty[Node]
    def visit(n: Node): Unit =
      if (seen.add(n.id)) { n.children.foreach(visit); order += n }
    outputs.foreach(visit)
    // Also reach any dangling roots (no output yet, e.g. during DSL building).
    nodes.filter(_.parents.isEmpty).foreach(visit)
    order.toSeq
  }

  /** Replace node `old` with `nu` in all of old's parents, detaching `old`. */
  def replaceWith(old: Node, nu: Node): Unit = {
    old.parents.toSeq.foreach { p =>
      p.children.mapInPlace(c => if (c eq old) nu else c)
      nu.parents += p
    }
    old.parents.clear()
    detachIfOrphan(old)
  }

  /** Remove a unary node from the graph, wiring its child to its parents. */
  def splice(n: Node): Unit = {
    require(n.children.length == 1, s"cannot splice non-unary $n")
    val child = n.children.head
    child.parents -= n
    n.parents.toSeq.foreach { p =>
      p.children.mapInPlace(c => if (c eq n) child else c)
      child.parents += p
    }
    n.parents.clear(); n.children.clear()
    _nodes -= n
  }

  /** Drop a node (and recursively its now-orphaned children) from the graph. */
  def detachIfOrphan(n: Node): Unit =
    if (n.parents.isEmpty && !n.kind.isInstanceOf[OpKind.Output]) {
      n.children.toSeq.foreach { c => c.parents -= n; detachIfOrphan(c) }
      n.children.clear()
      _nodes -= n
    }

  /** Pretty-print the DAG, topologically, with per-node annotations. */
  def describe: String =
    topo.map { n =>
      val loc = if (n.isMpc) "MPC " else s"local@${n.owner.map(_.name).getOrElse("?")}"
      val deps = if (n.children.isEmpty) "" else " <- " + n.children.map("#" + _.id).mkString(",")
      f"#${n.id}%-3d $loc%-12s ${n.kind.label}$deps"
    }.mkString("\n")
}
