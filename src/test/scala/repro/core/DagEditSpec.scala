package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Structural-edit helpers of [[Dag]] used by the rewrite passes. */
class DagEditSpec extends AnyFunSuite {

  private val pA = Party("a"); private val pB = Party("b")

  private def chain(): (Dag, Node, Node, Node) = {
    val dag = new Dag
    val in = dag.newNode(OpKind.Input("t", Seq(InCol("k")), pA))
    val proj = dag.newNode(OpKind.Project(Seq("k")), Seq(in))
    val out = dag.newNode(OpKind.Output("o", Set(pB)), Seq(proj))
    (dag, in, proj, out)
  }

  test("newNode wires parent and child edges both ways") {
    val (_, in, proj, out) = chain()
    assert(proj.children.toSeq == Seq(in) && in.parents.toSeq == Seq(proj))
    assert(out.children.toSeq == Seq(proj) && proj.parents.toSeq == Seq(out))
  }

  test("splice removes a unary node and reconnects") {
    val (dag, in, proj, out) = chain()
    dag.splice(proj)
    assert(out.children.toSeq == Seq(in) && in.parents.toSeq == Seq(out))
    assert(!dag.nodes.contains(proj))
  }

  test("splice rejects non-unary nodes") {
    val dag = new Dag
    val a = dag.newNode(OpKind.Input("a", Seq(InCol("k")), pA))
    val b = dag.newNode(OpKind.Input("b", Seq(InCol("k")), pB))
    val j = dag.newNode(OpKind.Join(Seq("k"), Seq("k")), Seq(a, b))
    dag.newNode(OpKind.Output("o", Set(pA)), Seq(j))
    assertThrows[IllegalArgumentException](dag.splice(j))
  }

  test("replaceWith redirects all parents and drops the orphaned subtree") {
    val (dag, in, proj, out) = chain()
    val in2 = dag.newNode(OpKind.Input("u", Seq(InCol("k")), pB))
    val proj2 = dag.newNode(OpKind.Project(Seq("k")), Seq(in2))
    dag.replaceWith(proj, proj2)
    assert(out.children.toSeq == Seq(proj2))
    assert(!dag.nodes.contains(proj), "replaced node must be dropped")
    assert(!dag.nodes.contains(in), "orphaned input must be dropped")
  }

  test("a shared child survives when one consumer is replaced") {
    val dag = new Dag
    val in = dag.newNode(OpKind.Input("t", Seq(InCol("k")), pA))
    val p1 = dag.newNode(OpKind.Project(Seq("k")), Seq(in))
    val p2 = dag.newNode(OpKind.Project(Seq("k")), Seq(in))
    dag.newNode(OpKind.Output("o1", Set(pA)), Seq(p1))
    dag.newNode(OpKind.Output("o2", Set(pA)), Seq(p2))
    val repl = dag.newNode(OpKind.Project(Seq("k")), Seq(in))
    dag.replaceWith(p1, repl)
    assert(dag.nodes.contains(in) && dag.nodes.contains(p2))
    assert(in.parents.toSeq.toSet == Set(p2, repl))
  }

  test("describe renders every node with its execution mode") {
    val (dag, _, _, _) = chain()
    Ownership.annotate(dag)
    val s = dag.describe
    assert(s.contains("input:t@a") && s.contains("project(k)") && s.contains("output:o->b"))
    assert(s.contains("local@a"))
  }
}
