package repro.mpc

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.Props
import MpcTestKit._

/** Relation-level correctness of the oblivious algorithms, checked against
  * plain Scala reference implementations.
  */
class ObliviousSpec extends AnyFunSuite {

  private def genRows(maxRows: Int, cols: Int, maxKey: Int): Gen[Seq[Seq[Double]]] =
    for {
      n <- Gen.chooseNum(0, maxRows)
      rows <- Gen.listOfN(n, Gen.listOfN(cols, Gen.chooseNum(0, maxKey).map(_.toDouble)))
    } yield rows

  // ------------------------------------------------------------------ shuffle

  test("shuffle preserves the multiset of rows") {
    Props.forAll(genRows(40, 3, 9), runs = 30) { rows =>
      val b = sharemind()
      val r = rel(b, Seq("a", "b", "c"), rows)
      assertSameRows(open(b, Oblivious.shuffle(b.engine, r)), rows)
    }
  }

  test("shuffle charges shuffle elements and rounds") {
    val b = sharemind()
    val r = rel(b, Seq("a"), (1 to 16).map(i => Seq(i.toDouble)))
    val before = b.meter.shuffledElems
    Oblivious.shuffle(b.engine, r)
    assert(b.meter.shuffledElems > before)
  }

  // --------------------------------------------------------------------- sort

  test("bitonic sort orders rows ascending by key (incl. non-power-of-two)") {
    for (n <- Seq(0, 1, 2, 3, 7, 8, 9, 31, 33)) {
      val b = sharemind(seed = n + 1L)
      val rows = (0 until n).map(i => Seq(((i * 37) % 19).toDouble, i.toDouble))
      val sorted = open(b, Oblivious.sortBy(b.engine, rel(b, Seq("k", "v"), rows),
        Seq(Oblivious.SortKey(0))))
      assert(sorted.map(_.head) == rows.map(_.head).sorted, s"n=$n")
      assertSameRows(sorted, rows)
    }
  }

  test("bitonic sort supports descending order") {
    val b = sharemind()
    val rows = Seq(3, 1, 4, 1, 5, 9, 2, 6).map(x => Seq(x.toDouble))
    val sorted = open(b, Oblivious.sortBy(b.engine, rel(b, Seq("k"), rows),
      Seq(Oblivious.SortKey(0, ascending = false))))
    assert(sorted.map(_.head) == rows.map(_.head).sortBy(-_))
  }

  test("bitonic sort on two keys is lexicographic") {
    val b = sharemind()
    val rows = Seq(Seq(2.0, 1.0), Seq(1.0, 9.0), Seq(2.0, 0.0), Seq(1.0, 3.0))
    val sorted = open(b, Oblivious.sortBy(b.engine, rel(b, Seq("a", "b"), rows),
      Seq(Oblivious.SortKey(0), Oblivious.SortKey(1))))
    assert(sorted == Seq(Seq(1.0, 3.0), Seq(1.0, 9.0), Seq(2.0, 0.0), Seq(2.0, 1.0)))
  }

  test("sort is a property: output ascending and same multiset") {
    Props.forAll(genRows(33, 2, 9), runs = 20) { rows =>
      val b = sharemind()
      val sorted = open(b, Oblivious.sortBy(b.engine, rel(b, Seq("k", "v"), rows),
        Seq(Oblivious.SortKey(0))))
      assert(sorted.map(_.head) == sorted.map(_.head).sorted)
      assertSameRows(sorted, rows)
    }
  }

  test("sort moves invalid rows to the end and keeps them hidden") {
    val b = sharemind()
    val rows = Seq(Seq(5.0), Seq(1.0), Seq(3.0), Seq(2.0))
    // filter out value 3, then sort: the valid prefix must be 1,2,5.
    val filtered = b.filterLit(rel(b, Seq("k"), rows), "k", MCmp.Neq, 3.0)
    val sorted = Oblivious.sortBy(b.engine, filtered, Seq(Oblivious.SortKey(0)))
    assert(sorted.size == 4, "size-hiding: row count unchanged")
    assert(open(b, sorted) == Seq(Seq(1.0), Seq(2.0), Seq(5.0)))
  }

  // ------------------------------------------------------------------- filter

  test("filter is size-hiding and order-preserving; compact reveals") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 10.0), Seq(2.0, 20.0), Seq(3.0, 30.0), Seq(2.0, 40.0))
    val f = b.filterLit(rel(b, Seq("k", "v"), rows), "k", MCmp.Eq, 2.0)
    assert(f.size == 4 && f.validity.isDefined)
    assertSameRows(open(b, f), Seq(Seq(2.0, 20.0), Seq(2.0, 40.0)))
  }

  test("all comparison operators filter correctly") {
    val rows = (1 to 9).map(i => Seq(i.toDouble))
    val cases = Seq[(MCmp, Double => Boolean)](
      (MCmp.Eq, _ == 5.0), (MCmp.Neq, _ != 5.0), (MCmp.Lt, _ < 5.0),
      (MCmp.Leq, _ <= 5.0), (MCmp.Gt, _ > 5.0), (MCmp.Geq, _ >= 5.0))
    cases.foreach { case (cmp, pred) =>
      val b = sharemind()
      val f = b.filterLit(rel(b, Seq("k"), rows), "k", cmp, 5.0)
      assertSameRows(open(b, f), rows.filter(r => pred(r.head)))
    }
  }

  test("column-vs-column filter works") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 2.0), Seq(3.0, 3.0), Seq(5.0, 4.0))
    val f = b.filterCol(rel(b, Seq("a", "b2"), rows), "b2", MCmp.Geq, "a")
    assertSameRows(open(b, f), Seq(Seq(1.0, 2.0), Seq(3.0, 3.0)))
  }

  test("stacked filters AND their predicates") {
    val b = sharemind()
    val rows = (1 to 10).map(i => Seq(i.toDouble, (i % 3).toDouble))
    val f1 = b.filterLit(rel(b, Seq("k", "m"), rows), "k", MCmp.Gt, 3.0)
    val f2 = b.filterLit(f1, "m", MCmp.Eq, 1.0)
    assertSameRows(open(b, f2), rows.filter(r => r.head > 3 && r(1) == 1.0))
  }

  // -------------------------------------------------------------- aggregation

  private def refAgg(rows: Seq[Seq[Double]], fn: MAggFn): Map[Double, Double] =
    rows.groupBy(_.head).map { case (k, rs) =>
      k -> (fn match {
        case MAggFn.Sum   => rs.map(_(1)).sum
        case MAggFn.Count => rs.size.toDouble
        case MAggFn.Min   => rs.map(_(1)).min
        case MAggFn.Max   => rs.map(_(1)).max
      })
    }

  for (fn <- Seq(MAggFn.Sum, MAggFn.Count, MAggFn.Min, MAggFn.Max)) {
    test(s"oblivious aggregation computes $fn per group") {
      Props.forAll(genRows(25, 2, 5), runs = 15) { rows =>
        val b = sharemind()
        val out = b.aggregate("t", rel(b, Seq("k", "v"), rows), Seq("k"),
          if (fn == MAggFn.Count) None else Some("v"), fn, "out")
        val expected = refAgg(rows, fn).map { case (k, v) => Seq(k, v) }.toSeq
        assertSameRows(open(b, out), expected)
      }
    }
  }

  test("aggregation after filter ignores invalid rows") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 10.0), Seq(1.0, 20.0), Seq(2.0, 30.0), Seq(2.0, 40.0))
    val f = b.filterLit(rel(b, Seq("k", "v"), rows), "v", MCmp.Neq, 30.0)
    val out = b.aggregate("t", f, Seq("k"), Some("v"), MAggFn.Sum, "s")
    assertSameRows(open(b, out), Seq(Seq(1.0, 30.0), Seq(2.0, 40.0)))
  }

  test("aggregation drops groups whose rows are all invalid") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 10.0), Seq(2.0, 30.0))
    val f = b.filterLit(rel(b, Seq("k", "v"), rows), "k", MCmp.Eq, 1.0)
    val out = b.aggregate("t", f, Seq("k"), Some("v"), MAggFn.Sum, "s")
    assertSameRows(open(b, out), Seq(Seq(1.0, 10.0)))
  }

  test("multi-column group-by aggregation") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 1.0, 5.0), Seq(1.0, 2.0, 6.0), Seq(1.0, 1.0, 7.0))
    val out = b.aggregate("t", rel(b, Seq("g1", "g2", "v"), rows), Seq("g1", "g2"),
      Some("v"), MAggFn.Sum, "s")
    assertSameRows(open(b, out), Seq(Seq(1.0, 1.0, 12.0), Seq(1.0, 2.0, 6.0)))
  }

  test("aggregation reveals only the group count (leakage check)") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 1.0), Seq(2.0, 1.0), Seq(1.0, 1.0))
    b.aggregate("aggrel", rel(b, Seq("k", "v"), rows), Seq("k"), Some("v"), MAggFn.Sum, "s")
    val cards = b.leakage.cardinalities.filter(_.relation == "aggrel")
    assert(cards.map(_.rows) == Seq(2L))
    assert(b.leakage.columns.isEmpty, "no column values may leak")
  }

  test("global aggregation: sum, count, min, max over the whole relation") {
    val rows = Seq(Seq(4.0), Seq(9.0), Seq(1.0), Seq(6.0))
    val expect = Map[MAggFn, Double](MAggFn.Sum -> 20.0, MAggFn.Count -> 4.0,
      MAggFn.Min -> 1.0, MAggFn.Max -> 9.0)
    expect.foreach { case (fn, want) =>
      val b = sharemind()
      val out = b.globalAggregate(rel(b, Seq("v"), rows),
        if (fn == MAggFn.Count) None else Some("v"), fn, "out")
      assert(open(b, out) == Seq(Seq(want)), fn.toString)
    }
  }

  test("global count respects validity") {
    val b = sharemind()
    val r = b.filterLit(rel(b, Seq("v"), (1 to 6).map(i => Seq(i.toDouble))), "v", MCmp.Gt, 2.0)
    assert(open(b, b.globalAggregate(r, None, MAggFn.Count, "c")) == Seq(Seq(4.0)))
  }

  test("preSorted aggregation over an already-grouped relation matches") {
    val b = sharemind()
    val rows = Seq(Seq(1.0, 5.0), Seq(1.0, 6.0), Seq(2.0, 7.0), Seq(3.0, 1.0), Seq(3.0, 1.0))
    val cmpsBefore = b.meter.cmps
    val out = b.aggregate("t", rel(b, Seq("k", "v"), rows), Seq("k"), Some("v"),
      MAggFn.Sum, "s", preSorted = true)
    assert(b.meter.cmps == cmpsBefore, "preSorted aggregation must skip the sorting network")
    assertSameRows(open(b, out), Seq(Seq(1.0, 11.0), Seq(2.0, 7.0), Seq(3.0, 2.0)))
  }

  // ----------------------------------------------------------------- distinct

  test("distinct keeps one copy per key (property)") {
    Props.forAll(genRows(20, 1, 6), runs = 20) { rows =>
      val b = sharemind()
      val out = b.distinct(rel(b, Seq("k"), rows), preSorted = false)
      assertSameRows(open(b, out), rows.distinct)
    }
  }

  test("preSorted distinct on a sorted single-column relation is linear") {
    val b = sharemind()
    val rows = Seq(1.0, 1.0, 2.0, 3.0, 3.0, 3.0, 7.0).map(Seq(_))
    val cmpsBefore = b.meter.cmps
    val out = b.distinct(rel(b, Seq("k"), rows), preSorted = true)
    assert(b.meter.cmps == cmpsBefore, "preSorted distinct must not compare-exchange")
    assertSameRows(open(b, out), Seq(Seq(1.0), Seq(2.0), Seq(3.0), Seq(7.0)))
  }

  test("distinct respects validity from a prior filter") {
    val b = sharemind()
    val rows = Seq(Seq(1.0), Seq(1.0), Seq(2.0), Seq(3.0), Seq(3.0))
    val f = b.filterLit(rel(b, Seq("k"), rows), "k", MCmp.Neq, 2.0)
    val out = b.distinct(f, preSorted = false)
    assertSameRows(open(b, out), Seq(Seq(1.0), Seq(3.0)))
  }

  test("distinct after filter then count (the aspirin tail) is exact") {
    val b = sharemind()
    val rows = Seq(Seq(1.0), Seq(1.0), Seq(2.0), Seq(5.0), Seq(5.0), Seq(9.0))
    val f = b.filterLit(rel(b, Seq("k"), rows), "k", MCmp.Lt, 6.0)
    val d = b.distinct(f, preSorted = true) // input sorted by k
    val c = b.globalAggregate(d, None, MAggFn.Count, "rc")
    assert(open(b, c) == Seq(Seq(3.0)))
  }

  // --------------------------------------------------------------------- join

  private def refJoin(l: Seq[Seq[Double]], r: Seq[Seq[Double]]): Seq[Seq[Double]] =
    for { lr <- l; rr <- r; if lr.head == rr.head } yield lr ++ rr.tail

  test("Cartesian MPC join matches a cleartext join (property)") {
    Props.forAll2(genRows(12, 2, 5), genRows(12, 2, 5), runs = 15) { (l, r) =>
      val b = sharemind()
      val out = b.join("j", rel(b, Seq("k", "x"), l), rel(b, Seq("k", "y"), r),
        Seq("k"), Seq("k"))
      assert(out.schema == Vector("k", "x", "y"))
      assertSameRows(open(b, out), refJoin(l, r))
    }
  }

  test("join respects validity on both sides") {
    val b = sharemind()
    val l = Seq(Seq(1.0, 10.0), Seq(2.0, 20.0))
    val r = Seq(Seq(1.0, 30.0), Seq(2.0, 40.0))
    val lf = b.filterLit(rel(b, Seq("k", "x"), l), "k", MCmp.Eq, 1.0)
    val rr = rel(b, Seq("k", "y"), r)
    assertSameRows(open(b, b.join("j", lf, rr, Seq("k"), Seq("k"))), Seq(Seq(1.0, 10.0, 30.0)))
  }

  test("join charges O(n*m) equality tests and leaks only the output size") {
    val b = sharemind()
    val l = (1 to 20).map(i => Seq(i.toDouble, 0.0))
    val r = (1 to 30).map(i => Seq(i.toDouble, 0.0))
    val eqsBefore = b.meter.eqs
    b.join("jrel", rel(b, Seq("k", "x"), l), rel(b, Seq("k", "y"), r), Seq("k"), Seq("k"))
    assert(b.meter.eqs - eqsBefore == 600L)
    assert(b.leakage.cardinalities.exists(c => c.relation == "jrel" && c.rows == 20L))
  }

  test("multi-key join") {
    val b = sharemind()
    val l = Seq(Seq(1.0, 1.0, 5.0), Seq(1.0, 2.0, 6.0))
    val r = Seq(Seq(1.0, 1.0, 7.0), Seq(2.0, 2.0, 8.0))
    val out = b.join("j", rel(b, Seq("a", "b2", "x"), l), rel(b, Seq("a", "b2", "y"), r),
      Seq("a", "b2"), Seq("a", "b2"))
    assertSameRows(open(b, out), Seq(Seq(1.0, 1.0, 5.0, 7.0)))
  }

  // ---------------------------------------------------------- select / limit

  test("oblivious indexing selects the addressed rows") {
    val b = sharemind()
    val rows = (0 until 10).map(i => Seq(i.toDouble, (i * 100).toDouble))
    val r = rel(b, Seq("i", "v"), rows)
    val idxs = Vector(3L, 7L, 0L, 7L).map(i => b.engine.input(i))
    val out = Oblivious.select(b.engine, r, idxs)
    assert(open(b, out) == Seq(Seq(3.0, 300.0), Seq(7.0, 700.0), Seq(0.0, 0.0), Seq(7.0, 700.0)))
  }

  test("oblivious indexing rejects out-of-range indexes") {
    val b = sharemind()
    val r = rel(b, Seq("v"), Seq(Seq(1.0)))
    assertThrows[IllegalArgumentException](
      Oblivious.select(b.engine, r, Vector(b.engine.input(5L))))
  }

  test("limit takes the first k rows") {
    val b = sharemind()
    val r = rel(b, Seq("v"), (1 to 5).map(i => Seq(i.toDouble)))
    assert(open(b, b.limit(r, 3)) == Seq(Seq(1.0), Seq(2.0), Seq(3.0)))
    assert(open(b, b.limit(r, 9)).size == 5)
  }

  // ----------------------------------------------------- arith / const / etc

  test("row-wise arithmetic against scalars and columns") {
    val b = sharemind()
    val r = rel(b, Seq("a", "b2"), Seq(Seq(6.0, 3.0), Seq(10.0, 5.0)))
    assert(open(b, b.arith(r, MArith.Add, "o", "a", Right(1.0))).map(_.last) == Seq(7.0, 11.0))
    assert(open(b, b.arith(r, MArith.Sub, "o", "a", Right(1.0))).map(_.last) == Seq(5.0, 9.0))
    assert(open(b, b.arith(r, MArith.Mul, "o", "a", Right(3.0))).map(_.last) == Seq(18.0, 30.0))
    assert(open(b, b.arith(r, MArith.Div, "o", "a", Right(2.0))).map(_.last) == Seq(3.0, 5.0))
    assert(open(b, b.arith(r, MArith.Add, "o", "a", Left("b2"))).map(_.last) == Seq(9.0, 15.0))
    assert(open(b, b.arith(r, MArith.Mul, "o", "a", Left("b2"))).map(_.last) == Seq(18.0, 50.0))
    assert(open(b, b.arith(r, MArith.Div, "o", "a", Left("b2"))).map(_.last) == Seq(2.0, 2.0))
  }

  test("arith replaces an existing output column in place") {
    val b = sharemind()
    val r = rel(b, Seq("a"), Seq(Seq(4.0)))
    val out = b.arith(r, MArith.Mul, "a", "a", Right(2.0))
    assert(out.schema == Vector("a"))
    assert(open(b, out) == Seq(Seq(8.0)))
  }

  test("constCol appends a public constant") {
    val b = sharemind()
    val out = b.constCol(rel(b, Seq("a"), Seq(Seq(1.0), Seq(2.0))), "k", 7.0)
    assert(out.schema == Vector("a", "k"))
    assert(open(b, out).map(_.last) == Seq(7.0, 7.0))
  }

  test("project keeps and reorders columns") {
    val b = sharemind()
    val r = rel(b, Seq("a", "b2", "c"), Seq(Seq(1.0, 2.0, 3.0)))
    val out = b.project(r, Seq("c", "a"))
    assert(out.schema == Vector("c", "a"))
    assert(open(b, out) == Seq(Seq(3.0, 1.0)))
  }

  test("concat appends relations and harmonizes validity") {
    val b = sharemind()
    val r1 = b.filterLit(rel(b, Seq("a"), Seq(Seq(1.0), Seq(2.0))), "a", MCmp.Eq, 1.0)
    val r2 = rel(b, Seq("a"), Seq(Seq(3.0)))
    val out = b.concat(Seq(r1, r2))
    assert(out.size == 3)
    assertSameRows(open(b, out), Seq(Seq(1.0), Seq(3.0)))
  }

  test("concat rejects mismatched schemas") {
    val b = sharemind()
    assertThrows[IllegalArgumentException](
      b.concat(Seq(rel(b, Seq("a"), Seq()), rel(b, Seq("z"), Seq()))))
  }

  test("close logs input cardinality to all parties") {
    val b = sharemind()
    rel(b, Seq("a"), Seq(Seq(1.0), Seq(2.0)))
    assert(b.leakage.cardinalities.exists(c => c.rows == 2L && c.to == parties3))
  }

  test("reveal decodes fixed-point to doubles exactly for integers") {
    val b = sharemind()
    val rows = Seq(Seq(123456.0, -789.0))
    assert(open(b, rel(b, Seq("a", "b2"), rows)) == rows)
  }

  test("garbled-circuit backend runs the same relational ops") {
    val b = oblivc()
    val rows = Seq(Seq(1.0, 10.0), Seq(2.0, 20.0), Seq(1.0, 30.0))
    val out = b.aggregate("t", rel(b, Seq("k", "v"), rows), Seq("k"), Some("v"), MAggFn.Sum, "s")
    assertSameRows(open(b, out), Seq(Seq(1.0, 40.0), Seq(2.0, 20.0)))
    assert(b.meter.gates > 0)
  }

  test("garbled-circuit join OOMs at the Fig. 1b anchor size") {
    val b = oblivc()
    val mk = (n: Int) => (1 to n).map(i => Seq(i.toDouble, 0.0))
    assertThrows[MpcOutOfMemory] {
      b.join("j", rel(b, Seq("k", "x"), mk(20000)), rel(b, Seq("k", "y"), mk(20000)),
        Seq("k"), Seq("k"))
    }
  }
}
