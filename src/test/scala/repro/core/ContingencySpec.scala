package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class ContingencyPureSpec extends AnyFunSuite {

  private val ct = ContingencyTable(Vector("A", "B", "C"), Map(
    Vector("a1", "b1", "c1") -> 10L,
    Vector("a1", "b1", "c2") -> 5L,
    Vector("a1", "b2", "c1") -> 3L,
    Vector("a2", "b1", "c1") -> 7L,
    Vector("a2", "b2", "c2") -> 15L))

  test("n is total count") { assert(ct.n == 40L) }
  test("distinctCount counts observed cells") { assert(ct.distinctCount == 5) }

  test("marginal over one attribute sums correctly") {
    val m = ct.marginal(Seq("A"))
    assert(m.counts == Map(Vector("a1") -> 18L, Vector("a2") -> 22L))
  }
  test("marginal over two attributes in a different order") {
    val m = ct.marginal(Seq("C", "A"))
    assert(m.counts(Vector("c1", "a1")) == 13L)
    assert(m.counts(Vector("c2", "a2")) == 15L)
    assert(m.n == 40L)
  }
  test("marginal of all attrs is identity") {
    assert(ct.marginal(Seq("A", "B", "C")) eq ct)
  }
  test("marginal rejects unknown attribute") {
    intercept[IllegalArgumentException] { ct.marginal(Seq("Z")) }
  }

  test("restrict keeps only matching tuples and drops column") {
    val r = ct.restrict("B", "b2")
    assert(r.attrs == Vector("A", "C"))
    assert(r.counts == Map(Vector("a1", "c1") -> 3L, Vector("a2", "c2") -> 15L))
  }

  test("domain is sorted distinct values") {
    assert(ct.domain("B") == Vector("b1", "b2"))
    assert(ct.domain("C") == Vector("c1", "c2"))
  }

  test("groupBy splits into per-group sub-tables") {
    val g = ct.groupBy(Seq("A"))
    assert(g.keySet == Set(Vector("a1"), Vector("a2")))
    assert(g(Vector("a1")).n == 18L)
    assert(g(Vector("a1")).attrs == Vector("B", "C"))
    assert(g(Vector("a2")).counts(Vector("b2", "c2")) == 15L)
  }

  test("matrix produces a dense count matrix with sorted domains") {
    val (dx, dy, m) = ct.matrix("A", "B")
    assert(dx == Vector("a1", "a2") && dy == Vector("b1", "b2"))
    assert(m(0)(0) == 15L && m(0)(1) == 3L && m(1)(0) == 7L && m(1)(1) == 15L)
  }

  test("fromMatrix round-trips with matrix") {
    val (dx, dy, m) = ct.matrix("A", "B")
    val back = Contingency.fromMatrix("A", "B", dx, dy, m)
    assert(back.counts == ct.marginal(Seq("A", "B")).counts)
  }

  test("duplicate attributes rejected") {
    intercept[IllegalArgumentException] {
      ContingencyTable(Vector("A", "A"), Map(Vector("x", "y") -> 1L))
    }
  }
}

class ContingencySparkSpec extends SparkSpec {
  import spark.implicits._

  test("fromDf counts match groupBy") {
    val df = Seq(("a", 1), ("a", 1), ("a", 2), ("b", 1)).toDF("k", "v")
    val ct = Contingency.fromDf(df, Seq("k", "v"))
    assert(ct.n == 4)
    assert(ct.counts(Vector("a", "1")) == 2L)
    assert(ct.counts(Vector("b", "1")) == 1L)
  }

  test("fromDf maps nulls to the sentinel category") {
    val df = Seq(Some("x"), None, Some("x")).toDF("k")
    val ct = Contingency.fromDf(df, Seq("k"))
    assert(ct.counts(Vector("∅")) == 1L)
    assert(ct.counts(Vector("x")) == 2L)
  }

  test("fromDf casts non-string columns") {
    val df = Seq((1, 2.5), (1, 2.5), (2, 3.0)).toDF("i", "d")
    val ct = Contingency.fromDf(df, Seq("i", "d"))
    assert(ct.counts(Vector("1", "2.5")) == 2L)
  }

  test("marginal of fromDf equals fromDf of fewer columns") {
    val df = Seq(("a", "x", 1), ("a", "y", 2), ("b", "x", 1), ("a", "x", 2)).toDF("p", "q", "r")
    val full = Contingency.fromDf(df, Seq("p", "q", "r"))
    val marg = Contingency.fromDf(df, Seq("p", "q"))
    assert(full.marginal(Seq("p", "q")).counts == marg.counts)
  }
}
