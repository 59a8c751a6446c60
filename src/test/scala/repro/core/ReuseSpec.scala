package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures._
import repro.algebra._
import ReuseChecker.canReuse
import SafetyChecker.Stats

/** Sketch reuse for parameterized queries (Sec. 6, Fig. 4, Ex. 7). */
class ReuseSpec extends AnyFunSuite {

  private val stats = Stats(Map("popden" -> (2000L, 7000L)))

  /** Ex. 7's T: states with more than $2 cities of at least $1 density. */
  private val tEx7: Op = Select(Col("cnt") > Param("p2"),
    Aggregate(Seq("state"), Seq(Agg(FCount, Col("city"), "cnt")),
      Select(Col("popden") >= Param("p1"), cities)))

  test("Ex. 7: sketch for (100, 10) answers (100, 15)") {
    assert(canReuse(tEx7, Map("p1" -> 100L, "p2" -> 10L), Map("p1" -> 100L, "p2" -> 15L), stats))
  }
  test("Ex. 7 reversed: sketch for (100, 15) cannot answer (100, 10)") {
    assert(!canReuse(tEx7, Map("p1" -> 100L, "p2" -> 15L), Map("p1" -> 100L, "p2" -> 10L), stats))
  }
  test("identical bindings always reusable") {
    val b = Map("p1" -> 3000L, "p2" -> 1L)
    assert(canReuse(tEx7, b, b, stats))
  }
  test("more selective inner selection is reusable (count RGe case)") {
    assert(canReuse(tEx7, Map("p1" -> 3000L, "p2" -> 1L), Map("p1" -> 4000L, "p2" -> 1L), stats))
  }
  test("less selective inner selection is not") {
    assert(!canReuse(tEx7, Map("p1" -> 4000L, "p2" -> 1L), Map("p1" -> 3000L, "p2" -> 1L), stats))
  }
  test("interval parameters: contained interval reusable, wider not") {
    val t = Select(Col("c") > Lit(0L),
      Aggregate(Seq("state"), Seq(Agg(FCount, Col("city"), "c")),
        Select((Col("popden") >= Param("lo")) && (Col("popden") <= Param("hi")), cities)))
    assert(canReuse(t, Map("lo" -> 2000L, "hi" -> 7000L), Map("lo" -> 3000L, "hi" -> 5000L), stats))
    assert(!canReuse(t, Map("lo" -> 3000L, "hi" -> 5000L), Map("lo" -> 2000L, "hi" -> 7000L), stats))
  }
  test("sum-HAVING template with positivity: higher threshold reusable") {
    val t = Select(Col("totden") > Param("p"),
      Aggregate(Seq("state"), Seq(Agg(FSum, Col("popden"), "totden")), cities))
    assert(canReuse(t, Map("p" -> 5000L), Map("p" -> 9000L), stats))
    assert(!canReuse(t, Map("p" -> 9000L), Map("p" -> 5000L), stats))
  }
  test("selection split across operators (Sec. 6 trivial example)") {
    // Q = σ_{p=4000}(σ_{p>3000}), Q' = σ_{p=4000}(σ_{p>2500}): equivalent,
    // and uconds (global) proves it even though the inner σ alone would fail.
    val t = Select(Col("popden") === Lit(4000L),
      Select(Col("popden") > Param("q"), cities))
    assert(canReuse(t, Map("q" -> 3000L), Map("q" -> 2500L), stats))
    assert(canReuse(t, Map("q" -> 2500L), Map("q" -> 3000L), stats))
  }
  test("top-k template: identical instances reusable, different not") {
    val t = TopK(Seq(("avgden", false)), 1,
      Aggregate(Seq("state"), Seq(Agg(FAvg, Col("popden"), "avgden")),
        Select(Col("popden") > Param("p"), cities)))
    assert(canReuse(t, Map("p" -> 3000L), Map("p" -> 3000L), stats))
    assert(!canReuse(t, Map("p" -> 3000L), Map("p" -> 2500L), stats))
    assert(!canReuse(t, Map("p" -> 2500L), Map("p" -> 3000L), stats))
  }
  test("min aggregate under ②: reusable when new instance is tighter") {
    val t = Select(Col("m") < Param("t"),
      Aggregate(Seq("state"), Seq(Agg(FMin, Col("popden"), "m")),
        Select(Col("popden") >= Param("lo"), cities)))
    // tighter inner selection → min grows (b ≤ b'), outer m' < t → m < t? No:
    // m ≤ m' ∧ m' < t gives m < t ✓ — reusable.
    assert(canReuse(t, Map("lo" -> 2000L, "t" -> 5000L), Map("lo" -> 3000L, "t" -> 5000L), stats))
  }
  test("reuse is transitive in practice across a chain of thresholds") {
    val bindings = Seq(10L, 12L, 15L).map(v => Map("p1" -> 100L, "p2" -> v))
    assert(canReuse(tEx7, bindings(0), bindings(1), stats))
    assert(canReuse(tEx7, bindings(1), bindings(2), stats))
    assert(canReuse(tEx7, bindings(0), bindings(2), stats))
  }
}
