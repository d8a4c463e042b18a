package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PlanSpec extends AnyFunSuite {

  private def sc(name: String) = ScSeeker(name, Seq("a", "b"))

  test("nodes keep insertion order") {
    val p = new Plan
    p.add("s1", sc("s1")).add("s2", sc("s2")).add("c", Combiner.Union, Seq("s1", "s2"))
    assert(p.nodes.map(_.name) == Vector("s1", "s2", "c"))
  }

  test("duplicate names are rejected") {
    val p = new Plan
    p.add("s1", sc("s1"))
    intercept[IllegalArgumentException](p.add("s1", sc("other")))
  }

  test("combiners may only reference existing nodes") {
    val p = new Plan
    intercept[IllegalArgumentException](p.add("c", Combiner.Union, Seq("ghost")))
  }

  test("difference arity is validated at plan-build time") {
    val p = new Plan
    p.add("a", sc("a")).add("b", sc("b")).add("c", sc("c"))
    intercept[IllegalArgumentException](p.add("d", Combiner.Difference, Seq("a", "b", "c")))
  }

  test("sinks are the unconsumed nodes") {
    val p = new Plan
    p.add("s1", sc("s1")).add("s2", sc("s2")).add("c", Combiner.Union, Seq("s1", "s2"))
    p.add("lonely", sc("lonely"))
    assert(p.sinks.toSet == Set("c", "lonely"))
  }

  test("consumers maps a node to the combiners reading it") {
    val p = new Plan
    p.add("s1", sc("s1")).add("s2", sc("s2"))
    p.add("c1", Combiner.Union, Seq("s1", "s2"))
    p.add("c2", Combiner.Union, Seq("s1", "c1"))
    assert(p.consumers("s1").map(_.name).toSet == Set("c1", "c2"))
    assert(p.consumers("c1").map(_.name) == Vector("c2"))
  }

  test("seekers and combiners projections") {
    val p = new Plan
    p.add("s1", sc("s1")).add("s2", sc("s2")).add("c", Combiner.Intersection, Seq("s1", "s2"))
    assert(p.seekers.map(_.name) == Vector("s1", "s2"))
    assert(p.combiners.map(_.name) == Vector("c"))
  }

  test("empty input list is rejected") {
    val p = new Plan
    intercept[IllegalArgumentException](p.add("c", Combiner.Union, Seq.empty))
  }
}
