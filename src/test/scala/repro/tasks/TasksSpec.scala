package repro.tasks

import repro.{Fixtures, SparkSpec}
import repro.core._
import repro.util.Loc

class TasksSpec extends SparkSpec {

  private lazy val blend = new Executor(spark, Fixtures.fig1Index, CostModel.untrained, optimize = true)

  test("Example 1 end-to-end: (rs1 ∩ rs3) − rs2 = {T3}") {
    val depts = Seq("HR", "Marketing", "Finance", "IT", "R&D", "Sales")
    val plan = new Plan
    plan.add("rs1", McSeeker("rs1", Seq(Vector("HR", "Firenze"))))
    plan.add("rs3", ScSeeker("rs3", depts))
    plan.add("inter", Combiner.Intersection, Seq("rs1", "rs3"))
    plan.add("rs2", McSeeker("rs2", Seq(Vector("IT", "Tom Riddle"))))
    plan.add("result", Combiner.Difference, Seq("inter", "rs2"), 1)
    val res = blend.execute(plan)
    assert(res("result").map(_.tableId) == Seq(2L), "the up-to-date table T3 must win")
  }

  test("negative-examples plan has the paper's structure") {
    val p = Tasks.negativeExamplesPlan(Seq(Vector("HR", "Firenze")), Seq(Vector("IT", "Tom Riddle")), 10)
    assert(p.seekers.map(_.seeker.seekerType).toSet == Set(SeekerType.MC))
    assert(p.combiners.map(_.combiner) == Vector(Combiner.Difference))
  }

  test("negative-examples plan excludes outdated tables on Fig. 1") {
    val p = Tasks.negativeExamplesPlan(Seq(Vector("HR", "Firenze")), Seq(Vector("IT", "Tom Riddle")), 10)
    val res = blend.execute(p)
    assert(res("result").map(_.tableId) == Seq(2L))
  }

  test("imputation plan intersects MC and SC evidence") {
    val p = Tasks.imputationPlan(Seq(Vector("HR", "Firenze")), Seq("Marketing", "Finance"), 10)
    val res = blend.execute(p)
    // Tables containing (HR, Firenze) rows AND the query values: T2, T3.
    assert(res("result").map(_.tableId).toSet == Set(1L, 2L))
  }

  test("union-search plan is SC-per-column plus Counter") {
    val cols = Seq(Seq("HR", "Marketing"), Seq("Firenze", "Harry Potter"))
    val p = Tasks.unionSearchPlan(cols, perColumnK = 100, k = 5)
    assert(p.seekers.size == 2)
    assert(p.combiners.map(_.combiner) == Vector(Combiner.Counter))
    val res = blend.execute(p)
    // T2/T3 match both columns (count 2) and must outrank T1 (count 1).
    val top2 = res("result").take(2).map(_.tableId).toSet
    assert(top2 == Set(1L, 2L))
  }

  test("union-search plan recovers cluster members on the union lake") {
    val u = Fixtures.union
    val exec = new Executor(spark, Fixtures.unionIndex, CostModel.untrained, optimize = true)
    val q = u.queries.head
    val queryCols = u.lake.table(q).columns.filterNot(_.isNumeric).map(_.values: Seq[String])
    val p = Tasks.unionSearchPlan(queryCols, perColumnK = 200, k = 10)
    val got = exec.execute(p)("result").map(_.tableId).filterNot(_ == q)
    val truth = u.lake.unionGroundTruth(q)
    assert(got.take(5).count(truth.contains) >= 2,
      s"expected cluster members in the top results, got $got")
  }

  test("feature-discovery plan chains Difference combiners and ends in Intersection") {
    val p = Tasks.featureDiscoveryPlan(
      targetKeys = Seq("a", "b"), targetValues = Seq(1.0, 2.0),
      features = Seq((Seq("a", "b"), Seq(2.0, 1.0)), (Seq("a", "b"), Seq(0.0, 5.0))),
      joinTuples = Seq(Vector("a", "b")), h = 64, k = 10)
    val combs = p.combiners.map(_.combiner)
    assert(combs.count(_ == Combiner.Difference) == 2)
    assert(combs.last == Combiner.Intersection)
    assert(p.seekers.count(_.seeker.seekerType == SeekerType.C) == 3)
    assert(p.seekers.count(_.seeker.seekerType == SeekerType.MC) == 1)
  }

  test("multi-objective plan mirrors Listing 4 (minus imputation)") {
    val p = Tasks.multiObjectivePlan(
      keywords = Seq("HR"), queryColumns = Seq(Seq("HR"), Seq("Firenze")),
      corrKeys = Seq("a", "b"), corrTargets = Seq(1.0, 2.0), h = 64, k = 40)
    assert(p.seekers.map(_.seeker.seekerType).toSet ==
      Set(SeekerType.KW, SeekerType.SC, SeekerType.C))
    assert(p.combiners.map(_.combiner) == Vector(Combiner.Counter, Combiner.Union))
  }

  test("multi-objective plan runs identically with and without the optimizer") {
    val mkPlan = () => Tasks.multiObjectivePlan(
      keywords = Seq("HR", "Firenze"),
      queryColumns = Seq(Seq("HR", "Marketing"), Seq("Firenze", "Harry Potter")),
      corrKeys = Seq("HR", "Marketing", "Finance"), corrTargets = Seq(1.0, 2.0, 3.0),
      h = 64, k = 40)
    val bno = new Executor(spark, Fixtures.fig1Index, CostModel.untrained, optimize = false)
    assert(blend.execute(mkPlan())("result") == bno.execute(mkPlan())("result"))
  }

  test("BLEND plan definitions are a few lines of code") {
    val tags = Seq("blend-negatives", "blend-imputation", "blend-features",
      "blend-union", "blend-multiobjective")
    tags.foreach { t =>
      val n = Loc.count(t)
      assert(n >= 3 && n <= 10, s"$t: unexpected LOC $n")
    }
  }

  test("federated glue code is several times larger") {
    val pairs = Seq(
      "blend-negatives" -> "fed-negatives",
      "blend-imputation" -> "fed-imputation",
      "blend-features" -> "fed-features",
      "blend-multiobjective" -> "fed-multiobjective")
    pairs.foreach { case (b, f) =>
      assert(Loc.count(f) > Loc.count(b), s"$f should exceed $b")
    }
  }
}
