package repro.tasks

import repro.core._

/** BLEND discovery-plan builders for the complex tasks of §VIII-B and the
  * union-search plan of §VII-A. The `// LOC:…` markers delimit exactly the
  * code a user writes to define each task — the Table III bench counts
  * these lines and compares them with the federated pipelines in
  * [[repro.baselines.Federation]].
  */
object Tasks {

  /** Data discovery with negative examples: two MC seekers and a Difference
    * combiner (§VIII-B2).
    */
  def negativeExamplesPlan(
      positives: Seq[Vector[String]],
      negatives: Seq[Vector[String]],
      k: Int): Plan = {
    // LOC:blend-negatives:BEGIN
    val plan = new Plan
    plan.add("pos", McSeeker("pos", positives))
    plan.add("neg", McSeeker("neg", negatives))
    plan.add("result", Combiner.Difference, Seq("pos", "neg"), k)
    // LOC:blend-negatives:END
    plan
  }

  /** Example-based data imputation: MC on complete example rows, SC on the
    * incomplete rows' known column, intersected (§VIII-B3, Fig. 4).
    */
  def imputationPlan(
      examples: Seq[Vector[String]],
      queries: Seq[String],
      k: Int): Plan = {
    // LOC:blend-imputation:BEGIN
    val plan = new Plan
    plan.add("examples", McSeeker("examples", examples))
    plan.add("query", ScSeeker("query", queries))
    plan.add("result", Combiner.Intersection, Seq("examples", "query"), k)
    // LOC:blend-imputation:END
    plan
  }

  /** Multicollinearity-aware feature discovery: a correlation seeker on the
    * target, a Difference combiner per existing feature (to drop
    * multicollinear candidates), and an MC seeker ensuring joinability
    * (§VIII-B4).
    */
  def featureDiscoveryPlan(
      targetKeys: Seq[String],
      targetValues: Seq[Double],
      features: Seq[(Seq[String], Seq[Double])],
      joinTuples: Seq[Vector[String]],
      h: Int,
      k: Int): Plan = {
    // LOC:blend-features:BEGIN
    val plan = new Plan
    plan.add("corr", CorrSeeker("corr", targetKeys, targetValues, h))
    var prev = "corr"
    features.zipWithIndex.foreach { case ((fk, fv), i) =>
      plan.add(s"feat$i", CorrSeeker(s"feat$i", fk, fv, h))
      plan.add(s"nocollin$i", Combiner.Difference, Seq(prev, s"feat$i")); prev = s"nocollin$i" }
    plan.add("join", McSeeker("join", joinTuples))
    plan.add("result", Combiner.Intersection, Seq(prev, "join"), k)
    // LOC:blend-features:END
    plan
  }

  /** Union search: one SC seeker per query column (generous per-seeker k)
    * aggregated by a Counter combiner (§VII-A).
    */
  def unionSearchPlan(queryColumns: Seq[Seq[String]], perColumnK: Int, k: Int): Plan = {
    // LOC:blend-union:BEGIN
    val plan = new Plan
    queryColumns.zipWithIndex.foreach { case (c, i) =>
      plan.add(s"sc$i", ScSeeker(s"sc$i", c.toSeq, perColumnK)) }
    plan.add("result", Combiner.Counter, queryColumns.indices.map(i => s"sc$i"), k)
    // LOC:blend-union:END
    plan
  }

  /** Multi-objective discovery (Listing 4 minus the imputation sub-plan):
    * keyword search + union search + correlation search, merged by a Union
    * combiner (§VIII-B5).
    */
  def multiObjectivePlan(
      keywords: Seq[String],
      queryColumns: Seq[Seq[String]],
      corrKeys: Seq[String],
      corrTargets: Seq[Double],
      h: Int,
      k: Int): Plan = {
    // LOC:blend-multiobjective:BEGIN
    val plan = new Plan
    plan.add("kw", KwSeeker("kw", keywords, 10))
    queryColumns.zipWithIndex.foreach { case (c, i) =>
      plan.add(s"sc$i", ScSeeker(s"sc$i", c.toSeq, 100)) }
    plan.add("counter", Combiner.Counter, queryColumns.indices.map(i => s"sc$i"), 10)
    plan.add("corr", CorrSeeker("corr", corrKeys, corrTargets, h, 10))
    plan.add("result", Combiner.Union, Seq("kw", "counter", "corr"), k)
    // LOC:blend-multiobjective:END
    plan
  }
}
