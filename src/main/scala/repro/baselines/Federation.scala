package repro.baselines

import scala.collection.mutable

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.core.Scored
import repro.lake.Lake

/** Ad-hoc federations of stand-alone discovery systems — the baselines of
  * Table III. Each function glues independent systems (each with its own
  * index) together with application code: result sets are materialized to
  * the application, validated row-by-row, and combined with driver-side set
  * operations. The `// LOC:…` markers delimit the glue code a practitioner
  * would have to write; the bench compares the counts against the BLEND
  * plans in [[repro.tasks.Tasks]].
  */
object Federation {

  /** Negative-example discovery with MATE + application code (§VIII-B2):
    * MATE filters on positive examples, then every remaining candidate
    * table is reloaded and validated row-by-row against the negatives.
    */
  def negativeExamples(
      spark: SparkSession,
      mate: Mate.MateIndex,
      lake: Lake,
      positives: Seq[Vector[String]],
      negatives: Seq[Vector[String]],
      k: Int): Seq[Scored] = {
    // LOC:fed-negatives:BEGIN
    // System 1: MATE discovers tables containing the positive examples.
    val posResult = Mate.query(mate, lake, positives, k = -1)
    val candidateTables = posResult.ranking.map(_.tableId)
    if (candidateTables.isEmpty) return Seq.empty
    // Reload every candidate table from the index store for validation.
    val rows = mate.df
      .where(col("TableId").isin(candidateTables: _*))
      .select("TableId", "RowId", "CellValue")
      .collect()
    // Reassemble rows in application code.
    val byRow = mutable.Map.empty[(Long, Int), mutable.Set[String]]
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      val key = (r.getLong(0), r.getInt(1))
      byRow.getOrElseUpdate(key, mutable.Set.empty) += r.getString(2)
      i += 1
    }
    // Row-by-row validation: drop tables containing any negative example.
    val negs = negatives.distinct
    val outdated = mutable.Set.empty[Long]
    for (((tid, _), cells) <- byRow if !outdated.contains(tid)) {
      var j = 0
      while (j < negs.length && !outdated.contains(tid)) {
        if (negs(j).forall(cells.contains)) outdated += tid
        j += 1
      }
    }
    val ranking = posResult.ranking.filterNot(s => outdated.contains(s.tableId))
    // LOC:fed-negatives:END
    if (k > 0) ranking.take(k) else ranking
  }

  /** Example-based data imputation with MATE + JOSIE (§VIII-B3): MATE finds
    * tables containing the complete example rows, JOSIE finds tables
    * joining on the incomplete rows' known values; the application
    * intersects the two result sets.
    */
  def imputation(
      spark: SparkSession,
      mate: Mate.MateIndex,
      josie: Josie.JosieIndex,
      lake: Lake,
      examples: Seq[Vector[String]],
      queries: Seq[String],
      k: Int): Seq[Scored] = {
    // LOC:fed-imputation:BEGIN
    // System 1: MATE on the complete example rows.
    val exampleTables = Mate.query(mate, lake, examples, k = -1).ranking
    // System 2: JOSIE on the known values of the incomplete rows.
    val queryTables = Josie.query(josie, queries, k = -1)
    // Application-level intersection of the two systems' outputs.
    val josieScores = mutable.Map.empty[Long, Double]
    queryTables.foreach(s => josieScores(s.tableId) = s.score)
    val merged = mutable.ArrayBuffer.empty[Scored]
    exampleTables.foreach { s =>
      josieScores.get(s.tableId) match {
        case Some(j) => merged += Scored(s.tableId, s.score + j)
        case None    => ()
      }
    }
    val ranking = merged.sortBy(s => (-s.score, s.tableId)).toSeq
    // LOC:fed-imputation:END
    if (k > 0) ranking.take(k) else ranking
  }

  /** Multicollinearity-aware feature discovery with the QCR sketch system +
    * MATE (§VIII-B4): one QCR round for the target, one per existing
    * feature (whose results are subtracted), and a MATE round for
    * joinability; all combined in application code.
    */
  def featureDiscovery(
      spark: SparkSession,
      qcr: QcrBaseline.QcrIndex,
      mate: Mate.MateIndex,
      lake: Lake,
      targetKeys: Seq[String],
      targetValues: Seq[Double],
      features: Seq[(Seq[String], Seq[Double])],
      joinTuples: Seq[Vector[String]],
      k: Int): Seq[Scored] = {
    // LOC:fed-features:BEGIN
    // System 1, round 0: QCR discovers columns correlating with the target.
    var remaining = QcrBaseline.query(qcr, targetKeys, targetValues, k = -1)
    // Rounds 1..m: drop tables correlating with an existing feature.
    features.foreach { case (fKeys, fValues) =>
      val collinear = QcrBaseline.query(qcr, fKeys, fValues, k = -1)
      val drop = collinear.map(_.tableId).toSet
      remaining = remaining.filterNot(s => drop.contains(s.tableId))
    }
    // System 2: MATE checks joinability on the composite key.
    val joinable = Mate.query(mate, lake, joinTuples, k = -1).ranking
    val joinableIds = joinable.map(_.tableId).toSet
    val ranking = remaining.filter(s => joinableIds.contains(s.tableId))
    // LOC:fed-features:END
    if (k > 0) ranking.take(k) else ranking
  }

  /** Multi-objective discovery with JOSIE + Starmie + QCR (§VIII-B5):
    * keyword search via JOSIE look-ups, union search via Starmie, and
    * correlation search via the QCR system, unioned in application code.
    */
  def multiObjective(
      spark: SparkSession,
      josie: Josie.JosieIndex,
      starmie: StarmieLike.StarmieIndex,
      qcr: QcrBaseline.QcrIndex,
      lake: Lake,
      keywords: Seq[String],
      queryColumns: Seq[Seq[String]],
      corrKeys: Seq[String],
      corrTargets: Seq[Double],
      k: Int): Seq[Scored] = {
    // LOC:fed-multiobjective:BEGIN
    // System 1: JOSIE serves the keyword look-up.
    val kwTables = Josie.query(josie, keywords, 10)
    // System 2: Starmie serves union search over the query columns.
    val unionTables = StarmieLike.query(starmie, queryColumns, 10)
    // System 3: the QCR sketch system serves correlation search.
    val corrTables = QcrBaseline.query(qcr, corrKeys, corrTargets, 10)
    // Application-level union with score normalization per system.
    val merged = mutable.Map.empty[Long, Double]
    def fold(rs: Seq[Scored]): Unit = {
      val top = if (rs.isEmpty) 1.0 else math.max(rs.map(_.score).max, 1e-9)
      rs.foreach(s => merged(s.tableId) = merged.getOrElse(s.tableId, 0.0) + s.score / top)
    }
    fold(kwTables)
    fold(unionTables)
    fold(corrTables)
    val ranking = merged.toSeq.map { case (t, s) => Scored(t, s) }.sortBy(s => (-s.score, s.tableId))
    // LOC:fed-multiobjective:END
    if (k > 0) ranking.take(k) else ranking
  }
}
