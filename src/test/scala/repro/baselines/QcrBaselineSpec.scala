package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import repro.Fixtures
import repro.core.Metrics

class QcrBaselineSpec extends AnyFunSuite {

  private lazy val corr = Fixtures.corr
  private lazy val idx = QcrBaseline.build(corr.lake, h = 64)

  test("sketches exist only for categorical join columns") {
    idx.sketches.foreach { s =>
      val col = corr.lake.table(s.tableId).columns(s.catCol)
      assert(!col.isNumeric, "numerical columns must never be treated as join keys")
    }
  }

  test("tables with numerical keys have no key sketches") {
    // Odd-id tables use numerical keys; their only categorical column is
    // the label column, which may still be sketched — but never column 0.
    idx.sketches.filter(s => s.tableId % 2 == 1).foreach(s => assert(s.catCol != 0))
  }

  test("sketch size is bounded by h") {
    idx.sketches.foreach(s => assert(s.hashes.length <= idx.h))
  }

  test("sketch hashes are sorted ascending (h smallest kept)") {
    idx.sketches.foreach(s => assert(s.hashes.toSeq == s.hashes.toSeq.sorted))
  }

  test("categorical query finds planted correlated tables") {
    val q = corr.catQueries.head
    val res = QcrBaseline.query(idx, q.keys, q.targets, k = 10)
    assert(res.nonEmpty)
    assert(res.head.score > 0.3, s"top estimate should show signal, got ${res.head}")
  }

  test("estimates approximate exact correlation on a strong pair") {
    val q = corr.catQueries.head
    val keyToTarget = q.keys.zip(q.targets).toMap
    // Exact |pearson| per categorical-key table, best column.
    val exact = corr.lake.tables.filter(_.id % 2 == 0).map { t =>
      val keyVals = t.columns.head.values
      val best = t.columns.filter(_.isNumeric).map { c =>
        val pairs = keyVals.zip(c.numeric.get).collect {
          case (kk, v) if keyToTarget.contains(kk) => (keyToTarget(kk), v)
        }
        if (pairs.size < 5) 0.0 else math.abs(Metrics.pearson(pairs.map(_._1), pairs.map(_._2)))
      }.maxOption.getOrElse(0.0)
      t.id -> best
    }.toMap
    val strongTables = exact.filter(_._2 > 0.7).keys.toSet
    if (strongTables.nonEmpty) {
      val top = QcrBaseline.query(idx, q.keys, q.targets, k = 10).map(_.tableId).toSet
      assert((top intersect strongTables).nonEmpty,
        "at least one strongly correlated table should surface in the sketch top-10")
    }
  }

  test("numerical-key queries go unanswered (baseline limitation)") {
    val q = corr.mixedQueries.find(!_.catKey).get
    val res = QcrBaseline.query(idx, q.keys, q.targets, k = 10)
    // The keys are digit strings; no categorical column contains them
    // except by accident — matches must be (near) zero.
    assert(res.forall(_.score <= 1.0))
    assert(res.size <= 2, s"numeric keys should find almost nothing, got ${res.size} tables")
  }

  test("query respects minimum support") {
    val res = QcrBaseline.query(idx, Seq("key_0"), Seq(1.0), k = 10, minSupport = 3)
    assert(res.isEmpty, "a single key cannot reach min support 3")
  }
}
