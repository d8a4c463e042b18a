package repro.lake

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Metrics

class LakeGenSpec extends AnyFunSuite {

  private lazy val mixed = LakeGen.mixedLake("m", nEntities = 200, nTables = 30, rowsPerTable = 15, seed = 1)
  private lazy val union = LakeGen.unionLake("u", nClusters = 4, membersPerCluster = 5, rowsPerTable = 12, seed = 2)
  private lazy val corr = LakeGen.corrLake("c", nTables = 10, rowsPerTable = 60, keyUniverse = 50, nQueriesPerSplit = 3, seed = 3)

  test("generation is deterministic in the seed") {
    val a = LakeGen.mixedLake("m", nEntities = 200, nTables = 30, rowsPerTable = 15, seed = 1)
    assert(a.lake.tables.map(_.row(0)) == mixed.lake.tables.map(_.row(0)))
  }

  test("mixed lake: table ids are positional") {
    mixed.lake.tables.zipWithIndex.foreach { case (t, i) => assert(t.id == i.toLong) }
  }

  test("mixed lake: partial tables lack the city column") {
    mixed.partialTables.foreach { tid =>
      assert(!mixed.lake.table(tid).columns.exists(_.name == "city"))
    }
    val full = mixed.lake.tables.filterNot(t => mixed.partialTables.contains(t.id))
    assert(full.forall(_.columns.exists(_.name == "city")))
  }

  test("mixed lake: tableEntities reflects actual rows") {
    val t = mixed.lake.tables.find(t => !mixed.partialTables.contains(t.id)).get
    val persons = t.columns.find(_.name == "person").get.values.toSet
    val expected = mixed.tableEntities(t.id.toInt).map(e => mixed.universe(e).person)
    assert(persons == expected)
  }

  test("mixed lake: numeric columns carry parsed values") {
    val t = mixed.lake.tables.head
    val score = t.columns.find(_.name == "score").get
    assert(score.isNumeric)
    score.values.zip(score.numeric.get).foreach { case (s, d) =>
      assert(math.abs(s.toDouble - d) < 1e-6)
    }
  }

  test("union lake: ground truth is symmetric within a cluster") {
    val gt = union.lake.unionGroundTruth
    for ((q, members) <- gt; m <- members) {
      assert(gt(m).contains(q), s"member $m should list $q as unionable")
    }
  }

  test("union lake: queries are cluster members with nonempty truth") {
    union.queries.foreach { q =>
      assert(union.lake.unionGroundTruth(q).nonEmpty)
    }
  }

  test("union lake: decoys and filler are not in any ground-truth set") {
    val inGt = union.lake.unionGroundTruth.keySet ++ union.lake.unionGroundTruth.values.flatten
    val decoys = union.lake.tables.filter(_.name.contains("decoy")).map(_.id)
    val filler = union.lake.tables.filter(_.name.contains("filler")).map(_.id)
    (decoys ++ filler).foreach(id => assert(!inGt.contains(id)))
  }

  test("union lake: head member shares vocabulary with the cluster core") {
    val q = union.queries.head
    val partner = union.lake.unionGroundTruth(q).head
    val qVals = union.lake.table(q).columns.flatMap(_.values).toSet
    val pVals = union.lake.table(partner).columns.flatMap(_.values).toSet
    assert((qVals intersect pVals).nonEmpty, "cluster members should overlap")
  }

  test("union lake: family prefix is embedded in values") {
    val t = union.lake.tables.head
    assert(t.columns.head.values.forall(_.startsWith("f")))
  }

  test("corr lake: planted strong columns correlate with the latent target") {
    // For some query there must exist a candidate column with |pearson| > 0.5
    // over the joined pairs — otherwise the ground truth would be vacuous.
    val q = corr.catQueries.head
    val keyToTarget = q.keys.zip(q.targets).toMap
    val best = corr.lake.tables.flatMap { t =>
      val keyCol = t.columns.head
      t.columns.filter(c => c.isNumeric && c.name.startsWith("num")).map { c =>
        val pairs = keyCol.values.zip(c.numeric.get).collect {
          case (k, v) if keyToTarget.contains(k) => (keyToTarget(k), v)
        }
        if (pairs.size < 5) 0.0 else math.abs(Metrics.pearson(pairs.map(_._1), pairs.map(_._2)))
      }
    }.max
    assert(best > 0.5, s"expected a strongly correlated planted column, best=$best")
  }

  test("corr lake: odd tables use numerical keys, even tables categorical") {
    corr.lake.tables.foreach { t =>
      val keyCol = t.columns.head
      if (t.id % 2 == 0) assert(!keyCol.isNumeric) else assert(keyCol.isNumeric)
    }
  }

  test("corr lake: table prefixes are duplicate-heavy (few distinct keys)") {
    // The convenience sample (RowId < h) must see far fewer distinct keys
    // than a uniform sample of the same size — that is what makes it
    // non-representative (paper §VIII-G).
    corr.lake.tables.take(5).foreach { t =>
      val keys = t.columns.head.values
      val h = math.min(48, keys.size)
      val prefixDistinct = keys.take(h).distinct.size
      assert(prefixDistinct * 2 < h,
        s"table ${t.id}: prefix of $h rows has $prefixDistinct distinct keys — not duplicate-heavy")
      assert(keys.distinct.size > prefixDistinct, "later rows must add new keys")
    }
  }

  test("shuffleRows permutes rows but preserves row integrity") {
    val shuffled = LakeGen.shuffleRows(corr.lake, seed = 9)
    val orig = corr.lake.tables.head
    val shuf = shuffled.tables.head
    assert(orig.nRows == shuf.nRows)
    val origRows = (0 until orig.nRows).map(orig.row).toSet
    val shufRows = (0 until shuf.nRows).map(shuf.row).toSet
    assert(origRows == shufRows, "shuffling must keep rows intact")
    assert((0 until orig.nRows).map(orig.row) != (0 until shuf.nRows).map(shuf.row),
      "order should actually change")
  }

  test("lake statistics are consistent") {
    val l = union.lake
    assert(l.nTables == l.tables.size)
    assert(l.nCells == l.tables.map(t => t.nRows.toLong * t.nCols).sum)
    assert(l.nColumns == l.tables.map(_.nCols.toLong).sum)
  }

  test("ragged tables are rejected") {
    intercept[IllegalArgumentException] {
      LakeTable(0, "bad", Vector(
        LakeColumn("a", Vector("x", "y")),
        LakeColumn("b", Vector("z"))))
    }
  }

  test("ragged numeric vectors are rejected") {
    intercept[IllegalArgumentException] {
      LakeColumn("a", Vector("1", "2"), Some(Vector(1.0)))
    }
  }
}
