package repro.lake

import scala.collection.mutable
import scala.util.Random

/** Synthetic data-lake generators with planted ground truth.
  *
  * The paper evaluates on corpora (GitTables, DWTC, SANTOS, TUS, NYC …)
  * that are proprietary-scale and unavailable offline; each generator here
  * plants the distributional structure the corresponding experiment
  * depends on (see DESIGN.md "Substitutions"):
  *
  *  - [[mixedLake]]  — entity universe with composite (city, person) keys:
  *    join/imputation/optimizer workloads (gittables/dwtc/opendata-lite);
  *  - [[unionLake]]  — unionable clusters with controlled value overlap and
  *    semantic families (santos/tus/tuslarge-lite);
  *  - [[corrLake]]   — latent-factor key→value model with categorical and
  *    numerical join keys (nyc-lite).
  *
  * All generation is deterministic in the seed.
  */
object LakeGen {

  // ---------------------------------------------------------------- mixed

  /** An entity of the mixed lake universe: a composite key (city, person)
    * plus dependent attributes. `region` partitions the universe for the
    * negative-examples task (region 0 = wanted, region 1 = outdated).
    */
  final case class Entity(
      city: String,
      person: String,
      dept: String,
      score: Double,
      year: Double,
      region: Int,
  ) {
    def pair: Vector[String] = Vector(city, person)
  }

  /** A mixed lake plus the universe it was sampled from and, per table, the
    * set of entity indices it contains (the benches derive exact ground
    * truth from this).
    */
  final case class MixedLake(
      lake: Lake,
      universe: Vector[Entity],
      tableEntities: Vector[Set[Int]],
      partialTables: Set[Long],
  )

  /** Entity-universe lake. Each table materializes a window of entities as
    * rows; ~`partialFrac` of the tables drop the city column ("partial"
    * tables, used by the imputation task's SC side). A noise column per
    * table densifies super keys so the XASH bloom filter has realistic
    * false-positive rates.
    */
  def mixedLake(
      name: String,
      nEntities: Int = 2000,
      nTables: Int = 300,
      rowsPerTable: Int = 40,
      partialFrac: Double = 0.2,
      seed: Long = 7,
  ): MixedLake = {
    val rnd = new Random(seed)
    val nCities = math.max(4, nEntities / 8)
    val depts = Vector("hr", "it", "finance", "marketing", "sales", "rnd", "legal", "ops")

    val universe = Vector.tabulate(nEntities) { e =>
      Entity(
        city = s"city_${rnd.nextInt(nCities)}",
        person = s"person_$e",
        dept = depts(rnd.nextInt(depts.size)),
        score = rnd.nextGaussian() * 10 + 50,
        year = 2000 + rnd.nextInt(25),
        region = if (e < nEntities / 2) 0 else 1,
      )
    }

    def round2(v: Double): Double = math.rint(v * 100) / 100

    val tableEntities = mutable.ArrayBuffer.empty[Set[Int]]
    val partials = mutable.Set.empty[Long]
    val tables = Vector.tabulate(nTables) { t =>
      // A window keeps per-table entity sets overlapping but distinct.
      val center = rnd.nextInt(nEntities)
      val window = math.min(nEntities, rowsPerTable * 4)
      val picked = Vector.fill(rowsPerTable) {
        (center + rnd.nextInt(window)) % nEntities
      }.distinct
      tableEntities += picked.toSet
      val es = picked.map(universe)

      val partial = rnd.nextDouble() < partialFrac
      if (partial) partials += t.toLong

      val noise = Vector.fill(es.size)(s"note_${rnd.nextInt(5000)}")
      val cols = mutable.ArrayBuffer.empty[LakeColumn]
      if (!partial) cols += LakeColumn("city", es.map(_.city))
      cols += LakeColumn("person", es.map(_.person))
      cols += LakeColumn("dept", es.map(_.dept))
      cols += LakeColumn("score", es.map(e => f"${e.score}%.2f"), Some(es.map(e => round2(e.score))))
      cols += LakeColumn("year", es.map(_.year.toInt.toString), Some(es.map(_.year)))
      cols += LakeColumn("note", noise)
      LakeTable(t.toLong, s"$name-t$t", cols.toVector)
    }

    MixedLake(Lake(name, tables), universe, tableEntities.toVector, partials.toSet)
  }

  // ---------------------------------------------------------------- union

  /** A union lake plus the query tables the bench issues (ground truth is
    * in `lake.unionGroundTruth`).
    */
  final case class UnionLake(lake: Lake, queries: Vector[Long])

  /** Clustered union lake. Cluster members share a schema of value domains;
    * each member reuses the cluster's core vocabulary with a member-specific
    * overlap ratio (head members high, a tail low, and a few
    * "semantic-only" members with near-zero overlap — the tables the paper
    * says Starmie finds but overlap search cannot). Values embed their
    * *semantic family* and *domain* (`f<family>_d<domain>_…`), which the
    * Starmie substitute reads as its "pretrained semantics".
    *
    * Pollution on both sides, as in the paper's quality results:
    *  - decoys share a family but none of the vocabulary, and families are
    *    shared across clusters — semantic false positives that cost Starmie
    *    precision at large k;
    *  - a fraction of filler tables steals a few core values ("lexical
    *    noise") — overlap false positives that cost BLEND precision at the
    *    tail of its ranking.
    */
  def unionLake(
      name: String,
      nClusters: Int,
      membersPerCluster: Int,
      rowsPerTable: Int = 24,
      decoysPerCluster: Int = 3,
      nFiller: Int = 40,
      nFamilies: Int = 6,
      noiseFillerFrac: Double = 0.5,
      seed: Long = 11,
  ): UnionLake = {
    val rnd = new Random(seed)
    val nDomainsPerFamily = 8
    val colsPerTable = 4

    val tables = mutable.ArrayBuffer.empty[LakeTable]
    val gt = mutable.Map.empty[Long, Set[Long]]
    val queries = mutable.ArrayBuffer.empty[Long]
    val clusterCores = mutable.ArrayBuffer.empty[Vector[Vector[String]]]
    var nextId = 0L
    def freshId(): Long = { val id = nextId; nextId += 1; id }

    /** Overlap ratio of member m; every 7th member is semantic-only. */
    def overlapOf(m: Int): Double =
      if (m == 0) 0.7
      else if (m % 7 == 6) rnd.nextDouble() * 0.03
      else if (m <= membersPerCluster / 3) 0.45 + rnd.nextDouble() * 0.35
      else 0.10 + rnd.nextDouble() * 0.35

    for (c <- 0 until nClusters) {
      val fam = c % nFamilies
      // All clusters of a family share the same domain signature: members
      // of a sibling cluster are then semantically indistinguishable from
      // this cluster's low-overlap members — Starmie's large-k impostors.
      val doms = Vector.tabulate(colsPerTable)(i => (fam + i) % nDomainsPerFamily)
      val coreSize = rowsPerTable * 2
      // Cluster-core vocabulary per domain column (cluster-tagged: vocab is
      // disjoint across clusters even within a family).
      val core = doms.zipWithIndex.map { case (d, ci) =>
        Vector.tabulate(coreSize)(i => s"f${fam}_d${d}_c${c}_v$i")
      }
      clusterCores += core

      val memberIds = Vector.fill(membersPerCluster)(freshId())
      for ((id, m) <- memberIds.zipWithIndex) {
        val overlap = overlapOf(m)
        val cols = doms.zipWithIndex.map { case (d, ci) =>
          val values = Vector.tabulate(rowsPerTable) { r =>
            if (rnd.nextDouble() < overlap) core(ci)(rnd.nextInt(coreSize))
            else s"f${fam}_d${d}_m${id}_p$r"
          }
          LakeColumn(s"col$ci", values)
        }
        val metric = Vector.fill(rowsPerTable)(math.rint((rnd.nextGaussian() * 5 + 10) * 100) / 100)
        tables += LakeTable(id, s"$name-c$c-m$m",
          cols :+ LakeColumn("metric", metric.map(v => f"$v%.2f"), Some(metric)))
      }
      val memberSet = memberIds.toSet
      for (id <- memberIds) gt(id) = memberSet - id
      // Two queries per cluster: the head member and a mid-overlap member.
      queries += memberIds.head
      val mid = {
        val m = membersPerCluster / 2
        if (m % 7 == 6) m - 1 else m
      }
      if (mid > 0 && mid < membersPerCluster) queries += memberIds(mid)

      // Decoys: same family, disjoint vocabulary, shifted domains.
      for (dIdx <- 0 until decoysPerCluster) {
        val id = freshId()
        val cols = Vector.tabulate(colsPerTable) { ci =>
          val d = (doms(ci % doms.size) + 1 + dIdx) % nDomainsPerFamily
          LakeColumn(s"col$ci",
            Vector.tabulate(rowsPerTable)(r => s"f${fam}_d${d}_x${id}_r$r"))
        }
        tables += LakeTable(id, s"$name-decoy$c-$dIdx", cols)
      }
    }

    for (fidx <- 0 until nFiller) {
      val id = freshId()
      val lexicalNoise = rnd.nextDouble() < noiseFillerFrac
      val target = if (lexicalNoise) Some(clusterCores(rnd.nextInt(nClusters))) else None
      val stolenPerCol = 3 + rnd.nextInt(6)
      val cols = Vector.tabulate(colsPerTable) { ci =>
        val values = Vector.tabulate(rowsPerTable) { r =>
          target match {
            case Some(core) if r < stolenPerCol => core(ci)(rnd.nextInt(core(ci).size))
            case _ => s"noise_${id}_${ci}_$r"
          }
        }
        LakeColumn(s"col$ci", values)
      }
      tables += LakeTable(id, s"$name-filler$fidx", cols)
    }

    UnionLake(Lake(name, tables.toVector, gt.toMap), queries.toVector)
  }

  // ---------------------------------------------------------- correlation

  /** A correlation-search query: a join-key column and a numerical target,
    * as sampled from the latent model. `catKey` tells the benchmark split
    * (NYC (Cat.) uses only catKey queries, NYC (All) mixes both).
    */
  final case class CorrQuery(name: String, keys: Vector[String], targets: Vector[Double], catKey: Boolean)

  final case class CorrLake(lake: Lake, catQueries: Vector[CorrQuery], mixedQueries: Vector[CorrQuery])

  /** Latent-factor correlation lake (nyc-lite). Every join key `v` carries a
    * latent factor z(v); lake columns are a·z + noise with a per-column
    * correlation strength a (0 for independent columns). Rows arrive in
    * runs of duplicated keys whose run length shrinks over the table, so
    * the convenience sample (`RowId < h`) sees few distinct keys — exactly
    * the paper's "consecutive values might be duplicates making this
    * sampling non-representative", which is why vanilla BLEND trails
    * BLEND (rand).
    */
  def corrLake(
      name: String,
      nTables: Int = 60,
      rowsPerTable: Int = 220,
      keyUniverse: Int = 400,
      nQueriesPerSplit: Int = 20,
      seed: Long = 13,
  ): CorrLake = {
    val rnd = new Random(seed)

    // Two key universes: categorical strings and numerical (digit) strings.
    val catKeys = Vector.tabulate(keyUniverse)(i => s"key_$i")
    val numKeys = Vector.tabulate(keyUniverse)(i => (10000 + i).toString)
    val latentCat = Vector.fill(keyUniverse)(rnd.nextGaussian())
    val latentNum = Vector.fill(keyUniverse)(rnd.nextGaussian())

    def keyOf(cat: Boolean, i: Int): String = if (cat) catKeys(i) else numKeys(i)
    def zOf(cat: Boolean, i: Int): Double = if (cat) latentCat(i) else latentNum(i)

    val tables = Vector.tabulate(nTables) { t =>
      val cat = t % 2 == 0
      val subsetSize = keyUniverse / 2 + rnd.nextInt(keyUniverse / 2)
      val subset = rnd.shuffle((0 until keyUniverse).toList).take(subsetSize).toVector
      val rowKeys = {
        val buf = mutable.ArrayBuffer.empty[Int]
        // The head of the table is runs of duplicated keys (~12 rows per
        // key), the rest is uniform — so a RowId < h prefix sees only a
        // handful of distinct keys.
        val dupPrefix = math.min(96, rowsPerTable / 2)
        while (buf.size < rowsPerTable) {
          val k = subset(rnd.nextInt(subset.size))
          val run = if (buf.size < dupPrefix) 10 + rnd.nextInt(8) else 1
          var i = 0
          while (i < run && buf.size < rowsPerTable) { buf += k; i += 1 }
        }
        buf.toVector
      }

      val nNum = 2 + rnd.nextInt(3)
      val strengths = Vector.tabulate(nNum) { j =>
        if (j == 0 && t % 3 != 2) (0.35 + rnd.nextDouble() * 0.65) * (if (rnd.nextBoolean()) 1 else -1)
        else if (rnd.nextDouble() < 0.35) (0.2 + rnd.nextDouble() * 0.5) * (if (rnd.nextBoolean()) 1 else -1)
        else 0.0
      }

      val keyCol =
        if (cat) LakeColumn("key", rowKeys.map(catKeys))
        else {
          val vals = rowKeys.map(numKeys)
          LakeColumn("key", vals, Some(vals.map(_.toDouble)))
        }
      val numCols = strengths.zipWithIndex.map { case (a, j) =>
        val vs = rowKeys.map { ki =>
          val raw = a * zOf(cat, ki) + rnd.nextGaussian() * math.sqrt(math.max(0.05, 1 - a * a))
          math.rint(raw * 1e4) / 1e4
        }
        LakeColumn(s"num$j", vs.map(v => f"$v%.4f"), Some(vs))
      }
      val label = LakeColumn("label", rowKeys.map(ki => s"lbl_${ki % 17}"))
      LakeTable(t.toLong, s"$name-t$t", keyCol +: (numCols :+ label))
    }

    def mkQuery(i: Int, cat: Boolean): CorrQuery = {
      val nKeys = 60 + rnd.nextInt(40)
      val picked = rnd.shuffle((0 until keyUniverse).toList).take(nKeys).toVector
      val keys = picked.map(keyOf(cat, _))
      val targets = picked.map(ki => zOf(cat, ki) * 0.9 + rnd.nextGaussian() * 0.3)
      CorrQuery(s"q${if (cat) "cat" else "num"}$i", keys, targets, cat)
    }

    val catQs = Vector.tabulate(nQueriesPerSplit)(i => mkQuery(i, cat = true))
    val mixedQs = Vector.tabulate(nQueriesPerSplit)(i => mkQuery(100 + i, cat = i % 2 == 0))
    CorrLake(Lake(name, tables), catQs, mixedQs)
  }

  // ---------------------------------------------------------------- misc

  /** Per-table row shuffle — builds the apriori-shuffled index of
    * BLEND (rand) (paper §VIII-G).
    */
  def shuffleRows(lake: Lake, seed: Long): Lake = {
    val rnd = new Random(seed)
    val shuffled = lake.tables.map { t =>
      val perm = rnd.shuffle(t.columns.head.values.indices.toVector)
      t.copy(columns = t.columns.map { c =>
        c.copy(
          values = perm.map(c.values),
          numeric = c.numeric.map(n => perm.map(n)),
        )
      })
    }
    lake.copy(tables = shuffled)
  }
}
