package repro.baselines

import scala.util.Random
import scala.util.hashing.MurmurHash3

import repro.core.Scored
import repro.lake.{Lake, LakeTable}

/** Substitute for Starmie (VLDB'23), the contrastive-learning union-search
  * baseline. Starmie embeds every column with a pretrained model and ranks
  * tables by embedding similarity (HNSW-accelerated in the original; brute
  * force here, which at lite scale is just as fast).
  *
  * The learned encoder is replaced by a deterministic synthetic one (see
  * DESIGN.md): a hashed bag-of-values vector blended with a *semantic
  * family* direction parsed from the generator's value scheme
  * (`f<family>_…`). This reproduces Starmie's defining behaviour — it
  * recognises unionable tables whose value overlap is low (same family)
  * but also ranks semantically-close non-unionable tables (decoys) highly,
  * which costs it precision at large k.
  */
object StarmieLike {

  val Dim = 128

  /** Mixture weights: token bag vs. semantic family vs. semantic domain.
    * The semantic part is additionally scaled by the fraction of values
    * that carry the `f<fam>_d<dom>_` scheme, so a table with a handful of
    * stolen in-domain values does not look semantic.
    */
  val TokenWeight = 0.50
  val FamilyWeight = 0.30
  val DomainWeight = 0.20

  private val SchemePattern = "^f(\\d+)_d(\\d+)_".r

  final case class StarmieIndex(tables: Vector[(Long, Array[Array[Double]])])

  private def seededVec(seed: Long): Array[Double] = {
    val rnd = new Random(seed)
    normalize(Array.fill(Dim)(rnd.nextGaussian()))
  }
  private def familyVec(family: Int): Array[Double] = seededVec(family.toLong * 7919 + 17)
  private def domainVec(family: Int, domain: Int): Array[Double] =
    seededVec(family.toLong * 131071 + domain.toLong * 7919 + 29)

  private def normalize(v: Array[Double]): Array[Double] = {
    val n = math.sqrt(v.map(x => x * x).sum)
    if (n == 0.0) v else v.map(_ / n)
  }

  /** "Model inference" for one column. */
  def embedColumn(values: Seq[String]): Array[Double] = {
    val tokens = Array.fill(Dim)(0.0)
    val distinct = values.distinct
    distinct.foreach { v =>
      val h = MurmurHash3.stringHash(v, 0x5bd1e995)
      val bucket = (h & 0x7fffffff) % Dim
      val sign = if ((h & 1) == 0) 1.0 else -1.0
      tokens(bucket) += sign
    }
    val tokenVec = normalize(tokens)

    val schemes = distinct.flatMap(v =>
      SchemePattern.findFirstMatchIn(v).map(m => (m.group(1).toInt, m.group(2).toInt)))
    if (schemes.isEmpty) return tokenVec

    val fam = schemes.map(_._1).groupBy(identity).maxBy(_._2.size)._1
    val (df, dd) = schemes.groupBy(identity).maxBy(_._2.size)._1
    val semFrac = schemes.size.toDouble / distinct.size
    val fv = familyVec(fam)
    val dv = domainVec(df, dd)
    normalize(Array.tabulate(Dim) { i =>
      TokenWeight * tokenVec(i) + semFrac * (FamilyWeight * fv(i) + DomainWeight * dv(i))
    })
  }

  def embedTable(t: LakeTable): Array[Array[Double]] =
    t.columns.filterNot(_.isNumeric).map(c => embedColumn(c.values)).toArray

  /** Offline: embed every lake column. */
  def build(lake: Lake): StarmieIndex =
    StarmieIndex(lake.tables.map(t => t.id -> embedTable(t)))

  /** Persist the vector store — Starmie keeps embeddings in a file. */
  def save(idx: StarmieIndex, path: java.nio.file.Path): Long = {
    val out = new java.io.DataOutputStream(new java.io.FileOutputStream(path.toFile))
    try {
      out.writeInt(idx.tables.size)
      idx.tables.foreach { case (tid, cols) =>
        out.writeLong(tid)
        out.writeInt(cols.length)
        cols.foreach(v => v.foreach(x => out.writeFloat(x.toFloat)))
      }
    } finally out.close()
    java.nio.file.Files.size(path)
  }

  /** Cold start: read the vector store back from disk. */
  def load(path: java.nio.file.Path): StarmieIndex = {
    val in = new java.io.DataInputStream(new java.io.BufferedInputStream(
      new java.io.FileInputStream(path.toFile)))
    try {
      val n = in.readInt()
      val tables = Vector.fill(n) {
        val tid = in.readLong()
        val nCols = in.readInt()
        val cols = Array.fill(nCols)(Array.fill(Dim)(in.readFloat().toDouble))
        tid -> cols
      }
      StarmieIndex(tables)
    } finally in.close()
  }

  private def cosine(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  /** Rank lake tables by mean (over query columns) best-match cosine. */
  def query(idx: StarmieIndex, queryColumns: Seq[Seq[String]], k: Int): Seq[Scored] = {
    val qVecs = queryColumns.map(embedColumn)
    val scored = idx.tables.map { case (tid, cols) =>
      val score =
        if (cols.isEmpty) 0.0
        else qVecs.map(q => cols.map(c => cosine(q, c)).max).sum / qVecs.size
      Scored(tid, score)
    }
    val ranking = scored.sortBy(s => (-s.score, s.tableId))
    if (k > 0) ranking.take(k).toSeq else ranking.toSeq
  }

  def queryTable(idx: StarmieIndex, t: LakeTable, k: Int): Seq[Scored] =
    query(idx, t.columns.filterNot(_.isNumeric).map(_.values), k)
}
