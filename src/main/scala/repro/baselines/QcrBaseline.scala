package repro.baselines

import scala.collection.mutable
import scala.util.hashing.MurmurHash3

import repro.core.Scored
import repro.lake.Lake

/** Re-implementation of the sketch-based correlation index of Santos et al.
  * (ICDE'22) — the paper's correlation-search baseline.
  *
  * Offline, for every (categorical column, numerical column) pair of every
  * table it stores the h smallest hashes of the join value together with the
  * quadrant bit of the numerical value (>= column average). Online, the
  * query's (key, target) column pair is sketched the same way and matched
  * hash-by-hash; the QCR statistic over the matches estimates |Pearson|.
  *
  * Limitations faithfully kept from the original: join keys must be
  * categorical (numerical columns are never treated as keys), and the
  * sketch size h is fixed at index time.
  */
object QcrBaseline {

  final case class PairSketch(
      tableId: Long,
      catCol: Int,
      numCol: Int,
      hashes: Array[Int],
      quadrants: Array[Boolean],
  )

  final case class QcrIndex(sketches: Vector[PairSketch], h: Int)

  private def keyHash(v: String): Int = MurmurHash3.stringHash(v, 0x2545f491)

  /** First numerical value per distinct key, then quadrant vs. the mean of
    * those aggregated values; keep the h hash-smallest keys.
    */
  private def sketchPairs(keys: Seq[String], nums: Seq[Double], h: Int): (Array[Int], Array[Boolean]) = {
    val firstPerKey = mutable.LinkedHashMap.empty[String, Double]
    keys.iterator.zip(nums.iterator).foreach { case (k, v) =>
      if (!firstPerKey.contains(k)) firstPerKey(k) = v
    }
    if (firstPerKey.isEmpty) return (Array.empty, Array.empty)
    val mean = firstPerKey.values.sum / firstPerKey.size
    val entries = firstPerKey.toArray
      .map { case (k, v) => (keyHash(k), v >= mean) }
      .sortBy(_._1)
      .take(h)
    (entries.map(_._1), entries.map(_._2))
  }

  def build(lake: Lake, h: Int): QcrIndex = {
    val sketches = for {
      t <- lake.tables
      (cat, ci) <- t.columns.zipWithIndex if !cat.isNumeric
      (num, ni) <- t.columns.zipWithIndex if num.isNumeric
    } yield {
      val (hs, qs) = sketchPairs(cat.values, num.numeric.get, h)
      PairSketch(t.id, ci, ni, hs, qs)
    }
    QcrIndex(sketches.filter(_.hashes.nonEmpty), h)
  }

  /** Persist the sketch store — the baseline keeps packed sketches on disk. */
  def save(idx: QcrIndex, path: java.nio.file.Path): Long = {
    val out = new java.io.DataOutputStream(new java.io.FileOutputStream(path.toFile))
    try {
      out.writeInt(idx.h)
      out.writeInt(idx.sketches.size)
      idx.sketches.foreach { s =>
        out.writeLong(s.tableId); out.writeInt(s.catCol); out.writeInt(s.numCol)
        out.writeInt(s.hashes.length)
        s.hashes.indices.foreach { i =>
          out.writeInt(s.hashes(i)); out.writeBoolean(s.quadrants(i))
        }
      }
    } finally out.close()
    java.nio.file.Files.size(path)
  }

  /** Cold start: read the sketch store back from disk. */
  def load(path: java.nio.file.Path): QcrIndex = {
    val in = new java.io.DataInputStream(new java.io.BufferedInputStream(
      new java.io.FileInputStream(path.toFile)))
    try {
      val h = in.readInt()
      val n = in.readInt()
      val sketches = Vector.fill(n) {
        val tid = in.readLong(); val cc = in.readInt(); val nc = in.readInt()
        val len = in.readInt()
        val hs = Array.ofDim[Int](len)
        val qs = Array.ofDim[Boolean](len)
        (0 until len).foreach { i => hs(i) = in.readInt(); qs(i) = in.readBoolean() }
        PairSketch(tid, cc, nc, hs, qs)
      }
      QcrIndex(sketches, h)
    } finally in.close()
  }

  /** Top-k tables by estimated |correlation| with the query target. */
  def query(idx: QcrIndex, keys: Seq[String], targets: Seq[Double], k: Int, minSupport: Int = 3): Seq[Scored] = {
    val (qHashes, qQuads) = sketchPairs(keys, targets, idx.h)
    val qMap = qHashes.zip(qQuads).toMap

    val perTable = mutable.Map.empty[Long, Double]
    idx.sketches.foreach { s =>
      var n = 0
      var agree = 0
      var i = 0
      while (i < s.hashes.length) {
        qMap.get(s.hashes(i)) match {
          case Some(qq) =>
            n += 1
            if (qq == s.quadrants(i)) agree += 1
          case None => ()
        }
        i += 1
      }
      if (n >= minSupport) {
        val est = math.abs(2.0 * agree - n) / n
        val prev = perTable.getOrElse(s.tableId, -1.0)
        if (est > prev) perTable(s.tableId) = est
      }
    }
    val ranking = perTable.toSeq
      .map { case (tid, est) => Scored(tid, est) }
      .sortBy(s => (-s.score, s.tableId))
    if (k > 0) ranking.take(k) else ranking
  }
}
