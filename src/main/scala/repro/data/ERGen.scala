package repro.data

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.core.Record
import repro.embed.Embed

/** Deterministic dirty-ER dataset generator.
  *
  * For a [[DatasetProfile]] it materialises `numRecords` records over
  * `numEntities` hidden entities as a Spark Dataset: per-entity clean
  * attribute values are drawn from a synthetic vocabulary, then each
  * duplicate record perturbs them with the profile's noise knobs
  * (typos, token drops, missing values, cross-entity shared noise).
  * Everything is keyed off (profile.seed, entityId, recordId), so the
  * same profile always yields byte-identical data on driver and
  * executors.
  */
object ERGen {

  /** A generated record row; `attrs` aligns with `profile.attrs`. */
  final case class Row(id: Long, entity_id: Long, attrs: Seq[String], text: String)

  private val Syllables = Vector(
    "ka", "ro", "mi", "ta", "lu", "ven", "dor", "sel", "pra", "zen",
    "qui", "mar", "bel", "tos", "gan", "fir", "nol", "hex", "dra", "pol")

  /** Pseudo-word `i` of the global vocabulary. */
  def word(i: Int): String = {
    var x = math.abs(i)
    val sb = new StringBuilder
    var k = 0
    while (k < 3) { sb.append(Syllables(x % Syllables.size)); x = x / Syllables.size + 7; k += 1 }
    sb.toString
  }

  /** Shared cross-entity noise tokens (a small pool so they collide). */
  private def noiseWord(i: Int): String = "nx" + word(1000 + math.floorMod(i, 25))

  private val Categories = Vector("alpha", "beta", "gamma", "delta", "epsilon",
                                  "zeta", "eta", "theta")

  /** Entity sizes with mean ≈ dispersion, geometric-shaped, summing to
    * exactly `numRecords` and each ≥ 1.
    */
  def entitySizes(p: DatasetProfile): Array[Int] = {
    val rnd   = new scala.util.Random(p.seed * 7919 + 1)
    val mean  = p.dispersion
    val geomP = math.min(0.95, 1.0 / math.max(1.0, mean))
    val sizes = Array.fill(p.numEntities) {
      var k = 1
      while (rnd.nextDouble() > geomP && k < mean * 6) k += 1
      k
    }
    // Rebalance to hit the exact record count deterministically.
    var diff = p.numRecords - sizes.sum
    var i = 0
    while (diff != 0) {
      val j = i % p.numEntities
      if (diff > 0) { sizes(j) += 1; diff -= 1 }
      else if (sizes(j) > 1) { sizes(j) -= 1; diff += 1 }
      i += 1
    }
    sizes
  }

  /** Base (non-clone) value of attribute `ai` for entity `e`. */
  private def baseValue(p: DatasetProfile, e: Long, ai: Int): String = {
    val a   = p.attrs(ai)
    val rnd = new scala.util.Random(p.seed * 31 + e * 131 + ai * 17)
    a.kind match {
      case Textual =>
        // Large vocabulary: distinct entities rarely share words by chance;
        // inter-entity similarity comes from confusability, not collisions.
        val vocab = math.max(3000, p.numEntities * 20)
        (0 until a.words).map(_ => word(rnd.nextInt(vocab))).mkString(" ")
      case Numeric =>
        (rnd.nextInt(900) + 100).toString
      case Categorical =>
        Categories(rnd.nextInt(Categories.size))
    }
  }

  /** Is entity `e` a near-clone, and of which earlier entity? */
  private def cloneParent(p: DatasetProfile, e: Long): Option[Long] = {
    if (e == 0) return None
    val rnd = new scala.util.Random(p.seed * 101 + e * 211 + 3)
    if (rnd.nextDouble() < p.confusability)
      Some(e - 1 - rnd.nextInt(math.min(e, 7L).toInt))
    else None
  }

  /** Clean value of attribute `ai` for entity `e`: a near-clone entity
    * copies ALL of its parent's values, with exactly one word changed in
    * one designated textual attribute (look-alike products/venues — the
    * difficulty driver; think "iPhone 13" vs "iPhone 14").
    */
  private def cleanValue(p: DatasetProfile, e: Long, ai: Int): String =
    cloneParent(p, e) match {
      case Some(parent) =>
        val textuals = p.attrs.indices.filter(i => p.attrs(i).kind == Textual)
        // Same designated attribute for every ai of this entity.
        val rndE    = new scala.util.Random(p.seed * 101 + e * 211 + 7)
        val mutAttr = if (textuals.isEmpty) -1 else textuals(rndE.nextInt(textuals.size))
        if (ai == mutAttr) {
          val rnd   = new scala.util.Random(p.seed * 101 + e * 211 + ai * 53 + 9)
          val words = baseValue(p, parent, ai).split(" ").toVector
          val vocab = math.max(3000, p.numEntities * 20)
          val idx   = rnd.nextInt(words.size)
          words.updated(idx, word(rnd.nextInt(vocab))).mkString(" ")
        } else baseValue(p, parent, ai)
      case _ => baseValue(p, e, ai)
    }

  private def typo(w: String, rnd: scala.util.Random): String =
    if (w.length < 3) w
    else rnd.nextInt(3) match {
      case 0 => val i = rnd.nextInt(w.length - 1); w.substring(0, i) + w(i + 1) + w(i) + w.substring(i + 2) // swap
      case 1 => val i = rnd.nextInt(w.length);     w.substring(0, i) + w.substring(math.min(i + 1, w.length)) // drop
      case _ => w.substring(0, math.max(2, w.length - 2)) // truncate/abbreviate
    }

  /** Perturbed value of attribute `ai` for record `rid` of entity `e`. */
  private def dirtyValue(p: DatasetProfile, e: Long, rid: Long, ai: Int): String = {
    val a   = p.attrs(ai)
    val rnd = new scala.util.Random(p.seed * 83 + rid * 257 + ai * 41 + 5)
    if (rnd.nextDouble() < p.missingRate) return ""
    val base = cleanValue(p, e, ai)
    a.kind match {
      case Textual =>
        val kept = base.split(" ").iterator.filter(_ => rnd.nextDouble() >= p.dropRate)
          .map(w => if (rnd.nextDouble() < p.typoRate) typo(w, rnd) else w)
          .toVector
        val withNoise =
          if (a.noisy && rnd.nextDouble() < p.sharedNoise)
            kept :+ noiseWord(rnd.nextInt(1000))
          else kept
        if (withNoise.isEmpty) base.split(" ").head else withNoise.mkString(" ")
      case Numeric =>
        if (rnd.nextDouble() < 0.2) (base.toInt + rnd.nextInt(5) - 2).toString else base
      case Categorical =>
        if (rnd.nextDouble() < 0.08) Categories(rnd.nextInt(Categories.size)) else base
    }
  }

  /** One record row, fully deterministic in (profile, rid, e). */
  def makeRow(p: DatasetProfile, rid: Long, e: Long): Row = {
    val attrs = p.attrs.indices.map(ai => dirtyValue(p, e, rid, ai))
    val text  = p.attrs.indices
      .map(ai => s"${p.attrs(ai).name}: ${attrs(ai)}")
      .mkString(" | ")
    Row(rid, e, attrs, text)
  }

  /** Generate the dataset as a DataFrame(id, entity_id, attrs, text). */
  def generate(spark: SparkSession, p: DatasetProfile): DataFrame = {
    import spark.implicits._
    val sizes = entitySizes(p)
    // recordIdx -> entityId via prefix sums, broadcast to executors.
    val prefix = sizes.scanLeft(0)(_ + _)
    val bcPrefix = spark.sparkContext.broadcast(prefix)
    val bcP      = spark.sparkContext.broadcast(p)
    spark.range(p.numRecords).map { rid =>
      val pre = bcPrefix.value
      // Binary search: the entity whose [pre(e), pre(e+1)) contains rid.
      var lo = 0; var hi = pre.length - 2
      while (lo < hi) {
        val mid = (lo + hi + 1) / 2
        if (pre(mid) <= rid) lo = mid else hi = mid - 1
      }
      makeRow(bcP.value, rid, lo.toLong)
    }.toDF()
  }

  /** Same data as a Dataset[Record] (with embeddings) for the pipeline. */
  def records(spark: SparkSession, p: DatasetProfile): Dataset[Record] = {
    import spark.implicits._
    generate(spark, p).as[Row].map(r =>
      Record(r.id, r.entity_id, r.text, Embed.embed(r.attrs.mkString(" | "))))
  }

  /** Driver-side variant for unit tests and local sweeps. */
  def recordsLocal(p: DatasetProfile): Vector[Record] = {
    val sizes  = entitySizes(p)
    val rows   = Vector.newBuilder[Record]
    var rid = 0L
    var e   = 0
    while (e < sizes.length) {
      var k = 0
      while (k < sizes(e)) {
        val row = makeRow(p, rid, e.toLong)
        rows += Record(row.id, row.entity_id, row.text,
                       Embed.embed(row.attrs.mkString(" | ")))
        rid += 1; k += 1
      }
      e += 1
    }
    rows.result()
  }
}
