package repro.data

/** Attribute kind, matching Table 1's T / N / C taxonomy. */
sealed trait AttrKind { def tag: String }
case object Textual     extends AttrKind { val tag = "T" }
case object Numeric     extends AttrKind { val tag = "N" }
case object Categorical extends AttrKind { val tag = "C" }

/** One attribute of a dataset's schema.
  *
  * @param words    number of vocabulary words in a textual value
  * @param noisy    whether this attribute suffers the domain's extraction
  *                 noise (e.g. Walmart-Amazon 'brand leaks into name')
  */
final case class AttrSpec(name: String, kind: AttrKind, words: Int = 3, noisy: Boolean = false)

/** Statistical profile of one of the paper's nine datasets (Table 1),
  * plus the noise knobs that reproduce its difficulty (DESIGN.md §2).
  *
  * @param typoRate     per-word probability of a character-level typo
  * @param dropRate     per-token probability of dropping the token
  * @param missingRate  per-attribute probability of a missing value
  * @param sharedNoise  probability of appending a cross-entity shared
  *                     noise token to a noisy attribute — raises
  *                     inter-entity similarity
  * @param confusability fraction of entities that are near-clones of an
  *                     earlier entity (share most attribute words, one
  *                     word changed) — the dominant difficulty dial,
  *                     modelling look-alike products/venues
  */
final case class DatasetProfile(
    name: String,
    domain: String,
    numRecords: Int,
    numEntities: Int,
    attrs: Vector[AttrSpec],
    typoRate: Double,
    dropRate: Double,
    missingRate: Double,
    sharedNoise: Double,
    confusability: Double,
    seed: Long,
) {
  def dispersion: Double = numRecords.toDouble / numEntities
  def attrCountsByKind: Map[String, Int] =
    attrs.groupBy(_.kind.tag).view.mapValues(_.size).toMap

  /** Keep only the first `n` attributes (always keeps the first, the
    * 'title'-like key attribute) — Tables 5/6's attribute-count axis. */
  def withAttrCount(n: Int): DatasetProfile =
    copy(attrs = attrs.take(math.max(1, n)), name = s"$name-A$n")

  /** Drop every attribute of `kind` except the leading key attribute —
    * Tables 5/7's attribute-type ablation axis. */
  def withoutKind(kind: AttrKind): DatasetProfile =
    copy(
      attrs = attrs.zipWithIndex.collect { case (a, i) if i == 0 || a.kind != kind => a },
      name = s"$name-no${kind.tag}")

  /** Rescale to `n` records keeping dispersion — scalability runs. */
  def scaledTo(n: Int): DatasetProfile =
    copy(numRecords = n,
         numEntities = math.max(1, math.round(n / dispersion).toInt),
         name = s"$name-$n")
}

/** The nine datasets of Table 1. Record/entity counts follow the paper
  * exactly; noise knobs are calibrated so the end-to-end difficulty
  * ordering matches the paper's (Cora/Citeseer easy, AS/Walmart-Amazon
  * hard — see EXPERIMENTS.md).
  */
object DatasetProfile {
  private def t(n: String, w: Int = 3, noisy: Boolean = false) = AttrSpec(n, Textual, w, noisy)
  private def num(n: String)                                   = AttrSpec(n, Numeric)
  private def c(n: String)                                     = AttrSpec(n, Categorical)

  val alaska = DatasetProfile(
    "Alaska", "Product", 12000, 1480,
    Vector(t("title", 5), t("brand", 1), t("model", 2), t("type", 2), t("screen", 2),
           t("cpu", 2), t("ram", 1), t("hdd", 1), t("desc", 6)),
    typoRate = 0.06, dropRate = 0.10, missingRate = 0.12, sharedNoise = 0.10, confusability = 0.30, seed = 11)

  val as = DatasetProfile(
    "AS", "Geo", 2260, 330,
    Vector(t("name", 6, noisy = true)),
    typoRate = 0.12, dropRate = 0.18, missingRate = 0.0, sharedNoise = 0.22, confusability = 0.40, seed = 12)

  val song = DatasetProfile(
    "Song", "Music", 4850, 1190,
    Vector(t("title", 4), t("artist", 2), t("album", 3), t("composer", 2),
           num("duration"), num("year"), num("track")),
    typoRate = 0.07, dropRate = 0.10, missingRate = 0.10, sharedNoise = 0.12, confusability = 0.28, seed = 13)

  val music20k = DatasetProfile(
    "Music", "Music", 19300, 10000,
    Vector(t("title", 4), t("artist", 2), t("album", 3), t("label", 2),
           num("year"), c("genre")),
    typoRate = 0.08, dropRate = 0.12, missingRate = 0.10, sharedNoise = 0.12, confusability = 0.30, seed = 14)

  val dblpGoogle = DatasetProfile(
    "DG", "Citation", 7630, 2350,
    Vector(t("title", 6), t("authors", 4), t("venue", 2), num("year")),
    typoRate = 0.05, dropRate = 0.08, missingRate = 0.08, sharedNoise = 0.06, confusability = 0.18, seed = 15)

  val cora = DatasetProfile(
    "Cora", "Citation", 1290, 110,
    Vector(t("title", 6), t("authors", 4), t("venue", 3), t("publisher", 2),
           t("editor", 2), t("institution", 2), t("address", 2), t("note", 2),
           t("month", 1), t("pages", 1), t("volume", 1), t("year", 1)),
    typoRate = 0.04, dropRate = 0.07, missingRate = 0.10, sharedNoise = 0.03, confusability = 0.06, seed = 16)

  val citeseer = DatasetProfile(
    "Citeseer", "Citation", 9130, 2490,
    Vector(t("title", 6), t("authors", 4), t("venue", 2), t("abstract", 6),
           num("year"), c("field")),
    typoRate = 0.04, dropRate = 0.06, missingRate = 0.06, sharedNoise = 0.04, confusability = 0.10, seed = 17)

  val amazonGoogle = DatasetProfile(
    "AG", "Software", 2160, 990,
    Vector(t("title", 5, noisy = true), t("manufacturer", 1), num("price")),
    typoRate = 0.09, dropRate = 0.14, missingRate = 0.12, sharedNoise = 0.16, confusability = 0.38, seed = 18)

  val walmartAmazon = DatasetProfile(
    "WA", "Electronics", 1810, 850,
    Vector(t("name", 5, noisy = true), t("brand", 1, noisy = true),
           t("desc", 6, noisy = true), num("price"), c("category")),
    typoRate = 0.10, dropRate = 0.15, missingRate = 0.14, sharedNoise = 0.24, confusability = 0.50, seed = 19)

  val all: Vector[DatasetProfile] =
    Vector(alaska, as, song, music20k, dblpGoogle, cora, citeseer, amazonGoogle, walmartAmazon)

  def byName(n: String): DatasetProfile = all.find(_.name == n).getOrElse(
    throw new IllegalArgumentException(s"unknown dataset $n (have ${all.map(_.name)})"))

  /** Miniature profile for unit tests: same noise character, tiny size. */
  def mini(base: DatasetProfile, records: Int = 120): DatasetProfile =
    base.scaledTo(records)
}
