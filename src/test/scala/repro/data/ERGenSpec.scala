package repro.data

import org.scalatest.funsuite.AnyFunSuite

class ERGenSpec extends AnyFunSuite {

  private val mini = DatasetProfile.mini(DatasetProfile.cora, 120)

  // --- profiles reproduce Table 1 ------------------------------------------
  test("all nine paper datasets are profiled") {
    assert(DatasetProfile.all.map(_.name).toSet ==
      Set("Alaska", "AS", "Song", "Music", "DG", "Cora", "Citeseer", "AG", "WA"))
  }
  test("record/entity counts match Table 1") {
    val p = DatasetProfile.all.map(p => p.name -> (p.numRecords, p.numEntities)).toMap
    assert(p("Alaska") == (12000, 1480))
    assert(p("AS") == (2260, 330))
    assert(p("Song") == (4850, 1190))
    assert(p("Music") == (19300, 10000))
    assert(p("DG") == (7630, 2350))
    assert(p("Cora") == (1290, 110))
    assert(p("Citeseer") == (9130, 2490))
    assert(p("AG") == (2160, 990))
    assert(p("WA") == (1810, 850))
  }
  test("entity dispersion Ed matches Table 1's approximations") {
    assert(math.round(DatasetProfile.alaska.dispersion) == 8)
    assert(math.round(DatasetProfile.as.dispersion) == 7)
    assert(math.round(DatasetProfile.cora.dispersion) == 12)
    assert(math.round(DatasetProfile.music20k.dispersion) == 2)
  }
  test("attribute counts per record match Table 1") {
    assert(DatasetProfile.alaska.attrs.size == 9)
    assert(DatasetProfile.cora.attrs.size == 12)
    assert(DatasetProfile.song.attrs.size == 7)
    assert(DatasetProfile.walmartAmazon.attrs.size == 5)
  }
  test("attribute type mixes match Table 1") {
    assert(DatasetProfile.alaska.attrCountsByKind == Map("T" -> 9))
    assert(DatasetProfile.song.attrCountsByKind == Map("T" -> 4, "N" -> 3))
    assert(DatasetProfile.citeseer.attrCountsByKind == Map("T" -> 4, "N" -> 1, "C" -> 1))
    assert(DatasetProfile.walmartAmazon.attrCountsByKind == Map("T" -> 3, "N" -> 1, "C" -> 1))
  }

  // --- profile transforms --------------------------------------------------
  test("withAttrCount keeps the first n attributes") {
    val p = DatasetProfile.cora.withAttrCount(4)
    assert(p.attrs.size == 4)
    assert(p.attrs.head.name == "title")
  }
  test("withoutKind drops a type but keeps the key attribute") {
    val p = DatasetProfile.walmartAmazon.withoutKind(Textual)
    assert(p.attrs.head.name == "name") // key attribute survives
    assert(p.attrs.tail.forall(_.kind != Textual))
  }
  test("scaledTo preserves dispersion approximately") {
    val p = DatasetProfile.alaska.scaledTo(1200)
    assert(p.numRecords == 1200)
    assert(math.abs(p.dispersion - DatasetProfile.alaska.dispersion) < 0.5)
  }

  // --- entity sizes --------------------------------------------------------
  test("entitySizes sums to numRecords with every entity nonempty") {
    DatasetProfile.all.foreach { p =>
      val sizes = ERGen.entitySizes(p)
      assert(sizes.sum == p.numRecords, p.name)
      assert(sizes.forall(_ >= 1), p.name)
      assert(sizes.length == p.numEntities, p.name)
    }
  }
  test("entitySizes is deterministic") {
    assert(ERGen.entitySizes(mini).toSeq == ERGen.entitySizes(mini).toSeq)
  }

  // --- record generation ---------------------------------------------------
  test("recordsLocal generates the exact record count with dense ids") {
    val recs = ERGen.recordsLocal(mini)
    assert(recs.size == mini.numRecords)
    assert(recs.map(_.id).toSet == (0L until mini.numRecords).toSet)
  }
  test("recordsLocal is deterministic") {
    val a = ERGen.recordsLocal(mini)
    val b = ERGen.recordsLocal(mini)
    assert(a.map(_.text) == b.map(_.text))
  }
  test("records of the same entity are textually closer than random pairs") {
    val recs  = ERGen.recordsLocal(DatasetProfile.mini(DatasetProfile.citeseer, 300))
    val byEnt = recs.groupBy(_.entityId).values.filter(_.size >= 2).toVector
    val intra = byEnt.flatMap(e => e.combinations(2).map { case Seq(a, b) => a.cos(b) })
    val inter = (for (i <- 0 until 100) yield {
      val a = recs(i); val b = recs(recs.size - 1 - i)
      if (a.entityId != b.entityId) Some(a.cos(b)) else None
    }).flatten
    assert(intra.sum / intra.size > inter.sum / inter.size + 0.15)
  }
  test("record text contains every attribute name") {
    val row = ERGen.makeRow(mini, 0L, 0L)
    mini.attrs.foreach(a => assert(row.text.contains(a.name + ":")))
  }
  test("word generator is total and deterministic") {
    assert(ERGen.word(42) == ERGen.word(42))
    assert(ERGen.word(0).nonEmpty)
    assert(ERGen.word(Int.MaxValue).nonEmpty)
  }
  test("confusability plants near-clone entity pairs") {
    // Isolate the knob on an otherwise-clean profile: count entities with
    // a near-identical (cos > 0.8) neighbour among the previous 7.
    def nearCloneFrac(conf: Double): Double = {
      val p = DatasetProfile.song.copy(typoRate = 0.0, dropRate = 0.0,
        missingRate = 0.0, sharedNoise = 0.0, confusability = conf,
        name = s"SongC$conf").scaledTo(400)
      val ents = ERGen.recordsLocal(p)
        .groupBy(_.entityId).values.map(_.head).toVector.sortBy(_.entityId)
      val hits = ents.indices.drop(7).count { i =>
        ((i - 7) until i).exists(j => ents(i).cos(ents(j)) > 0.8)
      }
      hits.toDouble / (ents.size - 7)
    }
    assert(nearCloneFrac(0.9) > nearCloneFrac(0.0) + 0.2,
      s"clone fraction: ${nearCloneFrac(0.9)} vs ${nearCloneFrac(0.0)}")
  }
  test("higher missingRate yields more empty attribute values") {
    def emptyFrac(p: DatasetProfile): Double = {
      val rows = (0L until 200L).map(rid => ERGen.makeRow(p, rid, rid % 20))
      rows.flatMap(_.attrs).count(_.isEmpty).toDouble / (200 * p.attrs.size)
    }
    val clean = DatasetProfile.cora.copy(missingRate = 0.0)
    val dirty = DatasetProfile.cora.copy(missingRate = 0.4, seed = DatasetProfile.cora.seed)
    assert(emptyFrac(dirty) > emptyFrac(clean) + 0.2)
  }
}
