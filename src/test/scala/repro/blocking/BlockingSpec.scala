package repro.blocking

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.Record
import repro.data.{DatasetProfile, ERGen}
import repro.embed.Embed

class BlockingSpec extends SparkSpec {

  private lazy val mini = DatasetProfile.mini(DatasetProfile.citeseer, 250)
  private lazy val ds   = {
    import spark.implicits._
    ERGen.records(spark, mini).cache()
  }
  private lazy val local = ERGen.recordsLocal(mini)

  test("Spark and local generators agree record-for-record") {
    val fromSpark = ds.collect().sortBy(_.id).toVector
    assert(fromSpark.map(_.text) == local.map(_.text))
    assert(fromSpark.map(_.entityId) == local.map(_.entityId))
  }

  test("LSH candidates have high recall on same-entity pairs") {
    val cands = Blocking.lshCandidates(spark, ds).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    val entOf = local.map(r => r.id -> r.entityId).toMap
    val truePairs = for {
      i <- local.indices; j <- i + 1 until local.size
      if local(i).entityId == local(j).entityId
    } yield (local(i).id, local(j).id)
    val found = truePairs.count { case (a, b) =>
      cands.contains((a, b)) || cands.contains((b, a)) }
    assert(found.toDouble / truePairs.size > 0.7,
      s"LSH recall ${found.toDouble / truePairs.size}")
    assert(entOf.nonEmpty)
  }

  test("LSH candidate sims equal the direct cosine (DuckDB-checked count)") {
    val cands = Blocking.lshCandidates(spark, ds)
    val byId  = local.map(r => r.id -> r).toMap
    cands.limit(50).collect().foreach { row =>
      val expect = byId(row.getLong(0)).cos(byId(row.getLong(1)))
      assert(math.abs(row.getDouble(2) - expect) < 1e-6)
    }
    // Oracle-check the aggregation path: candidate count per left record.
    import spark.implicits._
    val agg = cands.groupBy($"id_a").agg(count(lit(1)).as("n_cand"))
      .select($"id_a".cast("string").as("id_a"), $"n_cand")
    repro.Oracle.assertEquivalent(
      agg,
      "SELECT id_a, COUNT(*) AS n_cand FROM cand GROUP BY id_a",
      "cand" -> cands.select($"id_a".cast("string").as("id_a"),
                             $"id_b".cast("string").as("id_b")))
  }

  test("filter candidates find every Jaccard>=bt pair (prefix completeness)") {
    val bt = 0.5
    val cands = Blocking.filterCandidates(spark, ds, bt)
      .where(col("sim") >= bt).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    // Brute force reference on a subsample.
    val sub = local.take(80)
    for (i <- sub.indices; j <- i + 1 until sub.size) {
      if (Embed.jaccard(sub(i).text, sub(j).text) >= bt) {
        val p = (sub(i).id, sub(j).id)
        assert(cands.contains(p), s"missing pair $p")
      }
    }
  }

  test("canopy respects bs >= ms and produces scored candidates") {
    intercept[IllegalArgumentException] {
      Blocking.canopyCandidates(spark, ds, bs = 0.3, ms = 0.5)
    }
    val c = Blocking.canopyCandidates(spark, ds, bs = 0.6, ms = 0.3)
    assert(c.columns.toSet == Set("id_a", "id_b", "sim", "cheap"))
    assert(c.count() > 0)
  }

  test("components forms connected components with singleton fallback") {
    val comp = Blocking.components(Seq(1L, 2L, 3L, 4L, 5L), Seq((1L, 2L), (2L, 3L)))
    assert(comp(1L) == comp(2L) && comp(2L) == comp(3L))
    assert(comp(4L) != comp(1L) && comp(4L) != comp(5L))
  }
  test("components uses the smallest member id as block id") {
    val comp = Blocking.components(Seq(7L, 3L, 9L), Seq((7L, 9L)))
    assert(comp(7L) == 7L && comp(9L) == 7L && comp(3L) == 3L)
  }

  test("block covers every record exactly once for each strategy") {
    for (strategy <- Seq(Blocking.LSH, Blocking.NoBlocking)) {
      val blocks = Blocking.block(spark, ds, strategy, bt = 0.5).collect()
      assert(blocks.length == mini.numRecords, strategy.name)
      assert(blocks.map(_.getLong(0)).distinct.length == mini.numRecords, strategy.name)
    }
  }
  test("NoBlocking puts everything in one block") {
    val blocks = Blocking.block(spark, ds, Blocking.NoBlocking, 0.5)
    assert(blocks.select("block_id").distinct().count() == 1)
  }

  test("tuneThreshold returns a threshold in (0,1) maximising pair F2") {
    val t = Blocking.tuneThreshold(local.take(120), (a, b) => a.cos(b))
    assert(t >= 0.05 && t <= 0.95)
  }
  test("tuneThreshold splits clearly separated similarity distributions") {
    // Synthetic: same-entity pairs sim ~0.9, different ~0.1.
    val recs = (0 until 40).map { i =>
      val ent = i / 2
      val txt = if (i % 2 == 0) s"entity $ent common words here"
                else s"entity $ent common words there"
      Record(i.toLong, ent.toLong, txt, Embed.embed(txt))
    }.toVector
    val t = Blocking.tuneThreshold(recs, (a, b) => a.cos(b))
    val same = recs(0).cos(recs(1)); val diff = recs(0).cos(recs(2))
    assert(t <= same && t > math.min(0.05, diff - 1))
  }
}
