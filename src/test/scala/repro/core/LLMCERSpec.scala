package repro.core

import repro.SparkSpec
import repro.blocking.Blocking
import repro.data.DatasetProfile
import repro.exp.Harness
import repro.llm.LLMConfig

class LLMCERSpec extends SparkSpec {

  private lazy val mini = DatasetProfile.mini(DatasetProfile.citeseer, 300)

  test("end-to-end LLM-CER partitions every record exactly once") {
    val ds  = repro.data.ERGen.records(spark, mini).cache()
    val res = LLMCER.run(spark, ds)
    assert(res.partition.map(_.size).sum == mini.numRecords)
    assert(res.partition.flatten.toSet.size == mini.numRecords)
    ds.unpersist()
  }

  test("end-to-end quality on an easy mini dataset clears a sane bar") {
    val row = Harness.run(spark, mini, Harness.MCer)
    assert(row.acc > 0.6, s"ACC too low: ${row.acc}")
    assert(row.fp > 0.6, s"FP too low: ${row.fp}")
    assert(row.apiCalls > 0 && row.costUsd > 0)
  }

  test("setsPerLevel decreases from level 0 and api calls equal their sum") {
    val ds  = repro.data.ERGen.records(spark, mini).cache()
    val res = LLMCER.run(spark, ds)
    assert(res.setsPerLevel.nonEmpty)
    assert(res.setsPerLevel.head == res.setsPerLevel.max)
    assert(res.usage.apiCalls == res.setsPerLevel.map(_.toLong).sum)
    ds.unpersist()
  }

  test("in-context clustering needs far fewer calls than pairwise (Table 2 shape)") {
    val cer  = Harness.run(spark, mini, Harness.MCer)
    val pair = Harness.run(spark, mini, Harness.MPair)
    assert(cer.apiCalls * 3 < pair.apiCalls,
      s"expected >=3x call reduction: cer=${cer.apiCalls} pair=${pair.apiCalls}")
    assert(cer.tokensM < pair.tokensM)
  }

  test("a perfect-oracle run with clean data achieves near-perfect FP") {
    val clean = mini.copy(typoRate = 0.0, dropRate = 0.0, missingRate = 0.0,
                          sharedNoise = 0.0, confusability = 0.0, name = "Clean")
    val oracleCfg = LLMConfig(hallBase = 0.0, mergeHallBase = 0.0,
                              giantMergeBase = 0.0, bias = 30.0)
    val row = Harness.run(spark, clean, Harness.MCer, Blocking.LSH,
                          ERParams(), oracleCfg)
    assert(row.fp > 0.90, s"clean-data FP: ${row.fp}") // blocking recall is the ceiling
  }

  test("MDG improves quality at small call overhead (Table 8 direction)") {
    val hard = DatasetProfile.mini(DatasetProfile.as, 400)
    val withMdg = Harness.run(spark, hard, Harness.MCer, Blocking.LSH, ERParams(useMDG = true))
    val without = Harness.run(spark, hard, Harness.MCer, Blocking.LSH, ERParams(useMDG = false))
    assert(withMdg.fp >= without.fp - 0.03,
      s"MDG should not hurt FP: with=${withMdg.fp} without=${without.fp}")
    assert(withMdg.apiCalls >= without.apiCalls)
  }

  test("tunedThreshold lies in the sweep range for every strategy") {
    val ds = repro.data.ERGen.records(spark, mini).cache()
    for (s <- Seq(Blocking.LSH, Blocking.Filter)) {
      val t = LLMCER.tunedThreshold(ds, s)
      assert(t >= 0.05 && t <= 0.95, s"$s: $t")
    }
    ds.unpersist()
  }

  test("tunedFloor sits below the typical same-entity similarity") {
    val ds = repro.data.ERGen.records(spark, mini).cache()
    val f  = LLMCER.tunedFloor(ds, Blocking.LSH)
    assert(f > 0.0 && f < 1.0)
    ds.unpersist()
  }

  test("baseline methods all produce full partitions on the mini dataset") {
    for (m <- Seq(Harness.MBooster, Harness.MBq, Harness.MCrowd)) {
      val row = Harness.run(spark, DatasetProfile.mini(DatasetProfile.citeseer, 150), m)
      assert(row.acc > 0.2, s"${m.name} ACC=${row.acc}")
      assert(row.apiCalls >= 0)
    }
  }

  test("LLM-CER beats or matches baselines on quality for the mini dataset (Table 4 direction)") {
    val p    = DatasetProfile.mini(DatasetProfile.citeseer, 250)
    val cer  = Harness.run(spark, p, Harness.MCer)
    val bq   = Harness.run(spark, p, Harness.MBq)
    assert(cer.fp >= bq.fp - 0.10, s"cer=${cer.fp} bq=${bq.fp}")
    assert(cer.apiCalls < bq.apiCalls)
  }
}
