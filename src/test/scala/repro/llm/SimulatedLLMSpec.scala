package repro.llm

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Metrics, Record}
import repro.data.{DatasetProfile, ERGen}

class SimulatedLLMSpec extends AnyFunSuite {

  private def recsOf(p: DatasetProfile, n: Int): Vector[Record] =
    ERGen.recordsLocal(p.scaledTo(n))

  private val cora = recsOf(DatasetProfile.cora, 240)

  private def pickSet(recs: Vector[Record], nEnt: Int, perEnt: Int): Vector[Record] = {
    val ents = recs.groupBy(_.entityId).values.filter(_.size >= perEnt).take(nEnt)
    ents.flatMap(_.take(perEnt)).toVector
  }

  test("clusterSet returns a partition of exactly the input records") {
    val llm = new SimulatedLLM()
    val set = pickSet(cora, 3, 3)
    val out = llm.clusterSet(set)
    assert(out.records.map(_.id).sorted == set.map(_.id).sorted)
    assert(out.clusters.forall(_.nonEmpty))
  }

  test("identical prompts give identical answers (temperature 0)") {
    val set = pickSet(cora, 3, 3)
    val a = new SimulatedLLM().clusterSet(set)
    val b = new SimulatedLLM().clusterSet(set)
    assert(a.clusters.map(_.map(_.id)) == b.clusters.map(_.map(_.id)))
  }

  test("different record order is a different prompt (may differ, always valid)") {
    val set = pickSet(cora, 3, 3)
    val out = new SimulatedLLM().clusterSet(set.reverse)
    assert(out.records.map(_.id).sorted == set.map(_.id).sorted)
  }

  test("usage meters calls, tokens, cost and latency") {
    val llm = new SimulatedLLM()
    assert(llm.usage.apiCalls == 0)
    llm.clusterSet(pickSet(cora, 2, 2))
    val u1 = llm.usage
    assert(u1.apiCalls == 1 && u1.inputTokens > 0 && u1.outputTokens > 0)
    assert(u1.costUsd > 0 && u1.latencyMs > 0)
    llm.matchPair(cora(0), cora(1))
    assert(llm.usage.apiCalls == 2)
    assert(llm.usage.inputTokens > u1.inputTokens)
  }

  test("batchMatch answers every pair in one API call") {
    val llm   = new SimulatedLLM()
    val pairs = Vector((cora(0), cora(1)), (cora(2), cora(3)), (cora(4), cora(5)))
    val ans   = llm.batchMatch(pairs)
    assert(ans.size == 3)
    assert(llm.usage.apiCalls == 1)
  }

  test("pairwise matching is mostly right on clearly same / clearly different pairs") {
    val llm   = new SimulatedLLM()
    val byEnt  = cora.groupBy(_.entityId).values.filter(_.size >= 2).toVector
    val sameN  = byEnt.size
    val sameOk = byEnt.count { e =>
      llm.matchPair(e(0), e(1)) // true-pair: should usually answer true
    }
    assert(sameOk.toDouble / sameN >= 0.7, s"same-entity accuracy too low: $sameOk/$sameN")
    val heads  = byEnt.map(_.head)
    val diffN  = heads.size - 1
    val diffOk = (0 until diffN).count(i => !llm.matchPair(heads(i), heads(i + 1)))
    assert(diffOk.toDouble / diffN >= 0.6, s"diff-entity accuracy too low: $diffOk/$diffN")
  }

  /** Mean per-set FP over sampled sets with the given size. */
  private def quality(recs: Vector[Record], ss: Int, nSets: Int = 60,
                      cfg: LLMConfig = LLMConfig.default,
                      shuffleOrder: Boolean = false): Double = {
    val llm  = new SimulatedLLM(cfg)
    val rnd  = new scala.util.Random(5)
    val ents = recs.groupBy(_.entityId).values.filter(_.size >= 2).toVector
    val scores = (0 until nSets).map { _ =>
      val chosen = rnd.shuffle(ents).take(math.max(2, ss / 2))
      var set    = chosen.flatMap(e => e.take(2)).take(ss).toVector
      if (shuffleOrder) set = rnd.shuffle(set)
      val pred  = new SimulatedLLM(cfg).clusterSet(set).clusters.map(_.map(_.id).toSet)
      Metrics.fpMeasure(pred, Metrics.truthOf(set.map(r => (r.id, r.entityId))))
    }
    scores.sum / scores.size
  }

  test("clustering quality degrades beyond the set-size onset (Figure 4 shape)") {
    assert(quality(cora, 8) > quality(cora, 16) + 0.05)
  }

  test("sequential ordering beats random ordering (Figure 5 shape)") {
    assert(quality(cora, 8) >= quality(cora, 8, shuffleOrder = true) - 0.02)
  }

  test("few-shot demonstrations reduce errors (Appendix A.7 shape)") {
    val hard = recsOf(DatasetProfile.walmartAmazon, 300)
    val llm0 = new SimulatedLLM(); val llm4 = new SimulatedLLM()
    val ents = hard.groupBy(_.entityId).values.filter(_.size >= 2).toVector.take(50)
    def fpAt(fs: Int): Double = {
      val scores = ents.sliding(4, 4).map { g =>
        val set  = g.flatMap(_.take(2)).toVector
        val pred = new SimulatedLLM().clusterSet(set, fs).clusters.map(_.map(_.id).toSet)
        Metrics.fpMeasure(pred, Metrics.truthOf(set.map(r => (r.id, r.entityId))))
      }.toVector
      scores.sum / scores.size
    }
    assert(fpAt(4) >= fpAt(0) - 0.02)
  }

  test("a no-hallucination, no-confusion configuration is a perfect oracle") {
    val cfg = LLMConfig(hallBase = 0.0, mergeHallBase = 0.0, giantMergeBase = 0.0,
                        bias = 30.0) // confusion logit never fires
    val set = pickSet(cora, 3, 3)
    val out = new SimulatedLLM(cfg).clusterSet(set)
    val pred  = out.clusters.map(_.map(_.id).toSet)
    val truth = Metrics.truthOf(set.map(r => (r.id, r.entityId)))
    assert(Metrics.fpMeasure(pred, truth) == 1.0)
  }

  test("clusterSet rejects an empty record set") {
    intercept[IllegalArgumentException] { new SimulatedLLM().clusterSet(Vector.empty) }
  }
}
