package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Metrics, Record}
import repro.data.{DatasetProfile, ERGen}
import repro.llm.{LLMConfig, SimulatedLLM}

class BaselinesSpec extends AnyFunSuite {

  private val recs = ERGen.recordsLocal(DatasetProfile.mini(DatasetProfile.citeseer, 300))
  private val oracleCfg = LLMConfig(hallBase = 0.0, mergeHallBase = 0.0,
                                    giantMergeBase = 0.0, bias = 30.0, pairBias = 30.0)

  private def blockOf(nEnts: Int, per: Int): Vector[Record] =
    recs.groupBy(_.entityId).values.filter(_.size >= per).take(nEnts)
      .flatMap(_.take(per)).toVector

  private def fpOf(assignment: Map[Long, Int], block: Vector[Record]): Double = {
    val pred  = assignment.groupBy(_._2).values.map(_.keys.toSet).toVector
    Metrics.fpMeasure(pred, Metrics.truthOf(block.map(r => (r.id, r.entityId))))
  }

  // --- Pairwise ------------------------------------------------------------
  test("pairwise with a perfect oracle recovers the exact partition") {
    val block = blockOf(4, 4)
    val res = Pairwise.resolveBlock(0, block, new SimulatedLLM(oracleCfg))
    assert(fpOf(res.assignment, block) == 1.0)
  }
  test("pairwise exploits transitivity: fewer calls than all pairs") {
    val block = blockOf(3, 5) // 15 records, 105 pairs
    val llm = new SimulatedLLM(oracleCfg)
    Pairwise.resolveBlock(0, block, llm)
    assert(llm.usage.apiCalls < 105)
  }
  test("pairwise assigns every record") {
    val block = blockOf(4, 3)
    val res = Pairwise.resolveBlock(0, block, new SimulatedLLM())
    assert(res.assignment.keys.toVector.sorted == block.map(_.id).sorted)
  }
  test("pairwise on a trivial block makes no calls") {
    val llm = new SimulatedLLM()
    val res = Pairwise.resolveBlock(0, recs.take(1), llm)
    assert(llm.usage.apiCalls == 0 && res.assignment.size == 1)
  }

  // --- BQ ------------------------------------------------------------------
  test("BQ batches pairwise questions: far fewer calls than pairs asked") {
    val block = blockOf(3, 4)
    val llm = new SimulatedLLM(oracleCfg)
    BQ.resolveBlock(0, block, llm)
    val pairsAnswered = llm.usage.outputTokens / 5 // 5 output tokens per pair
    assert(llm.usage.apiCalls <= pairsAnswered / 2 + 1)
  }
  test("BQ with a perfect oracle recovers the exact partition") {
    val block = blockOf(4, 3)
    val res = BQ.resolveBlock(0, block, new SimulatedLLM(oracleCfg))
    assert(fpOf(res.assignment, block) == 1.0)
  }
  test("BQ accounts a fixed annotation cost") {
    assert(BQ.AnnotationUsd == 0.64)
  }

  // --- Booster -------------------------------------------------------------
  test("Booster outputs one of its candidate partitions covering all records") {
    val block = blockOf(4, 4)
    val res = Booster.resolveBlock(0, block, new SimulatedLLM())
    assert(res.assignment.keys.toVector.sorted == block.map(_.id).sorted)
  }
  test("Booster with a perfect oracle picks a good candidate") {
    val block = blockOf(4, 4)
    val res = Booster.resolveBlock(0, block, new SimulatedLLM(oracleCfg))
    assert(fpOf(res.assignment, block) > 0.6)
  }
  test("Booster stays within its question budget") {
    val block = blockOf(5, 4)
    val llm = new SimulatedLLM()
    Booster.resolveBlock(0, block, llm)
    assert(llm.usage.apiCalls <= Booster.budget(block.size))
  }

  // --- CrowdER+LLM ---------------------------------------------------------
  test("CrowdER set cover touches every uncertain pair") {
    val block = blockOf(3, 3)
    val uncertain = (for {
      i <- block.indices; j <- i + 1 until block.size
      if block(i).cos(block(j)) >= 0.3
    } yield (block(i).id, block(j).id))
      .map { case (a, b) => if (a < b) (a, b) else (b, a) }.toVector
    val sets = CrowdER.buildSets(block, uncertain, setSize = 5)
    uncertain.foreach { case (a, b) =>
      assert(sets.exists(s => s.exists(_.id == a) && s.exists(_.id == b)),
        s"pair ($a,$b) not covered")
    }
  }

  test("CrowdER with a perfect oracle merges via transitive closure") {
    val block = blockOf(4, 3)
    val res = CrowdER.resolveBlock(0, block, new SimulatedLLM(oracleCfg), 9, 0.4)
    assert(fpOf(res.assignment, block) >= 0.9)
  }
  test("CrowdER uses more sets than LLM-CER's hierarchical approach on the same block") {
    val block = blockOf(6, 5)
    val crowdLlm = new SimulatedLLM(oracleCfg)
    CrowdER.resolveBlock(0, block, crowdLlm, 9, 0.3)
    val cerLlm = new SimulatedLLM(oracleCfg)
    repro.core.BlockResolver.resolve(0, block, cerLlm,
      repro.core.ERParams(coherenceFloor = 0.5))
    assert(crowdLlm.usage.apiCalls >= cerLlm.usage.apiCalls)
  }
}
