package repro.baselines

import repro.core._
import repro.llm.LLMClient

/** Pairwise matching baseline (Ss = 2) with transitivity and
  * anti-transitivity, as in [54] — the comparator of Table 2.
  *
  * Candidate pairs of a block are asked most-similar-first; a pair whose
  * relation is already implied (same union-find component, or a recorded
  * separation between the two components) is skipped. A guardrail
  * re-asks a pair once when the answer contradicts the similarity signal
  * (the paper applies its guardrail to pairwise too, §6.2.1).
  */
object Pairwise {

  /** Is (a, b) separated by anti-transitivity? `sep` holds record-id
    * pairs asserted different; components make it transitive.
    */
  private def isSeparated(uf: UnionFind, sep: Set[(Long, Long)], a: Long, b: Long): Boolean = {
    val ra = uf.find(a); val rb = uf.find(b)
    sep.exists { case (x, y) =>
      (uf.find(x) == ra && uf.find(y) == rb) || (uf.find(x) == rb && uf.find(y) == ra)
    }
  }

  def resolveBlock(blockId: Long, block: Vector[Record], llm: LLMClient,
                   useGuardrail: Boolean = true): BlockResult = {
    val before = llm.usage
    val uf  = new UnionFind(block.map(_.id))
    var sep = Set.empty[(Long, Long)]
    val pairs = (for {
      i <- block.indices; j <- i + 1 until block.size
    } yield (block(i), block(j))).sortBy { case (a, b) => -a.cos(b) }

    pairs.foreach { case (a, b) =>
      if (!uf.connected(a.id, b.id) && !isSeparated(uf, sep, a.id, b.id)) {
        var ans = llm.matchPair(a, b)
        if (useGuardrail) {
          // Guardrail: answer at odds with the similarity signal — re-ask
          // with the pair order flipped (a fresh prompt).
          val sim = a.cos(b)
          val suspicious = (ans && sim < 0.35) || (!ans && sim > 0.9)
          if (suspicious) ans = llm.matchPair(b, a)
        }
        if (ans) uf.union(a.id, b.id)
        else sep += ((a.id, b.id))
      }
    }

    val assignment = assignmentOf(uf, block)
    val after = llm.usage
    BlockResult(blockId, assignment, diff(before, after), Vector.empty)
  }

  private[baselines] def assignmentOf(uf: UnionFind, block: Vector[Record]): Map[Long, Int] = {
    val roots = block.map(r => uf.find(r.id)).distinct.sorted.zipWithIndex.toMap
    block.map(r => r.id -> roots(uf.find(r.id))).toMap
  }

  private[baselines] def diff(before: Usage, after: Usage): Usage =
    Usage(after.apiCalls - before.apiCalls, after.inputTokens - before.inputTokens,
          after.outputTokens - before.outputTokens, after.latencyMs - before.latencyMs)
}
