package repro.core

import repro.llm.LLMClient

/** Algorithm 4's per-block loop: NRS record sets → LLM in-context
  * clustering (with MDG + regeneration) → hierarchical CMR merging,
  * until anti-transitivity stops all merging. Runs entirely inside one
  * Spark task per block (blocks are small), returning local cluster
  * assignments and telemetry.
  */
object BlockResolver {

  /** Result of the guardrail loop: the accepted clustering, the number
    * of LLM calls spent, and the *suspect* records — persistently
    * flagged records whose placement was discarded (split to singletons)
    * rather than trusted. Suspects carry no anti-transitivity: their
    * merge decision is deferred to later hierarchy levels, not denied.
    */
  final case class Guarded(result: Clustering, calls: Int, suspects: Set[Long])

  /** Cluster one record set with the guardrail loop of §5.2: reject
    * unacceptable answers, regenerate the (reordered) set, retry up to
    * `maxRegens` times, keep the best (fewest-flags) draw, and discard
    * the placement of any record still flagged.
    */
  def clusterWithGuardrail(set: Vector[Record], llm: LLMClient, p: ERParams,
                           fewShot: Int = 0): Guarded = {
    var order  = set
    var result = llm.clusterSet(order, fewShot)
    var best   = result
    var bestFlags = if (p.useMDG) MDG.misclustered(result, p.coherenceFloor).size else 0
    var calls  = 1
    var tries  = 0
    while (p.useMDG && tries < p.maxRegens && bestFlags > 0) {
      order = MDG.regenerate(result, p.coherenceFloor)
      result = llm.clusterSet(order, fewShot)
      calls += 1
      tries += 1
      val flags = MDG.misclustered(result, p.coherenceFloor).size
      if (flags < bestFlags) { best = result; bestFlags = flags }
    }
    result = best
    if (p.useMDG && bestFlags > 0) {
      // Final fallback: every draw was rejected — keep the best one, but
      // discard (split, and mark suspect) only the members that are
      // incoherent in absolute terms: the residue of merge
      // hallucinations. Borderline relative flags are trusted — on dirty
      // data the LLM outranks the embedding signal there. A discarded
      // placement is neither a merge nor a separation; later hierarchy
      // levels get to decide it afresh.
      val bad = MDG.floorIncoherent(result, p.coherenceFloor).map(_.id).toSet
      if (bad.nonEmpty) {
        val kept  = result.clusters.map(_.filterNot(r => bad(r.id))).filter(_.nonEmpty)
        val split = result.records.filter(r => bad(r.id)).map(Vector(_))
        return Guarded(Clustering(kept ++ split), calls, bad)
      }
    }
    Guarded(result, calls, Set.empty)
  }

  /** Resolve one block end-to-end. */
  def resolve(blockId: Long, block: Vector[Record], llm: LLMClient, p: ERParams,
              fewShot: Int = 0): BlockResult = {
    val before = llm.usage
    if (block.size <= 1) {
      return BlockResult(blockId, block.map(_.id -> 0).toMap, Usage.zero, Vector.empty)
    }

    var idCounter = 0L
    def nextId(): Long = { idCounter += 1; idCounter }

    val sep          = new CMR.Separations
    val setsPerLevel = Vector.newBuilder[Int]

    // ---- Level 0: NRS record sets over the raw records ----
    val level0Sets = NRS.allSets(block, p)
    var level0Calls = 0
    var clusters: Vector[CMR.HCluster] = level0Sets.flatMap { set =>
      val g = clusterWithGuardrail(set, llm, p, fewShot)
      level0Calls += g.calls
      val hcs = g.result.clusters.map { members =>
        val id = nextId()
        CMR.HCluster(id, members, Set(id))
      }
      // Anti-transitivity between the distinct clusters of one answer —
      // except suspect singletons, whose placement was discarded.
      def suspect(c: CMR.HCluster) = c.members.size == 1 && g.suspects(c.members.head.id)
      for {
        i <- hcs.indices; j <- hcs.indices if i < j
        if !suspect(hcs(i)) && !suspect(hcs(j))
      } sep.add(hcs(i), hcs(j))
      hcs
    }
    setsPerLevel += level0Calls

    // ---- Hierarchical merging levels ----
    var level    = 0
    var progress = true
    val maxLevels = 5 // paper's deepest hierarchy (Table 3: Alaska, level 5)
    while (progress && level < maxLevels && clusters.size > 1) {
      level += 1
      val (sets, leftovers) = CMR.nextRoundSets(clusters, sep, p)
      if (sets.isEmpty) { progress = false }
      else {
        var calls   = 0
        var merges  = 0
        val merged  = Vector.newBuilder[CMR.HCluster]
        sets.foreach { inputSet =>
          val reps = inputSet.map(_.rep)
          val g = clusterWithGuardrail(reps, llm, p, fewShot)
          calls += g.calls
          val out = CMR.applyAnswer(inputSet, g.result, sep, () => nextId(), g.suspects)
          if (out.size < inputSet.size) merges += inputSet.size - out.size
          merged ++= out
        }
        setsPerLevel += calls
        clusters = merged.result() ++ leftovers
        if (merges == 0) progress = false // exit condition: only singletons emerged
      }
    }

    val assignment = clusters.zipWithIndex.flatMap {
      case (c, i) => c.members.map(_.id -> i)
    }.toMap
    // Defensive: every input record must be assigned exactly once.
    require(assignment.size == block.size,
      s"block $blockId: ${assignment.size} assignments for ${block.size} records")

    val after = llm.usage
    BlockResult(blockId, assignment,
      Usage(after.apiCalls - before.apiCalls,
            after.inputTokens - before.inputTokens,
            after.outputTokens - before.outputTokens,
            after.latencyMs - before.latencyMs),
      setsPerLevel.result())
  }
}
