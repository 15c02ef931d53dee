package repro.core

/** Algorithm 3 — hierarchical Cluster Merge.
  *
  * Between hierarchy levels, each LLM-output cluster is replaced by a
  * representative "new record" (the member closest to the cluster's
  * mean embedding). Representatives are packed into next-round record
  * sets by similarity chaining: up to `Sd` chains of up to `ceil(Ss/Sd)`
  * mutually compatible clusters, never packing two clusters already
  * known to be different entities (anti-transitivity — clusters that
  * were co-input to the LLM before and left unmerged).
  */
object CMR {

  /** A cluster in the merge hierarchy.
    *
    * @param id      stable id within the block's resolution
    * @param lineage ids of all ancestor clusters (for separation checks)
    */
  final case class HCluster(id: Long, members: Vector[Record], lineage: Set[Long]) {
    /** Representative record: member closest to the mean embedding. */
    lazy val rep: Record =
      if (members.size == 1) members.head
      else {
        val dim = members.head.vec.length
        val cen = new Array[Float](dim)
        members.foreach { r => var d = 0; while (d < dim) { cen(d) += r.vec(d); d += 1 } }
        val norm = math.sqrt(cen.map(x => x.toDouble * x).sum)
        if (norm > 0) { var d = 0; while (d < dim) { cen(d) = (cen(d) / norm).toFloat; d += 1 } }
        members.maxBy(r => repro.embed.Embed.cosine(r.vec, cen))
      }
  }

  /** Tracks which cluster lineages are known to be different entities. */
  final class Separations {
    private val pairs = scala.collection.mutable.Set.empty[(Long, Long)]
    private def key(a: Long, b: Long): (Long, Long) = if (a < b) (a, b) else (b, a)
    def add(a: HCluster, b: HCluster): Unit = pairs += key(a.id, b.id)
    def separated(a: HCluster, b: HCluster): Boolean =
      a.lineage.exists(x => b.lineage.exists(y => pairs.contains(key(x, y))))
    def size: Int = pairs.size
  }

  private def sim(a: HCluster, b: HCluster): Double = a.rep.cos(b.rep)

  /** Build the next round's record sets (of clusters). Clusters that
    * cannot be packed with any compatible partner are returned as
    * leftovers (no LLM call needed for them this round).
    */
  def nextRoundSets(
      clusters: Vector[HCluster],
      sep: Separations,
      p: ERParams,
  ): (Vector[Vector[HCluster]], Vector[HCluster]) = {
    val chainLen = math.max(1, math.ceil(p.setSize.toDouble / p.setDiversity).toInt)
    val unsel    = scala.collection.mutable.LinkedHashSet(clusters.sortBy(_.id): _*)
    val sets     = Vector.newBuilder[Vector[HCluster]]
    val left     = Vector.newBuilder[HCluster]

    while (unsel.nonEmpty) {
      val set = scala.collection.mutable.ArrayBuffer.empty[HCluster]
      var j = 0
      var exhausted = false
      while (j < p.setDiversity && set.size < p.setSize && !exhausted) {
        // Seed of chain j: first unselected cluster compatible with the set so far.
        unsel.find(c => set.forall(s => !sep.separated(s, c))) match {
          case None => exhausted = true
          case Some(seed) =>
            unsel -= seed
            set += seed
            var cur   = seed
            var grown = 1
            var stop  = false
            while (grown < chainLen && set.size < p.setSize && !stop) {
              val candidates = unsel.filter(c => set.forall(s => !sep.separated(s, c)))
              if (candidates.isEmpty) stop = true
              else {
                val nxt = candidates.maxBy(c => (sim(cur, c), -c.id))
                unsel -= nxt
                set += nxt
                cur = nxt
                grown += 1
              }
            }
        }
        j += 1
      }
      if (set.size >= 2) sets += set.toVector
      else if (set.size == 1) left += set.head
    }
    (sets.result(), left.result())
  }

  /** Apply one LLM answer over a set of representatives: co-clustered
    * representatives merge their clusters; every unmerged co-input pair
    * becomes a recorded separation. Returns the set's merged clusters.
    */
  def applyAnswer(
      inputSet: Vector[HCluster],
      repClusters: Clustering,
      sep: Separations,
      nextId: () => Long,
      suspects: Set[Long] = Set.empty,
  ): Vector[HCluster] = {
    val byRep = inputSet.map(c => c.rep.id -> c).toMap
    val groups: Vector[Vector[HCluster]] =
      repClusters.clusters.map(_.flatMap(r => byRep.get(r.id)))
        .filter(_.nonEmpty)
    // Record anti-transitivity between the groups of this answer —
    // skipping suspect groups (guardrail-discarded placements carry no
    // separation evidence).
    def isSuspect(g: Vector[HCluster]) =
      g.size == 1 && suspects(g.head.rep.id)
    for {
      i <- groups.indices; j <- groups.indices if i < j
      if !isSuspect(groups(i)) && !isSuspect(groups(j))
      a <- groups(i); b <- groups(j)
    } sep.add(a, b)
    groups.map { g =>
      if (g.size == 1) g.head
      else {
        val id = nextId()
        HCluster(id, g.flatMap(_.members), g.flatMap(_.lineage).toSet + id)
      }
    }
  }
}
