package repro.exp

import repro.core.{Clustering, Metrics, Record}
import repro.data.{DatasetProfile, ERGen}
import repro.llm.{LLMConfig, SimulatedLLM}

/** The §4.2 key-factor machinery: construct individual record sets with
  * controlled (Ss, Sd, Sv, ordering), query the simulated LLM, and score
  * each answer against the set's own ground truth. Powers the optimal
  * Ss/Sd finders behind Tables 5, 9 and 11.
  */
object Sweeps {

  sealed trait Ordering
  case object Sequential extends Ordering
  case object RandomOrd  extends Ordering

  sealed trait VarLevel { def range: (Double, Double) }
  case object Balanced    extends VarLevel { val range = (0.0, 0.3) }  // Sv < 0.3
  case object RelBalanced extends VarLevel { val range = (0.3, 0.7) }
  case object Unbalanced  extends VarLevel { val range = (0.7, 9.9) }  // Sv > 0.7

  /** Cluster-size compositions of `ss` records over `sd` entities whose
    * coefficient of variation falls in the requested band.
    */
  def compositions(ss: Int, sd: Int, lvl: VarLevel): Vector[Vector[Int]] = {
    def gen(rem: Int, parts: Int, min: Int): Vector[Vector[Int]] =
      if (parts == 1) { if (rem >= min) Vector(Vector(rem)) else Vector.empty }
      else (min to rem - (parts - 1)).toVector.flatMap(h => gen(rem - h, parts - 1, h).map(h +: _))
    val (lo, hi) = lvl.range
    gen(ss, sd, 1).filter { sizes =>
      val v = Metrics.variation(sizes)
      v >= lo && v < hi
    }
  }

  /** Draw up to `n` record sets with the requested factors from a
    * dataset's records. The set's entities are a random seed entity
    * plus its *most similar* neighbours — record sets in the real
    * pipeline come from blocks, which co-locate look-alike entities.
    * Deterministic in `seed`.
    */
  def sampleSets(recs: Vector[Record], ss: Int, sd: Int, lvl: VarLevel,
                 ord: Ordering, n: Int, seed: Long): Vector[Vector[Record]] = {
    val rnd      = new scala.util.Random(seed)
    val byEntity = recs.groupBy(_.entityId).values.toVector.sortBy(_.head.id)
    val comps    = compositions(ss, sd, lvl)
    if (comps.isEmpty) return Vector.empty
    val reps = byEntity.map(_.head) // cheap per-entity representative
    val out = Vector.newBuilder[Vector[Record]]
    var tries = 0
    var made  = 0
    while (made < n && tries < n * 20) {
      tries += 1
      val sizes = comps(rnd.nextInt(comps.size))
      // A seed entity plus its nearest eligible neighbours.
      val eligibleIdx = byEntity.indices.filter(i => byEntity(i).size >= sizes.min)
      if (eligibleIdx.size >= sd) {
        val seedI   = eligibleIdx(rnd.nextInt(eligibleIdx.size))
        val ordered = seedI +: eligibleIdx.filter(_ != seedI)
          .sortBy(i => -reps(seedI).cos(reps(i)))
        val chosen = scala.collection.mutable.ArrayBuffer.empty[Vector[Record]]
        var si = 0
        ordered.foreach { ei =>
          val ent = byEntity(ei)
          if (si < sizes.size && ent.size >= sizes(si)) {
            chosen += rnd.shuffle(ent).take(sizes(si)).toVector
            si += 1
          }
        }
        if (si == sizes.size) {
          val grouped = chosen.toVector
          val set = ord match {
            case Sequential => grouped.flatten
            case RandomOrd  => rnd.shuffle(grouped.flatten)
          }
          out += set
          made += 1
        }
      }
    }
    out.result()
  }

  /** Mean FP-measure (and ACC) of the simulated LLM over `n` record sets
    * with the given factors.
    */
  private val recsCache =
    scala.collection.concurrent.TrieMap.empty[String, Vector[repro.core.Record]]
  private def cachedRecords(p: DatasetProfile): Vector[repro.core.Record] =
    recsCache.getOrElseUpdate(s"${p.name}|${p.numRecords}|${p.attrs.map(_.name).mkString(",")}",
                              ERGen.recordsLocal(p))

  def setQuality(profile: DatasetProfile, ss: Int, sd: Int, lvl: VarLevel, ord: Ordering,
                 cfg: LLMConfig = LLMConfig.default, n: Int = 200,
                 seed: Long = 7L): (Double, Double) = {
    val recs = cachedRecords(profile)
    val sets = sampleSets(recs, ss, sd, lvl, ord, n, seed)
    if (sets.isEmpty) return (Double.NaN, Double.NaN)
    val llm = new SimulatedLLM(cfg)
    val scores = sets.map { set =>
      val ans: Clustering = llm.clusterSet(set)
      val pred  = ans.clusters.map(_.map(_.id).toSet)
      val truth = Metrics.truthOf(set.map(r => (r.id, r.entityId)))
      (Metrics.fpMeasure(pred, truth), Metrics.acc(pred, truth))
    }
    (scores.map(_._1).sum / scores.size, scores.map(_._2).sum / scores.size)
  }

  /** Optimal key-factor finder (Table 5/9's protocol): the optimal Ss is
    * the *largest* size whose balanced-set FP is within `tol` of the
    * best (bigger sets mean fewer API calls — §4.2's conclusion); the
    * optimal Sd is the diversity with the best FP at that size.
    */
  def optimalFactors(profile: DatasetProfile, cfg: LLMConfig = LLMConfig.default,
                     ssRange: Range = 4 to 13, sdRange: Range = 2 to 6,
                     n: Int = 120, tol: Double = 0.03): (Int, Int) = {
    val fpBySs = ssRange.map { ss =>
      val sd = math.max(2, math.min(4, ss / 2))
      ss -> setQuality(profile, ss, sd, Balanced, Sequential, cfg, n)._1
    }.filterNot(_._2.isNaN)
    val bestFp = fpBySs.map(_._2).max
    val optSs  = fpBySs.filter(_._2 >= bestFp - tol).map(_._1).max
    val fpBySd = sdRange.filter(sd => optSs / sd >= 1).map { sd =>
      sd -> setQuality(profile, optSs, sd, Balanced, Sequential, cfg, n)._1
    }.filterNot(_._2.isNaN)
    val optSd = fpBySd.maxBy { case (sd, fp) => (fp, -sd) }._1
    (optSs, optSd)
  }
}
