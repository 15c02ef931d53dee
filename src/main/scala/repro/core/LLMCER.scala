package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.blocking.Blocking
import repro.embed.Embed
import repro.llm.{LLMConfig, SimulatedLLM}

/** End-to-end result of an ER run over a dataset. */
final case class ERResult(
    partition: Vector[Set[Long]],
    usage: Usage,
    setsPerLevel: Vector[Int],
    numBlocks: Int,
    blockThreshold: Double,
)

/** The LLM-CER Spark driver (Algorithm 4 at dataset scale), plus the
  * generic per-block execution harness shared with every baseline.
  *
  * Dataflow: blocking produces (id, block_id); records are co-grouped
  * by block with `groupByKey(...).mapGroups`, each group resolved by a
  * per-block function running in the executor task (the "LLM-based
  * clustering UDF per partition"); assignments and telemetry shuffle
  * back and are merged into the final partition.
  */
object LLMCER {

  /** Per-block resolution function: (blockId, records) -> BlockResult.
    * Must be serializable — it ships to executors.
    */
  type BlockFn = (Long, Vector[Record]) => BlockResult

  /** Serialized per-block outcome row (public: Catalyst codegen needs
    * accessible accessors).
    */
  final case class Outcome(
      block_id: Long, ids: Seq[Long], clusters: Seq[Int],
      apiCalls: Long, inTok: Long, outTok: Long, latMs: Double, levels: Seq[Int])

  /** Tune the blocking threshold on a labeled sample (§5.1). */
  def tunedThreshold(ds: Dataset[Record], strategy: Blocking.Strategy): Double = {
    val sample = ds.sort("id").limit(600).collect().toVector
    Blocking.tuneThreshold(sample, simOf(strategy))
  }

  private def simOf(strategy: Blocking.Strategy): (Record, Record) => Double =
    strategy match {
      case Blocking.LSH => (a, b) => a.cos(b)
      case _            => (a, b) => Embed.jaccard(a.text, b.text)
    }

  /** MDG coherence floor: the 5th percentile of same-entity pair
    * similarities on the validation sample. Catches merge-hallucination
    * residue (cross-entity co-clustering) while falsely splitting at
    * most ~5% of genuinely-same-entity placements.
    */
  def tunedFloor(ds: Dataset[Record], strategy: Blocking.Strategy): Double = {
    val sample = ds.sort("id").limit(600).collect().toVector
    val sim = simOf(strategy)
    val sameSims = (for {
      i <- sample.indices; j <- i + 1 until sample.size
      if sample(i).entityId == sample(j).entityId
    } yield sim(sample(i), sample(j))).sorted
    if (sameSims.isEmpty) 0.3
    else sameSims(math.max(0, (0.05 * sameSims.size).toInt))
  }

  /** Generic run: block, then resolve each block with `fn`. */
  def runWith(spark: SparkSession, ds: Dataset[Record], strategy: Blocking.Strategy,
              fn: BlockFn, btOverride: Option[Double] = None): ERResult = {
    import spark.implicits._
    val bt = btOverride.getOrElse(tunedThreshold(ds, strategy))
    val blocks = Blocking.block(spark, ds, strategy, bt)
      .toDF("rid", "block_id").as[(Long, Long)]

    val withBlock: Dataset[(Record, Long)] =
      ds.joinWith(blocks, ds("id") === blocks("rid"))
        .map { case (r, (_, bid)) => (r, bid) }

    val outcomes = withBlock
      .groupByKey(_._2)
      .mapGroups { (bid, iter) =>
        val recs = iter.map(_._1).toVector.sortBy(_.id)
        val res  = fn(bid, recs)
        val (ids, cls) = res.assignment.toSeq.sortBy(_._1).unzip
        Outcome(bid, ids, cls, res.usage.apiCalls, res.usage.inputTokens,
                res.usage.outputTokens, res.usage.latencyMs, res.setsPerLevel)
      }
      .collect()
      .toVector

    val partition = outcomes.flatMap { o =>
      o.ids.zip(o.clusters).groupBy(_._2).values.map(_.map(_._1).toSet)
    }
    val usage = outcomes.map(o => Usage(o.apiCalls, o.inTok, o.outTok, o.latMs))
      .foldLeft(Usage.zero)(_ + _)
    val maxLv = outcomes.map(_.levels.size).maxOption.getOrElse(0)
    val levels = Vector.tabulate(maxLv)(i =>
      outcomes.map(o => if (i < o.levels.size) o.levels(i) else 0).sum)
    ERResult(partition, usage, levels, outcomes.size, bt)
  }

  /** The paper's method: LLM-CER with NRS + MDG + CMR per block. */
  def run(spark: SparkSession, ds: Dataset[Record],
          strategy: Blocking.Strategy = Blocking.LSH,
          params: ERParams = ERParams.default,
          cfg: LLMConfig = LLMConfig.default,
          fewShot: Int = 0,
          btOverride: Option[Double] = None): ERResult = {
    val bt = btOverride.getOrElse(tunedThreshold(ds, strategy))
    // MDG's similarity function follows the block-creation method (§5.2);
    // its floor is validation-tuned (see tunedFloor).
    val p  = if (params.coherenceFloor > 0) params
             else params.copy(coherenceFloor = tunedFloor(ds, strategy))
    val fn: BlockFn = (bid, recs) =>
      BlockResolver.resolve(bid, recs, new SimulatedLLM(cfg), p, fewShot)
    runWith(spark, ds, strategy, fn, Some(bt))
  }
}
