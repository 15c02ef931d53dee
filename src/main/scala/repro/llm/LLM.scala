package repro.llm

import repro.core.{Clustering, Record, Usage}

/** Client interface to an in-context-clustering-capable LLM.
  *
  * This is exactly the surface an API client of gpt-4o-mini sees:
  * prompts in, (possibly wrong) structured answers out, plus metered
  * tokens/cost/latency. Implementations accumulate usage internally;
  * callers read [[usage]] at the end of a run.
  */
trait LLMClient {

  /** One in-context clustering call (Figure 3's prompt): partition the
    * record set, in its given order, into entity clusters.
    *
    * @param fewShot number of few-shot demonstrations included in the
    *                prompt (0 = zero-shot, the paper's default)
    */
  def clusterSet(set: Vector[Record], fewShot: Int = 0): Clustering

  /** One pairwise matching call (Figure 2's prompt): same entity or not. */
  def matchPair(a: Record, b: Record, fewShot: Int = 0): Boolean

  /** Batched pairwise questions in a single prompt (the BQ baseline):
    * answers for each pair, one API call.
    */
  def batchMatch(pairs: Vector[(Record, Record)], fewShot: Int = 0): Vector[Boolean]

  /** Cumulative usage since construction. */
  def usage: Usage
}

/** Tunable constants of the simulated LLM's error model (DESIGN.md §3).
  *
  * The defaults are calibrated so per-record-set quality curves have the
  * shapes of the paper's Figures 4/5 and end-to-end numbers land near
  * Tables 2/4/8 (see EXPERIMENTS.md).
  */
final case class LLMConfig(
    seed: Long = 42L,
    /** weight of per-record ambiguity (inter − intra similarity) */
    ambWeight: Double = 4.2,
    /** extra logit per record beyond the set-size onset */
    sizeWeight: Double = 0.45,
    /** weight of the set's ground-truth coefficient of variation */
    variationWeight: Double = 0.55,
    /** penalty for a record not adjacent to any same-entity neighbour */
    orderWeight: Double = 0.9,
    /** mild V-shaped penalty around the optimal diversity of 4 */
    diversityWeight: Double = 0.22,
    /** base logit offset — drives the overall confusion-error level */
    bias: Double = 2.1,
    /** per-record probability of a hallucinated (similarity-uncorrelated)
      * misassignment — the error mode MDG is designed to catch
      */
    hallBase: Double = 0.025,
    /** hallucination growth per record beyond the set-size onset */
    hallSizeSlope: Double = 0.5,
    /** per-call probability of wrongly merging two whole output clusters
      * — the high-damage hallucination mode; cascades through the merge
      * hierarchy unless a guardrail rejects it
      */
    mergeHallBase: Double = 0.16,
    /** per-call probability of the degenerate "everything is one entity"
      * answer — rare but catastrophic without a guardrail
      */
    giantMergeBase: Double = 0.10,
    /** set-size comfort limit for clean data; shrinks with ambiguity */
    baseOnset: Double = 9.0,
    /** how fast mean set ambiguity pulls the onset down */
    onsetSlope: Double = 9.0,
    /** logit reduction per few-shot demonstration (saturating) */
    fewShotGain: Double = 0.18,
    /** fraction of erring records moved to a wrong cluster (rest split) */
    moveFraction: Double = 0.75,
    /** pairwise decision boundary on cosine similarity */
    pairBoundary: Double = 0.62,
    pairAmbWeight: Double = 5.0,
    pairBias: Double = 2.6,
    /** prompt-token model */
    instructionTokens: Long = 110,
    perRecordOverheadTokens: Long = 6,
    outputTokensPerRecord: Long = 4,
    /** simulated latency: base + per-token, milliseconds */
    latencyBaseMs: Double = 250.0,
    latencyPerTokenMs: Double = 2.0,
)

object LLMConfig { val default: LLMConfig = LLMConfig() }
