package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.storage.StorageLevel
import repro.data.TweetGen
import repro.emd.{LocalEmd, TokenEmbedder}

/** EMD Globalizer — the paper's end-to-end batch pipeline (Fig. 2/3):
  *
  *   Local EMD → seed candidates (CTrie) → occurrence mining with local
  *   candidate embeddings → global pooling (CandidateBase) → Entity
  *   Classifier (α/β/γ) → final entity mentions.
  *
  * Timing attribution follows the paper's Table III: "Local EMD time" is
  * the per-sentence EMD pass (for deep systems this includes generating the
  * entity-aware token embeddings for every sentence token — the dominant
  * cost of a real DNN, which we charge explicitly); "Global EMD time" adds
  * the CTrie build, the mining scan, pooling, classification, and output
  * assembly, i.e. the framework's overhead.
  */
object Globalizer {

  final case class Timings(localSec: Double, globalOverheadSec: Double) {
    def totalSec: Double = localSec + globalOverheadSec
  }

  /** Everything a bench or test needs from one pipeline run. */
  final case class RunOutput(localDets: Dataset[Detection],
                             mentions: Dataset[MentionEmb],
                             scored: Seq[(CandidateRecord, Double)],
                             finalSpans: DataFrame,
                             localEval: EvalCounts,
                             globalEval: EvalCounts,
                             timings: Timings) {
    def labelOf(score: Double): Int = EntityClassifier.bandOf(score)
  }

  private def now(): Long = System.nanoTime()
  private def secs(from: Long, to: Long): Double = (to - from) / 1e9

  /** Local EMD phase. For deep systems, `chargeEmbeddingCost` additionally
    * materializes token embeddings for every token of the stream (what
    * TweetBase records in the paper); we reduce them to a checksum rather
    * than storing, since the mining phase recomputes deterministically.
    */
  def localPhase(tweets: Dataset[Tweet],
                 system: LocalEmd,
                 spec: TweetGen.Spec,
                 chargeEmbeddingCost: Boolean): Dataset[Detection] = {
    val spark = tweets.sparkSession
    import spark.implicits._
    val dets = system.detectAll(tweets, spec).persist(StorageLevel.MEMORY_AND_DISK)
    dets.count()
    if (system.deep && chargeEmbeddingCost) {
      val dim = system.dim
      val salt = system.params.salt
      val dsSeed = spec.seed
      // Force the full-stream embedding pass; the checksum defeats laziness.
      tweets.map { t =>
        var s = 0.0
        t.tokens.indices.foreach { p =>
          val e = TokenEmbedder.tokenEmbedding(dim, salt, dsSeed, t, p)
          s += e(0) + e(dim - 1)
        }
        s
      }.reduce(_ + _)
    }
    dets
  }

  /** Seed entity candidates: distinct case-insensitive keys of the local detections. */
  def seedKeys(dets: Dataset[Detection]): Seq[String] = {
    val spark = dets.sparkSession
    import spark.implicits._
    dets.map(_.key).distinct().collect().toSeq.sorted
  }

  /** Final output assembly from classifier bands:
    * α → all mined mentions of the candidate; γ → only Local EMD's own
    * detections of it; β → nothing.
    */
  def assembleOutput(mentions: Dataset[MentionEmb],
                     localDets: Dataset[Detection],
                     bands: Map[String, Int]): DataFrame = {
    val spark = mentions.sparkSession
    val alpha = spark.sparkContext.broadcast(
      bands.collect { case (k, EntityClassifier.Alpha) => k }.toSet)
    val gamma = spark.sparkContext.broadcast(
      bands.collect { case (k, EntityClassifier.Gamma) => k }.toSet)
    val alphaSpans = Metrics.mentionSpans(mentions.filter(m => alpha.value.contains(m.key)))
    val gammaSpans = Metrics.detectionSpans(localDets.filter(d => gamma.value.contains(d.key)))
    alphaSpans.union(gammaSpans).distinct()
  }

  /** One full pipeline run over a dataset with a trained classifier (and,
    * for deep systems, a trained Phrase Embedder).
    */
  def run(spark: SparkSession,
          spec: TweetGen.Spec,
          system: LocalEmd,
          clf: EntityClassifier,
          phraseEmbedder: Option[PhraseEmbedder],
          chargeEmbeddingCost: Boolean = true): RunOutput = {
    val tweets = TweetGen.generate(spark, spec).persist(StorageLevel.MEMORY_AND_DISK)
    tweets.count() // data loading, not attributed to either phase

    val t0 = now()
    val localDets = localPhase(tweets, system, spec, chargeEmbeddingCost)
    val t1 = now()

    val trie = spark.sparkContext.broadcast(CTrie.fromKeys(seedKeys(localDets)))
    val mentions = MentionExtractor
      .mine(tweets, trie, system, spec.seed, phraseEmbedder)
      .persist(StorageLevel.MEMORY_AND_DISK)
    mentions.count()
    val records = GlobalPooling.pool(mentions).collect().toSeq
    val scored = records.map(r => (r, clf.score(r)))
    val bands = scored.map { case (r, s) => r.key -> EntityClassifier.bandOf(s) }.toMap
    val finalSpans = assembleOutput(mentions, localDets, bands).cache()
    finalSpans.count()
    val t2 = now()

    val localEval  = Metrics.evaluate(Metrics.detectionSpans(localDets), tweets)
    val globalEval = Metrics.evaluate(finalSpans, tweets)

    RunOutput(localDets, mentions, scored, finalSpans, localEval, globalEval,
      Timings(secs(t0, t1), secs(t1, t2)))
  }
}
