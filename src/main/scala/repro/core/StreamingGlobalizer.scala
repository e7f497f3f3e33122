package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.data.TweetGen
import repro.emd.LocalEmd

import scala.collection.mutable

/** Streaming execution of EMD Globalizer (paper Sec. III: "continuous
  * execution of a tweet stream over multiple iterations", each iteration a
  * batch of incoming tweets).
  *
  * State held across micro-batches (the incremental CandidateBase):
  *   - the set of discovered candidate keys (backing the CTrie),
  *   - per-candidate running (count, sum) pools, merged batch by batch —
  *     the "incrementally updated global embedding" of Sec. V.
  *
  * `processBatch` is the single iteration used both by the driver-side
  * batch loop and by the Structured Streaming `foreachBatch` sink in
  * [[StreamingGlobalizer.runStream]]: windowed occurrence mining over the
  * current micro-batch against the cumulative CTrie, followed by
  * classification of all candidates under their updated global embeddings.
  */
object StreamingGlobalizer {

  /** Mutable cross-batch state (driver-held; candidate counts are small). */
  final class State {
    val keys: mutable.Set[String] = mutable.Set.empty
    val pools: mutable.Map[String, GlobalPooling.Pool] = mutable.Map.empty

    def records: Seq[CandidateRecord] =
      pools.toSeq.map { case (k, p) => CandidateRecord(k, p.count, p.mean) }

    def mergeBatchPools(batch: Seq[(String, GlobalPooling.Pool)]): Unit =
      batch.foreach { case (k, p) =>
        pools.update(k, pools.getOrElse(k, GlobalPooling.Pool.empty).merge(p))
      }
  }

  /** One framework iteration over a micro-batch; returns the batch's final
    * entity-mention spans (tweetId, sentId, start, len).
    */
  def processBatch(batch: Dataset[Tweet],
                   spec: TweetGen.Spec,
                   system: LocalEmd,
                   clf: EntityClassifier,
                   phraseEmbedder: Option[PhraseEmbedder],
                   state: State): DataFrame = {
    val spark = batch.sparkSession
    import spark.implicits._

    // (1) Local EMD on the batch; register new seed candidates.
    val localDets = Globalizer.localPhase(batch, system, spec, chargeEmbeddingCost = false)
    state.keys ++= Globalizer.seedKeys(localDets)

    // (2) Occurrence mining of the batch against the cumulative CTrie.
    val trie = spark.sparkContext.broadcast(CTrie.fromKeys(state.keys))
    val mentions = MentionExtractor.mine(batch, trie, system, spec.seed, phraseEmbedder).cache()
    mentions.count()

    // (3) Incremental global embeddings: merge the batch's partial pools.
    val batchPools = mentions
      .groupByKey(_.key)
      .agg(new GlobalPooling.PoolAgg().toColumn.name("pool"))
      .collect()
      .toSeq
    state.mergeBatchPools(batchPools)

    // (4) Classify every candidate under its updated global embedding and
    //     emit this batch's mentions.
    val bands = state.records.map(r => r.key -> EntityClassifier.bandOf(clf.score(r))).toMap
    val out = Globalizer.assembleOutput(mentions, localDets, bands).cache()
    out.count()
    mentions.unpersist()
    localDets.unpersist()
    out
  }

  /** Drive a whole dataset through the framework in `nBatches` sequential
    * micro-batches (driver loop; used by tests and the streaming bench).
    * Returns the union of per-batch outputs and the final state.
    */
  def runBatched(spark: SparkSession,
                 spec: TweetGen.Spec,
                 system: LocalEmd,
                 clf: EntityClassifier,
                 phraseEmbedder: Option[PhraseEmbedder],
                 nBatches: Int): (DataFrame, State) = {
    import spark.implicits._
    val state = new State
    val per = math.ceil(spec.nTweets.toDouble / nBatches).toInt
    val outs = (0 until nBatches).map { b =>
      val lo = b.toLong * per
      val hi = math.min(spec.nTweets.toLong, lo + per)
      val batch = spark.range(lo, hi).as[Long].map(id => TweetGen.makeTweet(spec, id))
      processBatch(batch, spec, system, clf, phraseEmbedder, state)
    }
    (outs.reduce(_ union _).distinct(), state)
  }

  /** Structured Streaming execution: consume a stream of tweets (any
    * source), run one framework iteration per micro-batch via foreachBatch,
    * append outputs to `collector`.
    */
  def runStream(tweetStream: Dataset[Tweet],
                spec: TweetGen.Spec,
                system: LocalEmd,
                clf: EntityClassifier,
                phraseEmbedder: Option[PhraseEmbedder],
                state: State,
                collector: (Long, DataFrame) => Unit): org.apache.spark.sql.streaming.StreamingQuery = {
    tweetStream.writeStream
      .outputMode("append")
      .foreachBatch { (batch: Dataset[Tweet], batchId: Long) =>
        if (!batch.isEmpty) {
          val out = processBatch(batch, spec, system, clf, phraseEmbedder, state)
          collector(batchId, out)
        }
      }
      .start()
  }
}
