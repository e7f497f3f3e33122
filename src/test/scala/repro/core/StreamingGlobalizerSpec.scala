package repro.core

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.{SparkSpec, TestFixtures}
import repro.data.TweetGen
import repro.emd.Aguilar

import scala.collection.mutable

class StreamingGlobalizerSpec extends SparkSpec {

  private val spec = TweetGen.DevStream
  private lazy val trained = TestFixtures.trained(spark, Aguilar)

  private def spans(df: org.apache.spark.sql.DataFrame): Set[(Long, Int, Int)] =
    df.collect().map(r => (r.getLong(0), r.getInt(2), r.getInt(3))).toSet

  test("a single micro-batch equals the batch pipeline output") {
    val batchRun = Globalizer.run(spark, spec, Aguilar, trained.classifier,
      trained.phraseEmbedder, chargeEmbeddingCost = false)
    val (streamOut, _) = StreamingGlobalizer.runBatched(
      spark, spec, Aguilar, trained.classifier, trained.phraseEmbedder, nBatches = 1)
    assert(spans(streamOut) == spans(batchRun.finalSpans))
  }

  test("multi-batch state accumulates every batch's candidates") {
    import spark.implicits._
    val (_, state) = StreamingGlobalizer.runBatched(
      spark, spec, Aguilar, trained.classifier, trained.phraseEmbedder, nBatches = 4)
    val tweets = TweetGen.generate(spark, spec)
    val allKeys = Aguilar.detectAll(tweets, spec).map(_.key).distinct().collect().toSet
    assert(state.keys.toSet == allKeys)
  }

  test("final-state pools equal batch pools for token-disjoint candidates known from batch 1") {
    // Pooling is incremental, BUT the longest-match scan makes pools
    // path-dependent for candidates that overlap or prefix other candidates
    // discovered later (a longer candidate steals the span once registered).
    // For candidates sharing no token with any other candidate, streaming
    // and batch pools must be identical.
    val (_, state2) = StreamingGlobalizer.runBatched(
      spark, spec, Aguilar, trained.classifier, trained.phraseEmbedder, nBatches = 2)
    val batchRun = Globalizer.run(spark, spec, Aguilar, trained.classifier,
      trained.phraseEmbedder, chargeEmbeddingCost = false)
    val batchPools = batchRun.scored.map { case (r, _) => r.key -> r }.toMap

    // Keys discovered in batch 1 (local detections of the first half):
    import spark.implicits._
    val sp = spec // local copy: the lambda must not capture the test class
    val firstHalf = spark.range(0L, (sp.nTweets + 1) / 2).as[Long]
      .map(id => TweetGen.makeTweet(sp, id))
    val batch1Keys = Aguilar.detectAll(firstHalf, spec).map(_.key).distinct().collect().toSet

    val allKeys = state2.keys.toSet
    def tokens(k: String): Set[String] = k.split(" ").toSet
    val disjoint = batch1Keys.filter { k =>
      val t = tokens(k)
      (allKeys - k).forall(other => tokens(other).intersect(t).isEmpty)
    }
    assert(disjoint.nonEmpty, "expected some token-disjoint batch-1 candidates")
    disjoint.foreach { k =>
      val s = state2.pools(k)
      val b = batchPools(k)
      assert(s.count == b.mentionCount, s"count mismatch for $k: ${s.count} vs ${b.mentionCount}")
      s.mean.zip(b.pooled).foreach { case (a, e) => assert(math.abs(a - e) < 1e-9) }
    }
  }

  test("multi-batch recall is close to (and never far above) batch recall") {
    import spark.implicits._
    val tweets = TweetGen.generate(spark, spec)
    val batchRun = Globalizer.run(spark, spec, Aguilar, trained.classifier,
      trained.phraseEmbedder, chargeEmbeddingCost = false)
    val (streamOut, _) = StreamingGlobalizer.runBatched(
      spark, spec, Aguilar, trained.classifier, trained.phraseEmbedder, nBatches = 4)
    val streamEval = Metrics.evaluate(streamOut, tweets)
    val batchEval = batchRun.globalEval
    // Early batches cannot know later candidates, so streaming recall is
    // bounded by batch recall (modulo γ/α band flips from partial pools).
    assert(streamEval.recall <= batchEval.recall + 0.05,
      s"stream=${streamEval.recall} batch=${batchEval.recall}")
    assert(streamEval.recall > batchEval.recall * 0.7,
      "streaming should still recover most mentions")
    assert(streamEval.f1 > Metrics.evaluate(
      Metrics.detectionSpans(batchRun.localDets), tweets).f1,
      "streaming global must still beat local EMD")
  }

  test("processBatch over an empty batch leaves state usable") {
    import spark.implicits._
    val state = new StreamingGlobalizer.State
    val empty = spark.emptyDataset[Tweet]
    val out = StreamingGlobalizer.processBatch(
      empty, spec, Aguilar, trained.classifier, trained.phraseEmbedder, state)
    assert(out.count() == 0)
    assert(state.keys.isEmpty)
  }

  test("Structured Streaming via MemoryStream produces the same spans as the driver loop") {
    import spark.implicits._
    implicit val sqlCtx = spark.sqlContext
    val stream = MemoryStream[Tweet]
    val state = new StreamingGlobalizer.State
    val collected = mutable.ArrayBuffer.empty[Set[(Long, Int, Int)]]
    val query = StreamingGlobalizer.runStream(
      stream.toDS(), spec, Aguilar, trained.classifier, trained.phraseEmbedder, state,
      (_, df) => collected.synchronized { collected += spans(df) })

    val all = TweetGen.generateLocal(spec)
    val half = all.size / 2
    stream.addData(all.take(half))
    query.processAllAvailable()
    stream.addData(all.drop(half))
    query.processAllAvailable()
    query.stop()

    val (loopOut, loopState) = StreamingGlobalizer.runBatched(
      spark, spec, Aguilar, trained.classifier, trained.phraseEmbedder, nBatches = 2)
    assert(collected.size == 2)
    assert(collected.reduce(_ ++ _) == spans(loopOut))
    assert(state.keys == loopState.keys)
  }
}
