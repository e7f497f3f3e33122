package repro.core

import repro.{SparkSpec, TestFixtures}
import repro.data.TweetGen
import repro.emd.{Aguilar, NpChunker}

/** End-to-end integration tests of the batch pipeline on a small stream,
  * covering the paper's three Global EMD objectives (false-negative
  * removal, false-positive removal, partial-extraction correction) and the
  * Fig. 6 ablation ordering.
  */
class GlobalizerSpec extends SparkSpec {

  private val spec = TweetGen.DevStream

  private lazy val trainedAguilar = TestFixtures.trained(spark, Aguilar)
  private lazy val trainedChunker = TestFixtures.trained(spark, NpChunker)
  private lazy val runAguilar =
    Globalizer.run(spark, spec, Aguilar, trainedAguilar.classifier,
      trainedAguilar.phraseEmbedder, chargeEmbeddingCost = false)
  private lazy val runChunker =
    Globalizer.run(spark, spec, NpChunker, trainedChunker.classifier, None,
      chargeEmbeddingCost = false)

  test("Global EMD improves F1 over Local EMD (deep system)") {
    assert(runAguilar.globalEval.f1 > runAguilar.localEval.f1,
      s"global=${runAguilar.globalEval.f1} local=${runAguilar.localEval.f1}")
  }

  test("Global EMD improves F1 over Local EMD (non-deep system)") {
    assert(runChunker.globalEval.f1 > runChunker.localEval.f1,
      s"global=${runChunker.globalEval.f1} local=${runChunker.localEval.f1}")
  }

  test("Global EMD improves recall (false-negative removal)") {
    assert(runAguilar.globalEval.recall > runAguilar.localEval.recall)
  }

  test("Global EMD improves precision (false-positive removal)") {
    assert(runChunker.globalEval.precision > runChunker.localEval.precision)
  }

  test("entity classifier validation F1 is high (Table II shape)") {
    assert(trainedAguilar.classifierValidationF1 > 0.85,
      s"valF1=${trainedAguilar.classifierValidationF1}")
    assert(trainedChunker.classifierValidationF1 > 0.85,
      s"valF1=${trainedChunker.classifierValidationF1}")
  }

  test("classifier input dim matches the Table II embedding size label") {
    assert(trainedAguilar.embeddingSizeLabel == "100+1")
    assert(trainedAguilar.classifier.inputDim == 101)
    assert(trainedChunker.embeddingSizeLabel == "6+1")
    assert(trainedChunker.classifier.inputDim == 7)
  }

  test("seed keys are exactly the distinct local detection keys") {
    import spark.implicits._
    val keys = Globalizer.seedKeys(runAguilar.localDets)
    val expected = runAguilar.localDets.map(_.key).distinct().collect().sorted.toSeq
    assert(keys == expected)
  }

  test("every candidate record's key comes from a seed candidate's scan") {
    val seedTrie = CTrie.fromKeys(Globalizer.seedKeys(runAguilar.localDets))
    runAguilar.scored.foreach { case (rec, _) =>
      assert(seedTrie.containsString(rec.key), s"unseeded candidate ${rec.key}")
    }
  }

  test("ablation ordering (Fig. 6): local ≤ local+mention-extraction ≤ full framework on recall") {
    import spark.implicits._
    val tweets = TweetGen.generate(spark, spec)
    val localR = runAguilar.localEval.recall
    // Mention extraction alone: treat every candidate as an entity (α).
    val allAlpha = runAguilar.scored.map { case (r, _) => r.key -> EntityClassifier.Alpha }.toMap
    val extractionOnly = Globalizer.assembleOutput(runAguilar.mentions, runAguilar.localDets, allAlpha)
    val extractionR = Metrics.evaluate(extractionOnly, tweets).recall
    val fullR = runAguilar.globalEval.recall
    assert(extractionR >= localR, s"extraction=$extractionR local=$localR")
    assert(extractionR >= fullR, "α-everything has maximal recall")
    // But the classifier recovers precision that extraction-only loses.
    val extractionP = Metrics.evaluate(extractionOnly, tweets).precision
    assert(runAguilar.globalEval.precision > extractionP)
  }

  test("β-labelled candidates are fully removed from the output") {
    import spark.implicits._
    val betaKeys = runAguilar.scored.collect {
      case (r, s) if EntityClassifier.bandOf(s) == EntityClassifier.Beta => r.key
    }.toSet
    assert(betaKeys.nonEmpty, "expected some β candidates")
    val outSpans = runAguilar.finalSpans.collect()
      .map(r => (r.getLong(0), r.getInt(2), r.getInt(3))).toSet
    val betaSpans = runAguilar.mentions.filter(m => betaKeys.contains(m.key)).collect()
    betaSpans.foreach { m =>
      assert(!outSpans.contains((m.tweetId, m.start, m.len)),
        s"β candidate ${m.key} leaked span into output")
    }
  }

  test("α-labelled candidates contribute all their mined mentions") {
    import spark.implicits._
    val alphaKeys = runAguilar.scored.collect {
      case (r, s) if EntityClassifier.bandOf(s) == EntityClassifier.Alpha => r.key
    }.toSet
    assert(alphaKeys.nonEmpty)
    val outSpans = runAguilar.finalSpans.collect()
      .map(r => (r.getLong(0), r.getInt(2), r.getInt(3))).toSet
    runAguilar.mentions.filter(m => alphaKeys.contains(m.key)).collect().foreach { m =>
      assert(outSpans.contains((m.tweetId, m.start, m.len)))
    }
  }

  test("γ-labelled candidates keep only their local detections") {
    import spark.implicits._
    val gammaKeys = runAguilar.scored.collect {
      case (r, s) if EntityClassifier.bandOf(s) == EntityClassifier.Gamma => r.key
    }.toSet
    if (gammaKeys.nonEmpty) {
      val outSpans = runAguilar.finalSpans.collect()
        .map(r => (r.getLong(0), r.getInt(2), r.getInt(3))).toSet
      val localSpans = runAguilar.localDets.collect()
        .map(d => (d.tweetId, d.start, d.len)).toSet
      val alphaKeys = runAguilar.scored.collect {
        case (r, s) if EntityClassifier.bandOf(s) == EntityClassifier.Alpha => r.key
      }.toSet
      // A γ mention in the output must be either a local detection or covered
      // by an α mention at the same span.
      val alphaSpans = runAguilar.mentions.filter(m => alphaKeys.contains(m.key))
        .collect().map(m => (m.tweetId, m.start, m.len)).toSet
      runAguilar.mentions.filter(m => gammaKeys.contains(m.key)).collect().foreach { m =>
        val span = (m.tweetId, m.start, m.len)
        if (outSpans.contains(span))
          assert(localSpans.contains(span) || alphaSpans.contains(span),
            s"γ candidate ${m.key} emitted a non-local span")
      }
    }
  }

  test("most true entities among candidates are not confidently rejected (error analysis #2)") {
    val entityKeys = spec.entityKeys
    val trueCand = runAguilar.scored.filter { case (r, _) => entityKeys.contains(r.key) }
    assert(trueCand.nonEmpty)
    val betaFrac = trueCand.count { case (_, s) =>
      EntityClassifier.bandOf(s) == EntityClassifier.Beta
    }.toDouble / trueCand.size
    assert(betaFrac < 0.25, s"too many true entities β-rejected: $betaFrac")
  }

  test("frequent candidates get confident labels more often than singletons (Fig. 7)") {
    def confident(sel: CandidateRecord => Boolean): Double = {
      val s = runAguilar.scored.filter(x => sel(x._1))
      if (s.isEmpty) 1.0
      else s.count(x => EntityClassifier.bandOf(x._2) != EntityClassifier.Gamma).toDouble / s.size
    }
    val freq = confident(_.mentionCount >= 8)
    val rare = confident(_.mentionCount <= 2)
    assert(freq >= rare, s"freq=$freq rare=$rare")
  }

  test("timings are recorded and non-negative") {
    assert(runAguilar.timings.localSec >= 0)
    assert(runAguilar.timings.globalOverheadSec > 0)
    assert(runAguilar.timings.totalSec >= runAguilar.timings.localSec)
  }

  test("run is deterministic in evaluation counts") {
    val again = Globalizer.run(spark, spec, Aguilar, trainedAguilar.classifier,
      trainedAguilar.phraseEmbedder, chargeEmbeddingCost = false)
    assert(again.localEval == runAguilar.localEval)
    assert(again.globalEval == runAguilar.globalEval)
  }
}
