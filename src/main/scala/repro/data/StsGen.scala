package repro.data

import repro.core.PhraseEmbedder.Pair
import repro.util.Rng

/** Synthetic STS-Benchmark substitute for Phrase Embedder training.
  *
  * The paper trains its Siamese head on STS-b (5749 train / 1500 validation
  * sentence pairs, gold similarity normalized to [0,1]). We generate pairs
  * with the same structure in the embedding space of the Local EMD system:
  *
  *   - each sentence has a latent topic vector living in the first half of
  *     the embedding dimensions ("signal channels"), with light pooling
  *     noise; the second half carries topic-free residual activations
  *     ("noise channels") — the part of a contextual embedding that encodes
  *     syntax/position rather than content;
  *   - the gold label is the normalized cosine of the two topics.
  *
  * A random dense head mixes the noise channels into the cosine; the trained
  * head learns to down-weight them, which measurably reduces the validation
  * MSE — the same role the dense layer plays in the paper's Fig. 4.
  * Pair counts are reduced (1500/400 vs 5749/1500) to keep the pure-Scala
  * training tractable — documented in DESIGN.md.
  */
object StsGen {

  val TrainPairs = 1500
  val ValidPairs = 400

  private val TopicSd = 0.5   // sd of each signal-channel topic coordinate
  private val SignalNoiseSd = 0.15
  private val ResidualSd = 0.5

  /** A pooled sentence embedding: topic in the low half + residual noise. */
  private def pooled(dim: Int, salt: Long, topic: Array[Double], tag: Long): Array[Double] = {
    val h = dim / 2
    Array.tabulate(dim) { i =>
      if (i < h) topic(i) + SignalNoiseSd * Rng.gaussian(salt, tag, 2L, i.toLong)
      else ResidualSd * Rng.gaussian(salt, tag, 3L, i.toLong)
    }
  }

  /** Generate `n` pairs in embedding space (dim, salt); `split` separates train/valid. */
  def pairs(dim: Int, salt: Long, n: Int, split: Long): IndexedSeq[Pair] = {
    val h = dim / 2
    (0 until n).map { k =>
      val tag = Rng.hash(split, k.toLong)
      val t1 = Array.tabulate(h)(i => TopicSd * Rng.gaussian(salt, tag, 10L, i.toLong))
      // Correlate the second topic with the first by a uniform rho in [-0.2, 1].
      val rho = -0.2 + 1.2 * Rng.unif(salt, tag, 11L)
      val t2 = Array.tabulate(h) { i =>
        rho * t1(i) + math.sqrt(math.max(0.0, 1 - rho * rho)) * TopicSd * Rng.gaussian(salt, tag, 12L, i.toLong)
      }
      val a = pooled(dim, salt, t1, Rng.hash(tag, 13L))
      val b = pooled(dim, salt, t2, Rng.hash(tag, 14L))
      val cos = repro.nn.Net.cosine(t1, t2)
      Pair(a, b, (cos + 1.0) / 2.0)
    }
  }

  def trainSet(dim: Int, salt: Long): IndexedSeq[Pair] = pairs(dim, salt, TrainPairs, 1L)
  def validSet(dim: Int, salt: Long): IndexedSeq[Pair] = pairs(dim, salt, ValidPairs, 2L)
}
