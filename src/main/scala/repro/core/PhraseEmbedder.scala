package repro.core

import repro.nn.{Adam, Linear, Net}
import repro.util.Rng

/** Entity Phrase Embedder (paper Sec. V-B-2, Fig. 4).
  *
  * A modified-SBERT Siamese head: mean-pooled token embeddings pass through
  * one trainable dense layer (Eq. 2); the underlying DNN stays frozen. The
  * head is trained on a sentence-similarity regression task (cosine of the
  * two dense outputs vs. the gold similarity, MSE loss, Adam, early
  * stopping), with weight updates mirrored across both sub-networks (here:
  * literally shared, as in SBERT).
  */
final class PhraseEmbedder(val inDim: Int, val outDim: Int, seed: Long) extends Serializable {
  val dense = new Linear(inDim, outDim, Rng.hash(seed, 0x9eL))

  /** local_emb = W_ff · pooled_emb + b_ff (Eq. 2). */
  def embed(pooled: Array[Double]): Array[Double] = dense.forward(pooled)

  /** Cosine similarity of two pooled inputs under the current head. */
  def similarity(a: Array[Double], b: Array[Double]): Double =
    Net.cosine(embed(a), embed(b))

  /** MSE of predicted vs. gold similarity over a pair set. */
  def loss(pairs: Seq[PhraseEmbedder.Pair]): Double =
    if (pairs.isEmpty) 0.0
    else pairs.map(p => { val d = similarity(p.a, p.b) - p.sim; d * d }).sum / pairs.size

  /** Accumulate grads for one pair; returns its squared error. */
  private def backwardPair(p: PhraseEmbedder.Pair): Double = {
    val pa = dense.forward(p.a)
    val pb = dense.forward(p.b)
    val na = Net.norm(pa); val nb = Net.norm(pb)
    if (na < 1e-12 || nb < 1e-12) return 0.0
    val c  = Net.dot(pa, pb) / (na * nb)
    val dc = 2.0 * (c - p.sim)
    val dpa = Array.tabulate(outDim)(i => dc * (pb(i) / (na * nb) - c * pa(i) / (na * na)))
    val dpb = Array.tabulate(outDim)(i => dc * (pa(i) / (na * nb) - c * pb(i) / (nb * nb)))
    // Shared (mirrored) weights: both sides accumulate into the same layer.
    dense.backward(p.a, dpa)
    dense.backward(p.b, dpb)
    val d = c - p.sim
    d * d
  }

  /** Train with Adam + early stopping on validation MSE; restores the best
    * weights and returns the best validation loss.
    */
  def fit(train: IndexedSeq[PhraseEmbedder.Pair],
          valid: IndexedSeq[PhraseEmbedder.Pair],
          lr: Double = 0.001,
          batchSize: Int = 32,
          maxEpochs: Int = 60,
          patience: Int = 10,
          seed: Long = 13L): Double = {
    require(train.nonEmpty, "empty STS training set")
    val adam = new Adam(dense.params, lr)
    val bestW = dense.w.clone(); val bestB = dense.b.clone()
    var bestLoss = loss(valid)
    var sinceBest = 0
    var epoch = 0
    while (epoch < maxEpochs && sinceBest < patience) {
      val order = train.indices.sortBy(i => Rng.hash(seed, epoch.toLong, i.toLong))
      var start = 0
      while (start < train.size) {
        val end = math.min(train.size, start + batchSize)
        dense.zeroGrad()
        (start until end).foreach(i => backwardPair(train(order(i))))
        adam.step(end - start)
        start = end
      }
      val vl = loss(valid)
      if (vl < bestLoss - 1e-7) {
        bestLoss = vl
        System.arraycopy(dense.w, 0, bestW, 0, bestW.length)
        System.arraycopy(dense.b, 0, bestB, 0, bestB.length)
        sinceBest = 0
      } else sinceBest += 1
      epoch += 1
    }
    System.arraycopy(bestW, 0, dense.w, 0, bestW.length)
    System.arraycopy(bestB, 0, dense.b, 0, bestB.length)
    bestLoss
  }
}

object PhraseEmbedder {
  /** A training pair: two pooled phrase inputs and a gold similarity in [0,1]. */
  final case class Pair(a: Array[Double], b: Array[Double], sim: Double)
}
