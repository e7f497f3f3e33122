package repro.core

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.Dataset
import repro.core.{SyntacticEmbedding => Syn}
import repro.emd.{LocalEmd, TokenEmbedder}

/** A candidate mention with its local candidate embedding. */
case class MentionEmb(dataset: String, tweetId: Long, sentId: Int, start: Int, len: Int,
                      key: String, surface: String, emb: Array[Double])

/** Occurrence mining (paper Sec. V-A + V-B): scan every tweet-sentence
  * against the broadcast CTrie of seed candidates, recover all mentions
  * (including ones Local EMD missed, and corrected partials), and attach a
  * local candidate embedding to each:
  *
  *   - deep Local EMD: mean of the system's token embeddings over the
  *     mention span (Eq. 1), then the trained Phrase Embedder dense layer
  *     (Eq. 2);
  *   - non-deep Local EMD: the 6-dim syntactic capitalization embedding.
  */
object MentionExtractor {

  /** Embedding dimension of local candidate embeddings for a system. */
  def embDim(system: LocalEmd): Int = if (system.deep) system.dim else Syn.Dim

  def mentionsOf(tweet: Tweet,
                 trie: CTrie,
                 system: LocalEmd,
                 datasetSeed: Long,
                 phraseEmbedder: Option[PhraseEmbedder]): Seq[MentionEmb] = {
    trie.scan(tweet.tokens.toIndexedSeq).map { case (start, len) =>
      val surface = tweet.surface(start, len)
      val emb =
        if (system.deep) {
          val pooled = TokenEmbedder.phraseMean(system.dim, system.params.salt, datasetSeed, tweet, start, len)
          phraseEmbedder.map(_.embed(pooled)).getOrElse(pooled)
        } else Syn.embed(tweet.tokens, start, len)
      MentionEmb(tweet.dataset, tweet.tweetId, tweet.sentId, start, len,
        Detection.keyOf(surface), surface, emb)
    }
  }

  /** Distributed scan: one pass over the tweets with the broadcast trie. */
  def mine(tweets: Dataset[Tweet],
           trie: Broadcast[CTrie],
           system: LocalEmd,
           datasetSeed: Long,
           phraseEmbedder: Option[PhraseEmbedder]): Dataset[MentionEmb] = {
    val spark = tweets.sparkSession
    import spark.implicits._
    require(!system.deep || phraseEmbedder.isDefined,
      s"deep system ${system.name} requires a trained PhraseEmbedder")
    tweets.flatMap(t => mentionsOf(t, trie.value, system, datasetSeed, phraseEmbedder))
  }
}
