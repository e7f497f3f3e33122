package repro.core

/** Shared data model for the reproduction.
  *
  * A "tweet" here is one tweet-sentence, the unit the paper processes
  * (TweetBase is keyed by (tweet ID, sentence ID)). Tokens are pre-split;
  * gold spans and lure spans are token ranges.
  */

/** A ground-truth entity mention: tokens [start, start+len) refer to `entityId`. */
case class GoldSpan(start: Int, len: Int, entityId: Long)

/** A non-entity phrase that looks entity-like (capitalized noun phrase etc.);
  * simulated Local EMD systems emit these as false-positive candidates.
  */
case class LureSpan(start: Int, len: Int, lureId: Long)

/** One tweet-sentence of a dataset stream. */
case class Tweet(dataset: String,
                 tweetId: Long,
                 sentId: Int,
                 tokens: Seq[String],
                 gold: Seq[GoldSpan],
                 lures: Seq[LureSpan]) {
  def surface(start: Int, len: Int): String = tokens.slice(start, start + len).mkString(" ")
}

/** A span emitted by a Local EMD system for one tweet-sentence. */
case class Detection(dataset: String, tweetId: Long, sentId: Int, start: Int, len: Int, surface: String) {
  /** Case-insensitive candidate key, the CTrie/CandidateBase identity. */
  def key: String = Detection.keyOf(surface)
}

object Detection {
  def keyOf(surface: String): String = surface.toLowerCase
}

/** A candidate mention found by occurrence mining during Global EMD. */
case class Mention(dataset: String, tweetId: Long, sentId: Int, start: Int, len: Int,
                   key: String, surface: String)

/** A candidate's global record: pooled embedding over all its mentions. */
case class CandidateRecord(key: String, mentionCount: Long, pooled: Array[Double])
