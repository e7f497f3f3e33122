package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{SyntacticEmbedding => S}

class SyntacticEmbeddingSpec extends AnyFunSuite {

  private val sent = Seq("the", "Governor", "Andy", "Beshear", "spoke", "about", "UK", "today")

  test("proper capitalization (scenario 1) for a multi-token capitalized mention") {
    assert(S.scenario(sent, 2, 2) == S.ProperCap)
  }

  test("proper capitalization for a capitalized unigram mid-sentence") {
    assert(S.scenario(sent, 1, 1) == S.ProperCap)
  }

  test("start-of-sentence capitalization (scenario 2) for a capitalized unigram at position 0") {
    assert(S.scenario(Seq("Italy", "is", "rising"), 0, 1) == S.StartOfSentenceCap)
  }

  test("a multi-token mention at position 0 is not scenario 2") {
    assert(S.scenario(Seq("Andy", "Beshear", "said", "so"), 0, 2) == S.ProperCap)
  }

  test("substring capitalization (scenario 3) when only part of a multigram is capitalized") {
    assert(S.scenario(Seq("met", "Andy", "beshear", "today"), 1, 2) == S.SubstringCap)
  }

  test("full capitalization (scenario 4) for abbreviations") {
    assert(S.scenario(sent, 6, 1) == S.FullCap)
  }

  test("full capitalization for multi-token ALLCAPS mention") {
    assert(S.scenario(Seq("news", "NEW", "YORK", "report"), 1, 2) == S.FullCap)
  }

  test("no capitalization (scenario 5) for lowercase mention in a mixed sentence") {
    assert(S.scenario(Seq("the", "coronavirus", "spreads", "in", "Italy"), 1, 1) == S.NoCap)
  }

  test("non-discriminative (scenario 6) in an ALLCAPS sentence") {
    assert(S.scenario(Seq("WE", "BYPASS", "ITALY", "TODAY"), 2, 1) == S.NonDiscriminative)
  }

  test("non-discriminative in an all-lowercase sentence") {
    assert(S.scenario(Seq("we", "bypass", "italy", "today"), 2, 1) == S.NonDiscriminative)
  }

  test("non-discriminative in a Title-Case sentence") {
    assert(S.scenario(Seq("We", "Bypass", "Italy", "Today"), 2, 1) == S.NonDiscriminative)
  }

  test("nonDiscriminativeSentence ignores non-letter tokens") {
    assert(S.nonDiscriminativeSentence(Seq("WE", "123", "GO")))
    assert(!S.nonDiscriminativeSentence(Seq("WE", "go", "Home")))
  }

  test("sentence of only non-letter tokens is non-discriminative") {
    assert(S.nonDiscriminativeSentence(Seq("123", "456")))
  }

  test("embed returns a one-hot of dimension 6") {
    val v = S.embed(sent, 2, 2)
    assert(v.length == S.Dim)
    assert(v.sum == 1.0)
    assert(v(S.ProperCap - 1) == 1.0)
  }

  test("embed differs between scenarios") {
    val a = S.embed(Seq("the", "coronavirus"), 1, 1) // NoCap
    val b = S.embed(Seq("the", "Coronavirus"), 1, 1) // ProperCap
    assert(a.toSeq != b.toSeq)
  }

  test("scenario rejects invalid spans") {
    intercept[IllegalArgumentException](S.scenario(sent, 7, 2))
    intercept[IllegalArgumentException](S.scenario(sent, -1, 1))
    intercept[IllegalArgumentException](S.scenario(sent, 0, 0))
  }

  test("pooled scenario distributions separate entities from lures (sanity)") {
    // An entity appears properly capitalized in most contexts; a lure is
    // capitalized only at sentence start or in non-discriminative sentences.
    // Sentences mix cases so they are not non-discriminative (scenario 6).
    val entityOccs = Seq(
      S.embed(Seq("met", "Vebaba", "today"), 1, 1),
      S.embed(Seq("Vebaba", "spoke", "here"), 0, 1),
      S.embed(Seq("With", "vebaba", "again"), 1, 1),
      S.embed(Seq("and", "Vebaba", "too"), 1, 1))
    val lureOccs = Seq(
      S.embed(Seq("Zobaba", "is", "nice"), 0, 1),
      S.embed(Seq("The", "zobaba", "thing"), 1, 1),
      S.embed(Seq("A", "zobaba", "again"), 1, 1))
    val e = repro.nn.Net.mean(entityOccs)
    val l = repro.nn.Net.mean(lureOccs)
    assert(e(S.ProperCap - 1) > l(S.ProperCap - 1))
    assert(l(S.NoCap - 1) > e(S.NoCap - 1))
  }
}
