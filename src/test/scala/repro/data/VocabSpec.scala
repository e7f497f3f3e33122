package repro.data

import org.scalatest.funsuite.AnyFunSuite

class VocabSpec extends AnyFunSuite {

  test("digitsOf is deterministic and padded") {
    assert(Vocab.digitsOf(0) == Vocab.digitsOf(0))
    assert(Vocab.digitsOf(0).length >= 4)
  }

  test("digitsOf is injective over a range") {
    val outs = (0L until 5000L).map(Vocab.digitsOf).toSet
    assert(outs.size == 5000)
  }

  test("digitsOf rejects negative ids") {
    intercept[IllegalArgumentException](Vocab.digitsOf(-1))
  }

  test("capitalize capitalizes the first letter only") {
    assert(Vocab.capitalize("beshear") == "Beshear")
    assert(Vocab.capitalize("") == "")
    assert(Vocab.capitalize("a") == "A")
  }

  test("fillerWord covers stopwords first") {
    assert(Vocab.fillerWord(0) == Vocab.stopwords(0))
    assert(Vocab.fillerWord(Vocab.stopwords.length).startsWith("fa"))
  }

  test("fillerWord rejects out-of-range index") {
    intercept[IllegalArgumentException](Vocab.fillerWord(Vocab.nFiller))
    intercept[IllegalArgumentException](Vocab.fillerWord(-1))
  }

  test("entityTokens are deterministic per (seed, id)") {
    assert(Vocab.entityTokens(11L, 5L) == Vocab.entityTokens(11L, 5L))
  }

  test("entityTokens differ across seeds (datasets have distinct entity pools)") {
    val same = (1L to 50L).count(id => Vocab.entityTokens(11L, id) == Vocab.entityTokens(12L, id))
    assert(same < 10)
  }

  test("entity keys are unique within a dataset pool") {
    val keys = (1L to 2000L).map(id => Vocab.keyOf(Vocab.entityTokens(11L, id))).toSet
    assert(keys.size == 2000)
  }

  test("entityTokens have 1 to 3 tokens, all capitalized") {
    (1L to 200L).foreach { id =>
      val t = Vocab.entityTokens(11L, id)
      assert(t.nonEmpty && t.length <= 3)
      assert(t.forall(w => w.head.isUpper))
    }
  }

  test("entity last token embeds the id (namespace 've')") {
    (1L to 100L).foreach { id =>
      assert(Vocab.entityTokens(11L, id).last.toLowerCase.startsWith("ve"))
    }
  }

  test("some multi-token entities have a filler collision token") {
    val fillerSet = (0 until Vocab.nFiller).map(Vocab.fillerWord).toSet
    val multis = (1L to 500L).map(id => Vocab.entityTokens(11L, id)).filter(_.length > 1)
    val collisions = multis.count(t => fillerSet.contains(t.head.toLowerCase))
    assert(collisions > 0, "expected some collision tokens")
    assert(collisions < multis.size, "not all should collide")
  }

  test("lure keys are unique and disjoint from entity keys") {
    val entityKeys = (1L to 1000L).map(id => Vocab.keyOf(Vocab.entityTokens(11L, id))).toSet
    val lureKeys = (1L to 1000L).map(id => Vocab.keyOf(Vocab.lureTokens(11L, id))).toSet
    assert(lureKeys.size == 1000)
    assert(entityKeys.intersect(lureKeys).isEmpty)
  }

  test("lure last token uses the 'zo' namespace") {
    (1L to 100L).foreach { id =>
      assert(Vocab.lureTokens(11L, id).last.toLowerCase.startsWith("zo"))
    }
  }

  test("keyOf lower-cases and joins with single spaces") {
    assert(Vocab.keyOf(Seq("Andy", "BESHEAR")) == "andy beshear")
  }
}
