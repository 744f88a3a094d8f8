package repro.text

import org.scalatest.funsuite.AnyFunSuite

class TokenizerSpec extends AnyFunSuite {

  test("normalize lowercases") { assert(Tokenizer.normalize("AbC") == "abc") }

  test("normalize strips punctuation to spaces") {
    assert(Tokenizer.normalize("a-b.c") == "a b c")
  }

  test("normalize keeps digits (model numbers survive)") {
    assert(Tokenizer.tokens("XJ-2000").toSeq == Seq("xj", "2000"))
  }

  test("tokens splits on whitespace and drops empties") {
    assert(Tokenizer.tokens("  hello   world  ").toSeq == Seq("hello", "world"))
  }

  test("tokens of empty string is empty") {
    assert(Tokenizer.tokens("").isEmpty)
    assert(Tokenizer.tokens("—!…").isEmpty)
  }

  test("tokens keeps alphanumeric runs together") {
    assert(Tokenizer.tokens("kx2741b").toSeq == Seq("kx2741b"))
  }

  test("trigrams of 'cat'") {
    assert(Tokenizer.trigrams("cat").toSeq == Seq("##c", "#ca", "cat", "at#", "t##"))
  }

  test("trigrams of one char") {
    assert(Tokenizer.trigrams("a").toSeq == Seq("##a", "#a#", "a##"))
  }

  test("one-char edit perturbs only a few trigrams") {
    val a = Tokenizer.trigrams("television").toSet
    val b = Tokenizer.trigrams("televsion").toSet // dropped char
    assert(Tokenizer.jaccard(a, b) > 0.5)
  }

  test("recordTokens concatenates attribute tokens") {
    assert(Tokenizer.recordTokens(Seq("a b", "c")).toSeq == Seq("a", "b", "c"))
  }

  test("jaccard of identical sets is 1") {
    assert(Tokenizer.jaccard(Set("a", "b"), Set("a", "b")) == 1.0)
  }

  test("jaccard of disjoint sets is 0") {
    assert(Tokenizer.jaccard(Set("a"), Set("b")) == 0.0)
  }

  test("jaccard of both-empty is 0 by convention") {
    assert(Tokenizer.jaccard(Set.empty, Set.empty) == 0.0)
  }

  test("jaccard half overlap") {
    assert(math.abs(Tokenizer.jaccard(Set("a", "b"), Set("b", "c")) - 1.0 / 3) < 1e-12)
  }

  test("overlap coefficient uses the smaller set") {
    assert(Tokenizer.overlap(Set("a"), Set("a", "b", "c")) == 1.0)
    assert(Tokenizer.overlap(Set("a", "x"), Set("a", "b", "c")) == 0.5)
  }

  test("overlap with empty set is 0") {
    assert(Tokenizer.overlap(Set.empty, Set("a")) == 0.0)
  }

  test("jaccard symmetric (scalacheck)") {
    val genSet = org.scalacheck.Gen.containerOf[Set, String](org.scalacheck.Gen.alphaStr.map(_.take(3)))
    val prop = org.scalacheck.Prop.forAll(genSet, genSet) { (a, b) =>
      Tokenizer.jaccard(a, b) == Tokenizer.jaccard(b, a)
    }
    assert(org.scalacheck.Test.check(org.scalacheck.Test.Parameters.default, prop).passed)
  }

  test("jaccard bounded in [0,1] (scalacheck)") {
    val genSet = org.scalacheck.Gen.containerOf[Set, String](org.scalacheck.Gen.alphaStr.map(_.take(3)))
    val prop = org.scalacheck.Prop.forAll(genSet, genSet) { (a, b) =>
      val j = Tokenizer.jaccard(a, b)
      j >= 0.0 && j <= 1.0
    }
    assert(org.scalacheck.Test.check(org.scalacheck.Test.Parameters.default, prop).passed)
  }
}
