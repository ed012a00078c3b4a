package repro.data

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Prop.forAll
import org.scalacheck.Gen
import repro.PropSupport

class LexiconSpec extends AnyFunSuite with PropSupport {

  test("word is deterministic") {
    assert(Lexicon.word(42L) == Lexicon.word(42L))
  }

  test("word is pronounceable lowercase letters only") {
    checkProp(forAll { (s: Long) => Lexicon.word(s).forall(c => c >= 'a' && c <= 'z') })
  }

  test("word length between 4 and 8") {
    checkProp(forAll { (s: Long) => val w = Lexicon.word(s); w.length >= 4 && w.length <= 8 })
  }

  test("base differs across meanings with high probability") {
    val words = (0L until 500L).map(m => Lexicon.base("v", m)).toSet
    assert(words.size > 350, s"only ${words.size} distinct words in 500 meanings")
  }

  test("base differs across vocab tags") {
    assert(Lexicon.base("v1", 7L) != Lexicon.base("v2", 7L) ||
           Lexicon.base("v1", 8L) != Lexicon.base("v2", 8L))
  }

  test("surface variant 0 is the base") {
    assert(Lexicon.surface("v", 3L, 0) == Lexicon.base("v", 3L))
  }

  test("surface variants carry the marker") {
    (1 to Lexicon.Variants).foreach { j =>
      assert(Lexicon.surface("v", 3L, j) == Lexicon.base("v", 3L) + "_" + j)
    }
  }

  test("surface rejects out-of-range variant") {
    intercept[IllegalArgumentException](Lexicon.surface("v", 3L, Lexicon.Variants + 1))
  }

  test("canonical strips variant markers") {
    val m = 11L
    (0 to Lexicon.Variants).foreach { j =>
      assert(Lexicon.canonical(Lexicon.surface("v", m, j)) == Lexicon.base("v", m))
    }
  }

  test("canonical is identity on unmarked tokens") {
    checkProp(forAll(Gen.alphaLowerStr) { s => Lexicon.canonical(s) == s })
  }

  test("canonical is idempotent") {
    checkProp(forAll { (s: Long) =>
      val t = Lexicon.surface("v", math.abs(s % 100), 1)
      Lexicon.canonical(Lexicon.canonical(t)) == Lexicon.canonical(t)
    })
  }

  test("poolWord draws from a bounded pool") {
    val pool = (0L until 2000L).map(s => Lexicon.poolWord("p", 10, s)).toSet
    assert(pool.size <= 10)
    assert(pool.size >= 5)
  }

  test("poolWord deterministic") {
    assert(Lexicon.poolWord("p", 50, 9L) == Lexicon.poolWord("p", 50, 9L))
  }
}
