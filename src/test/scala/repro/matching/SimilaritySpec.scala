package repro.matching

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SimilaritySpec extends AnyFunSuite {

  test("tokens lower-cases and drops empties") {
    assert(Similarity.tokens("Foo  BAR baz") == Set("foo", "bar", "baz"))
    assert(Similarity.tokens(null) == Set.empty)
    assert(Similarity.tokens("   ") == Set.empty)
  }

  test("tokenJaccard identical strings → 1") {
    assert(Similarity.tokenJaccard("a b c", "c b a") == 1.0)
  }

  test("tokenJaccard disjoint strings → 0") {
    assert(Similarity.tokenJaccard("a b", "c d") == 0.0)
  }

  test("tokenJaccard known value") {
    assert(Similarity.tokenJaccard("a b c", "b c d") == 2.0 / 4)
  }

  test("tokenJaccard is null-safe and case-insensitive") {
    assert(Similarity.tokenJaccard(null, "a") == 0.0)
    assert(Similarity.tokenJaccard("A b", "a B") == 1.0)
  }

  test("levenshteinDistance classic cases") {
    assert(Similarity.levenshteinDistance("kitten", "sitting") == 3)
    assert(Similarity.levenshteinDistance("", "abc") == 3)
    assert(Similarity.levenshteinDistance("abc", "abc") == 0)
  }

  test("levenshteinSim bounds and null handling") {
    assert(Similarity.levenshteinSim("abc", "abc") == 1.0)
    assert(Similarity.levenshteinSim(null, "abc") == 0.0)
    assert(Similarity.levenshteinSim("", "") == 1.0)
    val s = Similarity.levenshteinSim("kitten", "sitting")
    assert(s == 1.0 - 3.0 / 7)
  }

  test("tokenJaccardKnown blends full and vocabulary-restricted overlap") {
    val vocab = Set("a", "b")
    // shared tokens a,b known; union {a,b,x,y} → (2 + 2) / (2·4)
    assert(Similarity.tokenJaccardKnown("a b x", "a b y", vocab) == 0.5)
    // nothing shared → 0 regardless of vocabulary
    assert(Similarity.tokenJaccardKnown("a x", "b y", vocab) == 0.0)
    assert(Similarity.tokenJaccardKnown("x", "a", vocab) == 0.0)
  }

  test("tokenJaccardKnown halves the credit of unknown shared tokens") {
    // shared {beta} is out-of-vocabulary: (1 + 0) / (2·3) vs plain 1/3
    val discounted = Similarity.tokenJaccardKnown("alpha beta", "beta gamma", Set("alpha"))
    assert(math.abs(discounted - 1.0 / 6) < 1e-12)
    assert(discounted < Similarity.tokenJaccard("alpha beta", "beta gamma"))
  }

  test("tokenJaccardKnown with full vocabulary equals plain jaccard") {
    val a = "p q r"; val b = "q r s"
    assert(Similarity.tokenJaccardKnown(a, b, Set("p", "q", "r", "s")) ==
      Similarity.tokenJaccard(a, b))
  }

  for (seed <- 1 to 5) {
    test(s"jaccard and levenshteinSim are symmetric and bounded (seed=$seed)") {
      val rnd = new Random(seed)
      def randStr() = Seq.fill(1 + rnd.nextInt(5))(('a' + rnd.nextInt(4)).toChar.toString * (1 + rnd.nextInt(3))).mkString(" ")
      (1 to 20).foreach { _ =>
        val a = randStr(); val b = randStr()
        val j1 = Similarity.tokenJaccard(a, b); val j2 = Similarity.tokenJaccard(b, a)
        assert(j1 == j2 && j1 >= 0 && j1 <= 1)
        val l1 = Similarity.levenshteinSim(a, b); val l2 = Similarity.levenshteinSim(b, a)
        assert(math.abs(l1 - l2) < 1e-12 && l1 >= 0 && l1 <= 1)
      }
    }
  }
}
