package repro.genome

import org.scalatest.funsuite.AnyFunSuite

class DnaSpec extends AnyFunSuite {

  test("code/base round-trip the alphabet") {
    Dna.Bases.foreach(b => assert(Dna.base(Dna.code(b)) == b))
  }

  test("code accepts lower case") {
    assert(Dna.code('a') == Dna.code('A'))
    assert(Dna.code('t') == Dna.code('T'))
  }

  test("code returns -1 for ambiguous bases") {
    assert(Dna.code('N') == -1)
    assert(Dna.code('X') == -1)
    assert(Dna.code('-') == -1)
  }

  test("base rejects bad codes") {
    intercept[IllegalArgumentException](Dna.base(4))
    intercept[IllegalArgumentException](Dna.base(-1))
  }

  test("isUnambiguous") {
    assert(Dna.isUnambiguous("ACGTacgt"))
    assert(!Dna.isUnambiguous("ACGNT"))
    assert(Dna.isUnambiguous(""))
  }

  test("encode/decode round-trip") {
    Seq("A", "ACGT", "TTTTTTTTTT", "ACGTACGTACGTACGTACGTACGTACGTACG").foreach { k =>
      assert(Dna.decode(Dna.encode(k), k.length) == k)
    }
  }

  test("encode is injective over short kmers") {
    val all4 = for (a <- Dna.Bases; b <- Dna.Bases; c <- Dna.Bases; d <- Dna.Bases)
      yield new String(Array(a, b, c, d))
    assert(all4.map(Dna.encode).distinct.length == 256)
  }

  test("encode rejects k > 31 and ambiguous bases") {
    intercept[IllegalArgumentException](Dna.encode("A" * 32))
    intercept[IllegalArgumentException](Dna.encode("ACGN"))
  }

  test("complement pairs") {
    assert(Dna.complement('A') == 'T' && Dna.complement('T') == 'A')
    assert(Dna.complement('C') == 'G' && Dna.complement('G') == 'C')
    assert(Dna.complement('N') == 'N')
  }

  test("reverseComplement") {
    assert(Dna.reverseComplement("AACG") == "CGTT")
    assert(Dna.reverseComplement("") == "")
  }

  test("reverseComplement is an involution") {
    val s = Dna.randomSequence(100, 7L)
    assert(Dna.reverseComplement(Dna.reverseComplement(s)) == s)
  }

  test("canonical is min of kmer and its reverse complement") {
    assert(Dna.canonical("TTTT") == "AAAA")
    assert(Dna.canonical("AAAA") == "AAAA")
    val k = "ACGTTGCA"
    assert(Dna.canonical(k) == Dna.canonical(Dna.reverseComplement(k)))
  }

  test("randomSequence is deterministic in seed") {
    assert(Dna.randomSequence(200, 1L) == Dna.randomSequence(200, 1L))
    assert(Dna.randomSequence(200, 1L) != Dna.randomSequence(200, 2L))
  }

  test("randomSequence has requested length and valid alphabet") {
    val s = Dna.randomSequence(500, 9L)
    assert(s.length == 500)
    assert(Dna.isUnambiguous(s))
  }

  test("randomSequence uses all four bases roughly evenly") {
    val s = Dna.randomSequence(4000, 13L)
    Dna.Bases.foreach { b =>
      val c = s.count(_ == b)
      assert(math.abs(c - 1000) < 200, s"base $b count $c")
    }
  }

  test("randomKmer collision-free over a large draw") {
    val ks = (0 until 5000).map(i => Dna.randomKmer(31, i.toLong))
    assert(ks.distinct.size == 5000)
  }
}
