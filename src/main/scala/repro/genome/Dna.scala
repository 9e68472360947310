package repro.genome

import repro.util.Hashing

/** DNA alphabet substrate: base codec, random sequence/k-mer generation,
  * reverse complement and canonical k-mers.
  *
  * Sequences are plain `String`s over {A,C,G,T} (upper case); anything else is
  * an "ambiguous" base (N etc.) that k-mer extraction must skip, mirroring how
  * real FASTA assemblies are processed.
  */
object Dna {
  val Bases: Array[Char] = Array('A', 'C', 'G', 'T')

  /** 2-bit code of a base, or -1 for an ambiguous base. */
  def code(c: Char): Int = c match {
    case 'A' | 'a' => 0
    case 'C' | 'c' => 1
    case 'G' | 'g' => 2
    case 'T' | 't' => 3
    case _         => -1
  }

  /** Base for a 2-bit code. */
  def base(code: Int): Char = {
    require(code >= 0 && code < 4, s"bad base code $code")
    Bases(code)
  }

  /** Whether every character of `s` is an unambiguous upper/lower ACGT. */
  def isUnambiguous(s: CharSequence): Boolean = {
    var i = 0
    while (i < s.length) { if (code(s.charAt(i)) < 0) return false; i += 1 }
    true
  }

  /** 2-bit encode a k-mer (k <= 31) into a Long; requires unambiguous bases. */
  def encode(kmer: CharSequence): Long = {
    require(kmer.length <= 31, s"encode supports k<=31, got ${kmer.length}")
    var v = 0L
    var i = 0
    while (i < kmer.length) {
      val c = code(kmer.charAt(i))
      require(c >= 0, s"ambiguous base '${kmer.charAt(i)}' at $i")
      v = (v << 2) | c
      i += 1
    }
    v
  }

  /** Decode a 2-bit encoded k-mer of length `k` back to a string. */
  def decode(v: Long, k: Int): String = {
    require(k >= 0 && k <= 31, s"decode supports 0<=k<=31, got $k")
    val sb = new Array[Char](k)
    var i = k - 1
    var x = v
    while (i >= 0) { sb(i) = base((x & 3L).toInt); x >>>= 2; i -= 1 }
    new String(sb)
  }

  /** Complement of a single base (ambiguous bases map to 'N'). */
  def complement(c: Char): Char = c match {
    case 'A' | 'a' => 'T'
    case 'C' | 'c' => 'G'
    case 'G' | 'g' => 'C'
    case 'T' | 't' => 'A'
    case _         => 'N'
  }

  /** Reverse complement of a sequence. */
  def reverseComplement(s: String): String = {
    val out = new Array[Char](s.length)
    var i = 0
    while (i < s.length) { out(s.length - 1 - i) = complement(s.charAt(i)); i += 1 }
    new String(out)
  }

  /** Canonical form: lexicographic min of a k-mer and its reverse complement.
    *
    * Not used by the headline experiments (the paper hashes raw 31-mers) but
    * provided because real pipelines index canonical k-mers.
    */
  def canonical(kmer: String): String = {
    val rc = reverseComplement(kmer)
    if (kmer <= rc) kmer else rc
  }

  /** Deterministic random sequence of `len` bases from `seed`. */
  def randomSequence(len: Int, seed: Long): String = {
    val out = new Array[Char](len)
    var state = Hashing.splitmix64(seed)
    var i = 0
    while (i < len) {
      out(i) = Bases(((state >>> (2 * (i & 31))) & 3L).toInt)
      i += 1
      if ((i & 31) == 0) state = Hashing.splitmix64(state)
    }
    new String(out)
  }

  /** Deterministic random k-mer from `seed` (uniform over 4^k space). */
  def randomKmer(k: Int, seed: Long): String = randomSequence(k, seed)
}
