package repro.eval

import repro.util.BitVector

/** Scores an index's answers against exact truth.
  *
  * The paper's metric: false-positive rate = false positives / total
  * negatives, where a negative is a (query, file) pair with the k-mer absent
  * from the file. False negatives must be zero — Bloom filters cannot miss —
  * and a nonzero count is a correctness bug, so [[evaluate]] reports it for
  * tests to assert on.
  */
object FprEval {

  /** Aggregate confusion counts over a workload. */
  final case class EvalResult(
      falsePositives: Long,
      totalNegatives: Long,
      falseNegatives: Long,
      totalPositives: Long) {
    /** FP rate in [0,1]; 0 if the workload had no negatives. */
    def fpRate: Double =
      if (totalNegatives == 0) 0.0 else falsePositives.toDouble / totalNegatives
    def fpPercent: Double = fpRate * 100.0
  }

  /** Run every query through `answer` and accumulate confusion counts. */
  def evaluate(answer: String => BitVector, queries: Seq[Workload.Query],
               numFiles: Int): EvalResult = {
    var fp = 0L; var neg = 0L; var fn = 0L; var pos = 0L
    queries.foreach { q =>
      val got = answer(q.kmer)
      require(got.numBits == numFiles, s"answer has ${got.numBits} bits, expected $numFiles")
      val truthCard = q.truth.cardinality
      pos += truthCard
      neg += numFiles - truthCard
      var w = 0
      while (w < got.words.length) {
        fp += java.lang.Long.bitCount(got.words(w) & ~q.truth.words(w))
        fn += java.lang.Long.bitCount(q.truth.words(w) & ~got.words(w))
        w += 1
      }
    }
    EvalResult(fp, neg, fn, pos)
  }
}
