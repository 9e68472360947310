package repro.eval

import repro.genome.SynthGenomes
import repro.genome.SynthGenomes.CorpusSpec
import repro.util.{BitVector, Hashing}

/** Query workloads, mirroring the paper's "30,000 randomly selected k-mer
  * queries": a mix of corpus-present k-mers (sampled uniformly from the pool,
  * so mostly low-document-frequency tail under the Zipf corpus) and fresh
  * random 31-mers, which are universal negatives with overwhelming
  * probability. FP rate is scored per (query, non-containing file) pair.
  */
object Workload {

  /** One query with its exact truth set. */
  final case class Query(kmer: String, truth: BitVector)

  /** Build a workload of `nPositive` pool-sampled present k-mers and
    * `nNegative` corpus-absent k-mers, deterministic in `seed`.
    */
  def queries(spec: CorpusSpec, truth: GroundTruth,
              nPositive: Int, nNegative: Int, seed: Long = 123L): IndexedSeq[Query] = {
    val pos = (0 until nPositive).map { i =>
      val idx = math.floorMod(Hashing.splitmix64(seed + i), spec.poolSize.toLong)
      val kmer = SynthGenomes.poolKmer(spec, idx)
      Query(kmer, truth.filesOf(kmer))
    }
    val neg = SynthGenomes.negativeKmers(spec, nNegative, seed)
      .filterNot(truth.isPresent) // collisions with the pool are ~impossible; guard anyway
      .map(k => Query(k, BitVector.empty(truth.numFiles)))
    (pos ++ neg).toIndexedSeq
  }
}
