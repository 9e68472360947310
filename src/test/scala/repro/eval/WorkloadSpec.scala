package repro.eval

import org.scalatest.funsuite.AnyFunSuite

import repro.genome.SynthGenomes
import repro.genome.SynthGenomes.CorpusSpec

class WorkloadSpec extends AnyFunSuite {

  private val spec = CorpusSpec(nFiles = 30, poolSize = 400, totalPairs = 4000L,
    alpha = 0.8, seed = 61L)
  private val truth = GroundTruth.fromLocal(SynthGenomes.corpusLocal(spec), spec.nFiles)

  test("workload has the requested mix") {
    val qs = Workload.queries(spec, truth, nPositive = 40, nNegative = 60)
    assert(qs.size == 100)
    assert(qs.take(40).forall(_.truth.cardinality > 0), "positives must be present")
    assert(qs.drop(40).forall(_.truth.cardinality == 0), "negatives must be absent")
  }

  test("positive truths match ground truth") {
    val qs = Workload.queries(spec, truth, 30, 0)
    qs.foreach(q => assert(q.truth == truth.filesOf(q.kmer)))
  }

  test("negatives are corpus-absent") {
    val qs = Workload.queries(spec, truth, 0, 50)
    qs.foreach(q => assert(!truth.isPresent(q.kmer)))
  }

  test("workload is deterministic in seed") {
    val a = Workload.queries(spec, truth, 20, 20, seed = 5L)
    val b = Workload.queries(spec, truth, 20, 20, seed = 5L)
    assert(a.map(_.kmer) == b.map(_.kmer))
    val c = Workload.queries(spec, truth, 20, 20, seed = 6L)
    assert(a.map(_.kmer) != c.map(_.kmer))
  }

  test("positives sample the pool (mostly tail under Zipf)") {
    val qs = Workload.queries(spec, truth, 200, 0)
    val medianDf = qs.map(_.truth.cardinality).sorted.apply(100)
    assert(medianDf < spec.nFiles / 2, s"median df $medianDf — sampling looks head-biased")
  }

  test("kmers are all k-long DNA strings") {
    val qs = Workload.queries(spec, truth, 10, 10)
    qs.foreach(q => assert(q.kmer.length == spec.k &&
      repro.genome.Dna.isUnambiguous(q.kmer)))
  }
}
