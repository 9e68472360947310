package repro.eval

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.util.BitVector

/** Exact containment ground truth: for each k-mer, the set of files holding
  * it. Built once per corpus and used to score every sweep point's false
  * positives / false negatives.
  */
final case class GroundTruth(numFiles: Int, byKmer: Map[String, BitVector]) {
  private val empty = BitVector.empty(numFiles)

  /** Files containing `kmer` (empty vector if the k-mer is corpus-absent). */
  def filesOf(kmer: String): BitVector = byKmer.getOrElse(kmer, empty)

  /** Whether `kmer` appears in any file. */
  def isPresent(kmer: String): Boolean = byKmer.contains(kmer)

  /** Document frequency of `kmer`. */
  def docFreq(kmer: String): Int = filesOf(kmer).cardinality
}

object GroundTruth {

  /** Invert a local (file, kmer) corpus. */
  def fromLocal(corpus: Iterable[(Int, String)], numFiles: Int): GroundTruth = {
    val m = scala.collection.mutable.HashMap.empty[String, BitVector]
    corpus.foreach { case (f, kmer) =>
      m.getOrElseUpdate(kmer, BitVector.empty(numFiles)).set(f)
    }
    GroundTruth(numFiles, m.toMap)
  }

  /** Invert a (file_id, kmer) DataFrame with a distributed groupBy. */
  def fromSpark(corpus: DataFrame, numFiles: Int): GroundTruth = {
    val rows = corpus
      .groupBy(col("kmer"))
      .agg(collect_list(col("file_id")) as "files")
      .collect()
    val m = rows.map { r =>
      val bv = BitVector.empty(numFiles)
      r.getSeq[Int](1).foreach(bv.set)
      r.getString(0) -> bv
    }.toMap
    GroundTruth(numFiles, m)
  }

  /** Relational ground truth for a (qid, kmer) query DataFrame: the exact
    * (qid, file_id) containment join. This is what the DuckDB oracle checks
    * the batch query engine against.
    */
  def truthDf(spark: SparkSession, queries: DataFrame, corpus: DataFrame): DataFrame =
    queries
      .join(corpus, Seq("kmer"))
      .select(col("qid"), col("file_id"))
      .distinct()
}
