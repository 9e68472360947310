package repro.genome

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import scala.collection.mutable

/** k-mer extraction: the sliding-window decomposition of a sequence into its
  * k-contiguous substrings (the paper uses k = 31 throughout).
  *
  * Windows containing an ambiguous base (anything outside ACGT) are skipped,
  * as real k-mer counters do for 'N' runs in assemblies.
  */
object Kmers {
  /** The paper's k-mer length. */
  val DefaultK = 31

  /** All k-windows of `seq` in order, skipping windows with ambiguous bases.
    * May contain duplicates (callers wanting the k-mer *set* use [[kmerSet]]).
    */
  def kmers(seq: String, k: Int = DefaultK): Seq[String] = {
    require(k > 0, s"k must be > 0, got $k")
    if (seq.length < k) return Seq.empty
    val out = mutable.ArrayBuffer.empty[String]
    // `nextAmbiguous` tracking keeps extraction O(n) even with long N runs.
    var i = 0
    var lastBad = -1
    var j = 0
    while (j < k - 1) { if (Dna.code(seq.charAt(j)) < 0) lastBad = j; j += 1 }
    while (i + k <= seq.length) {
      val end = i + k - 1
      if (Dna.code(seq.charAt(end)) < 0) lastBad = end
      if (lastBad < i) out += seq.substring(i, i + k)
      i += 1
    }
    out.toSeq
  }

  /** Distinct k-mers of `seq`. */
  def kmerSet(seq: String, k: Int = DefaultK): Set[String] = kmers(seq, k).toSet

  /** Spark column expression: distinct k-mers of a sequence column.
    *
    * Registered as a UDF so corpora expressed as (file, sequence) DataFrames
    * (e.g. parsed FASTA) can be exploded into (file, kmer) rows with Catalyst
    * doing the distribution.
    */
  def kmerSetUdf(k: Int = DefaultK): org.apache.spark.sql.expressions.UserDefinedFunction =
    udf((seq: String) => if (seq == null) Array.empty[String] else kmerSet(seq, k).toArray)

  /** Explode a (…, `seqCol`) DataFrame into one row per distinct k-mer. */
  def explodeKmers(df: DataFrame, seqCol: Column, k: Int = DefaultK): DataFrame =
    df.withColumn("kmer", explode(kmerSetUdf(k)(seqCol)))
}
