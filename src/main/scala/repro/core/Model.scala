package repro.core

import org.apache.spark.sql.DataFrame

/** Shared identifiers and configuration for the D³L pipeline. */
object Evidence {
  val N = "N" // attribute-name q-grams, Jaccard / MinHash
  val V = "V" // informative value tokens, Jaccard / MinHash
  val F = "F" // format regex strings, Jaccard / MinHash
  val E = "E" // word-embedding vectors, cosine / random projection
  val D = "D" // numeric domain distribution, Kolmogorov–Smirnov (no LSH)
  val indexed: Seq[String] = Seq(N, V, F, E)
  val all: Seq[String] = Seq(N, V, F, E, D)
}

/** Tunables, defaulted to the paper's §V configuration (τ=0.7, MinHash size
  * 256 via `lsh.MinHash`, q=4 via `text.Tokenizer`).
  */
final case class D3LConfig(
    /** LSH similarity threshold τ. */
    tau: Double = 0.7,
    /** Numeric-attribute detection: fraction of non-null values parsing as numbers. */
    numericFrac: Double = 0.8,
    /** Max numeric-extent sample retained for KS. */
    maxNumericSample: Int = 512,
    /** Algorithm 3 DFS depth cap (paths longer than this add ~no coverage). */
    maxPathLen: Int = 4,
    /** SA-joinability: minimum estimated overlap coefficient (§IV) between
      * the tsets of the joining attributes.
      */
    minJoinOverlap: Double = 0.25,
    /** Eq. 3 evidence weights (N, V, F, E, D order); uniform until trained. */
    evidenceWeights: Map[String, Double] =
      Evidence.all.map(_ -> 1.0).toMap,
)

/** The four LSH indexes plus the auxiliary structures D³L needs at query
  * time, all as cached DataFrames.
  *
  *  - catalog:          attr, table_id, col_idx, col_name, n_values,
  *                      n_distinct, null_frac, numeric_frac, is_numeric,
  *                      avg_len, tset_size
  *  - signatures:       attr, table_id, col_idx, evidence, sig (array<long>)
  *  - buckets:          evidence, band, bucket, attr, table_id  — the indexes
  *  - numericProfiles:  attr, table_id, col_idx, sample (sorted array<double>)
  *  - subjects:         table_id, col_idx, attr — predicted subject attribute
  *  - tokenEmbeddings:  token, vec (array<float>) — lake-trained embeddings,
  *                      needed to embed unseen target values at query time
  */
final case class LakeIndexes(
    catalog: DataFrame,
    signatures: DataFrame,
    buckets: DataFrame,
    numericProfiles: DataFrame,
    subjects: DataFrame,
    tokenEmbeddings: DataFrame,
) {
  def cacheAll(): LakeIndexes = {
    Seq(catalog, signatures, buckets, numericProfiles, subjects, tokenEmbeddings)
      .foreach(df => { df.cache(); df.count() })
    this
  }
  def unpersistAll(): Unit =
    Seq(catalog, signatures, buckets, numericProfiles, subjects, tokenEmbeddings)
      .foreach(_.unpersist())
}
