package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.expressions.Window
import repro.text.{Embeddings, FormatRegex, Tokenizer}
import repro.lsh.{Banding, MinHash, RandomProjection}

/** Algorithm 1 (index construction) as DataFrame transformations over the
  * canonical long-format lake (`table_id, col_idx, col_name, row_idx, value`).
  *
  * Per attribute we derive: q-grams of its name (ℕ), the rarest word of every
  * value part (𝕍, the "informative token" TF/IDF analogue), the format
  * string of every value (𝔽), the mean embedding of every part's most
  * frequent word (𝔼), and a sorted numeric sample (𝔻). ℕ/𝕍/𝔽 become MinHash
  * signatures, 𝔼 a random-projection signature; banding the signatures
  * yields the bucket DataFrames that *are* the four LSH indexes.
  */
object FeatureExtraction {

  /** Build all indexes for a lake. When `reuseEmbeddings` is given (query
    * time, for a target table), the lake-trained token embeddings are used
    * instead of retraining on the (tiny) input.
    */
  def extract(spark: SparkSession, lakeLong: DataFrame, cfg: D3LConfig = D3LConfig(),
              reuseEmbeddings: Option[DataFrame] = None): LakeIndexes = {
    import spark.implicits._

    val lake = lakeLong
      .withColumn("attr", concat_ws("#", $"table_id", $"col_idx"))
      .cache()

    // ---- attribute catalog --------------------------------------------------
    val isNumUdf = udf((v: String) => Tokenizer.isNumericValue(v))
    val nonEmpty = $"value".isNotNull && length(trim($"value")) > 0
    val catalog0 = lake
      .groupBy($"attr", $"table_id", $"col_idx")
      .agg(
        first($"col_name")                                       as "col_name",
        sum(when(nonEmpty, 1L).otherwise(0L))                    as "n_values",
        countDistinct(when(nonEmpty, $"value"))                  as "n_distinct",
        avg(when(nonEmpty, 0.0).otherwise(1.0))                  as "null_frac",
        sum(when(nonEmpty && isNumUdf($"value"), 1L).otherwise(0L)) as "n_numeric",
        avg(when(nonEmpty, length($"value")))                    as "avg_len",
      )
      .withColumn("numeric_frac",
        when($"n_values" > 0, $"n_numeric".cast("double") / $"n_values").otherwise(0.0))
      .withColumn("is_numeric", $"numeric_frac" >= cfg.numericFrac && $"n_values" > 0)
      .drop("n_numeric")

    val textualAttrs = catalog0.filter(!$"is_numeric").select("attr")

    // ---- tokenisation (parts → words), textual attributes only --------------
    val toks = lake
      .filter(nonEmpty)
      .select($"attr", $"row_idx", $"value")
      .join(textualAttrs, "attr")
      .as[(String, Long, String)]
      .flatMap { case (attr, row, value) =>
        Tokenizer.partWords(value).zipWithIndex.flatMap { case (ws, pi) =>
          ws.map(w => (attr, row, pi, w))
        }
      }
      .toDF("attr", "row_idx", "part_idx", "token")

    val tokFreq = toks.groupBy("attr", "token").agg(count(lit(1)) as "freq")
    val withFreq = toks.join(tokFreq, Seq("attr", "token"))
    val wPart = Window.partitionBy("attr", "row_idx", "part_idx")
    val ranked = withFreq
      .withColumn("rare_rank", row_number().over(wPart.orderBy($"freq".asc, $"token".asc)))
      .withColumn("freq_rank", row_number().over(wPart.orderBy($"freq".desc, $"token".asc)))
      .cache()

    // 𝕍: per part, the rarest word; T(a) = their distinct union (Alg. 1 l.10).
    val tsetTokens = ranked.filter($"rare_rank" === 1).select("attr", "token").distinct().cache()
    // 𝔼: per part, the most frequent word is what gets embedded (l.13).
    val embedTokens = ranked.filter($"freq_rank" === 1).select("attr", "token").distinct()

    val tsetSizes = tsetTokens.groupBy("attr").agg(count(lit(1)) as "tset_size")
    val catalog = catalog0
      .join(tsetSizes, Seq("attr"), "left")
      .na.fill(0L, Seq("tset_size"))

    // ---- ℕ / 𝕍 / 𝔽 MinHash signatures --------------------------------------
    val sigN = catalog0.select($"attr", $"col_name").as[(String, String)]
      .map { case (a, n) => (a, Evidence.N, MinHash.signature(Tokenizer.qgrams(n))) }

    val sigV = tsetTokens.as[(String, String)]
      .groupByKey(_._1)
      .mapGroups { (attr, it) => (attr, Evidence.V, MinHash.signature(it.map(_._2).toSeq)) }

    val formats = lake
      .filter(nonEmpty)
      .select($"attr", $"value").as[(String, String)]
      .map { case (a, v) => (a, FormatRegex.formatString(v)) }
      .toDF("attr", "fmt").distinct()
    val sigF = formats.as[(String, String)]
      .groupByKey(_._1)
      .mapGroups { (attr, it) => (attr, Evidence.F, MinHash.signature(it.map(_._2).toSeq)) }

    // ---- 𝔼: random-indexing embeddings (DESIGN.md §4.1) --------------------
    val tokenEmbeddings = reuseEmbeddings.getOrElse(trainEmbeddings(spark, toks))

    val attrVecs = embedTokens
      .join(tokenEmbeddings, Seq("token"))
      .select($"attr", $"vec").as[(String, Array[Float])]
      .groupByKey(_._1)
      .mapGroups { (attr, it) => (attr, Embeddings.mean(it.map(_._2).toSeq)) }
    val sigE = attrVecs.map { case (a, v) => (a, Evidence.E, RandomProjection.signature(v)) }

    val signatures = sigN.union(sigV).union(sigF).union(sigE)
      .toDF("attr", "evidence", "sig")
      .join(catalog0.select("attr", "table_id", "col_idx"), "attr")

    // ---- banded buckets: the LSH indexes ------------------------------------
    val buckets = signatures
      .select($"attr", $"table_id", $"evidence", $"sig").as[(String, String, String, Array[Long])]
      .flatMap { case (attr, tid, ev, sig) =>
        val levels = if (ev == Evidence.E) Banding.simhashLevels else Banding.minhashLevels
        Banding.buckets(sig, levels).map { case (band, bucket) => (ev, band, bucket, attr, tid) }
      }
      .toDF("evidence", "band", "bucket", "attr", "table_id")

    // ---- 𝔻: sorted numeric samples ------------------------------------------
    val maxSample = cfg.maxNumericSample
    val numericProfiles = lake
      .filter(nonEmpty)
      .join(catalog0.filter($"is_numeric").select("attr"), "attr")
      .select($"attr", $"value").as[(String, String)]
      .flatMap { case (a, v) => Tokenizer.parseNumeric(v).map(d => (a, d)) }
      .groupByKey(_._1)
      .mapGroups { (attr, it) =>
        val all = it.map(_._2).toArray
        java.util.Arrays.sort(all)
        val sample = if (all.length <= maxSample) all
          else Array.tabulate(maxSample)(i => all((i.toLong * all.length / maxSample).toInt))
        (attr, sample)
      }
      .toDF("attr", "sample")
      .join(catalog0.select("attr", "table_id", "col_idx"), "attr")

    val subjects = SubjectAttribute.predict(catalog)

    lake.unpersist(); ranked.unpersist(); tsetTokens.unpersist()

    LakeIndexes(
      catalog = catalog,
      signatures = signatures,
      buckets = buckets,
      numericProfiles = numericProfiles,
      subjects = subjects,
      tokenEmbeddings = tokenEmbeddings,
    )
  }

  /** Random-indexing training: a token's embedding is the sum over all of
    * its value-level co-occurrences of the co-token's deterministic ±1 base
    * vector (self included so single-token values still embed).
    */
  def trainEmbeddings(spark: SparkSession, toks: DataFrame): DataFrame = {
    import spark.implicits._
    toks
      .select($"attr", $"row_idx", $"token").as[(String, Long, String)]
      .groupByKey(t => (t._1, t._2))
      .flatMapGroups { (_, it) =>
        val ts = it.map(_._3).take(12).toSeq
        ts.flatMap(t => ts.map(u => (t, u)))
      }
      .groupByKey(_._1)
      .mapGroups { (token, it) =>
        val acc = new Array[Float](Embeddings.Dim)
        it.foreach { case (_, other) => Embeddings.add(acc, Embeddings.baseVector(other)) }
        (token, acc)
      }
      .toDF("token", "vec")
  }
}
