package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.embed.{EmbedConfig, Embedder, VecOps}

/** Result of Algorithm 1: per-attribute significance scores and selection.
  *
  * @param scores   attr → mean embedding displacement when that attribute's
  *                 values are shuffled across entities
  * @param selected attributes whose score is ≥ γ · max(score), in schema order
  */
case class AttrSelection(scores: Map[String, Double], selected: Seq[String])

/** Enhanced Entity Representation — automated attribute selection
  * (paper §III-B, Algorithm 1).
  *
  * For each attribute: shuffle its values across the (sampled) entities,
  * re-embed, and average the per-entity cosine distance between old and new
  * embeddings. Attributes whose shuffled-displacement score is large carry
  * signal the encoder responds to (titles, names); attributes whose score is
  * small (unique IDs, ubiquitous codes) are dropped.
  *
  * γ here thresholds the score *relative to the maximum* (score/max ≥ γ),
  * which matches the paper's "select more significant attributes based on a
  * threshold γ"; the numeric grid is re-centred for our encoder (DESIGN.md).
  */
object AttributeSelection {

  /** @param df          all tables concatenated: (idCol, attrs…)
    * @param attrs       candidate attribute columns
    * @param sampleRatio r — fraction of rows used to score (Algorithm 1 line 2)
    * @param gamma       relative threshold γ
    */
  def select(
      df: DataFrame,
      idCol: String,
      attrs: Seq[String],
      sampleRatio: Double = 0.2,
      gamma: Double = 0.5,
      cfg: EmbedConfig = EmbedConfig(),
      seed: Long = 7L,
  ): AttrSelection = {
    require(attrs.nonEmpty, "no attributes to select from")
    if (attrs.size == 1) return AttrSelection(Map(attrs.head -> 1.0), attrs)

    val sampled = df.sample(withReplacement = false, math.min(1.0, sampleRatio), seed)
      .select((col(idCol) +: attrs.map(col)): _*)
      .localCheckpoint()
    val n = sampled.count()
    if (n < 2) return AttrSelection(attrs.map(_ -> 1.0).toMap, attrs)

    // Baseline embeddings over ALL attributes; the corpus weight table is
    // computed once and reused for every shuffled re-embedding (the encoder's
    // "knowledge" must not change when values are permuted).
    val ser = Embedder.serialize(sampled, attrs)
    val feats = Embedder.explodeFeatures(ser, idCol, "text", cfg)
    val weights = Embedder.featureWeights(feats, idCol, n).localCheckpoint()
    val base = Embedder.embedWithWeights(ser, idCol, "text", weights, cfg)
      .withColumnRenamed("vec", "vec0")
      .localCheckpoint()

    // Derangement-ish shuffle: order rows by a salted hash and give each row
    // the attribute value of its successor (cyclic shift of a pseudo-random
    // permutation) — a pure DataFrame formulation of "shuffle the values".
    val w = Window.orderBy(hash(col(idCol), lit(seed.toInt)))
    val withRn = sampled.withColumn("rn", row_number().over(w)).localCheckpoint()

    val scores = attrs.map { attr =>
      val donor = withRn.select(((col("rn") % n) + 1) as "rn", col(attr) as "__shuffled")
      val shuffledDf = withRn
        .drop(attr)
        .join(donor, Seq("rn"))
        .withColumnRenamed("__shuffled", attr)
      val ser2 = Embedder.serialize(shuffledDf, attrs)
      val emb2 = Embedder.embedWithWeights(ser2, idCol, "text", weights, cfg)
      val score = base
        .join(emb2, Seq(idCol))
        .select(avg(VecOps.cosineDistCol(col("vec0"), col("vec"))) as "s")
        .collect()(0).getDouble(0)
      attr -> score
    }.toMap

    val maxScore = scores.values.max
    val selected =
      if (maxScore <= 1e-12) attrs
      else attrs.filter(a => scores(a) >= gamma * maxScore)
    AttrSelection(scores, if (selected.nonEmpty) selected else attrs.sortBy(a => -scores(a)).take(1))
  }
}
