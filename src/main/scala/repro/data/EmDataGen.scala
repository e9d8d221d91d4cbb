package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.util.Random

/** A generated multi-source EM dataset.
  *
  * @param name     dataset label (e.g. "Music-20")
  * @param df       entities: (eid: Long, source: Int, cid: Long, attr columns…)
  * @param attrs    attribute column names, in schema order
  * @param nSources number of source tables S
  */
case class EmDataset(name: String, df: DataFrame, attrs: Seq[String], nSources: Int) {

  /** Split into the S per-source tables MultiEM consumes. */
  def tables: Seq[DataFrame] = (0 until nSources).map(s => df.filter(col("source") === s))

  /** Ground-truth tuples: clusters with ≥ 2 members, as sorted member arrays. */
  def gtTuples: DataFrame =
    df.groupBy("cid")
      .agg(sort_array(collect_list("eid")) as "members")
      .filter(size(col("members")) >= 2)
      .select("members")
}

/** Summary statistics matching the columns of the paper's Table III. */
case class DatasetStats(name: String, srcs: Int, attrs: Int, entities: Long, tuples: Long, pairs: Long)

/** Synthetic substitutes for the paper's six real-world datasets (§IV-A,
  * Table III). Each generator is deterministic in (scale, seed), mirrors the
  * original's schema, source count, cluster-size distribution and noise
  * character, and carries ground-truth cluster ids for evaluation.
  *
  * Cluster-size distributions are fitted so that the generated
  * entities/tuples/pairs counts land near the paper's Table III values at
  * scale 1.0 (the Table III bench prints both side by side).
  */
object EmDataGen {

  // ---------------------------------------------------------------- vocab --
  // Geo names are synthesised from syllables so the effective name space is
  // large (place names rarely collide exactly); 30 × 12 × 20 ≈ 7k bases.
  private val geoSylA = Array(
    "ash", "berw", "carl", "dun", "east", "fair", "glen", "har", "ivy", "jas",
    "ken", "lake", "mar", "nor", "oak", "pine", "quar", "riv", "stan", "thorn",
    "up", "ver", "west", "yar", "zee", "alt", "bex", "craw", "den", "elm")
  private val geoSylB = Array(
    "ing", "er", "on", "an", "el", "or", "ar", "in", "ol", "en", "ur", "il")
  private val geoSylC = Array(
    "ford", "wick", "ton", "more", "wood", "view", "ora", "dale", "per", "by",
    "field", "ham", "hurst", "row", "bury", "leigh", "worth", "ley", "mouth", "ridge")
  private val geoPrefix = Array("north", "south", "east", "west", "upper", "lower", "new", "old", "mount", "port")
  private val geoSuffix = Array("city", "creek", "falls", "heights", "junction", "park", "ridge", "springs", "vale", "ville")

  // Song-title vocabulary is synthesised (30 × 20 = 600 words) — real title
  // vocabularies are in the thousands, and a tiny pool would give every
  // word an unrealistically high document frequency.
  private val musicWords: Array[String] = {
    val a = Array(
      "mid", "riv", "gold", "shad", "danc", "brok", "silv", "summ", "wint", "lone",
      "elec", "cryst", "burn", "sil", "wild", "sweet", "heav", "thun", "rain", "velv",
      "pap", "holl", "froz", "neon", "grav", "ech", "hor", "emb", "sapph", "wand")
    val b = Array(
      "night", "era", "enly", "owl", "ing", "ken", "vern", "mer", "tern", "ely",
      "tric", "alo", "eden", "enta", "ife", "eet", "anor", "der", "bow", "etta")
    for (x <- a; y <- b) yield x + y
  }
  private val artistFirst = Array(
    "tim", "sarah", "miles", "ella", "john", "nina", "david", "aretha", "luke", "patti",
    "otis", "joni", "marvin", "dusty", "leon", "carole", "van", "bonnie", "gram", "emmy",
    "townes", "lucinda", "ryan", "gillian", "jason", "brandi", "sturgill", "margo")
  private val artistLast = Array(
    "obrien", "vaughan", "davis", "fitzgerald", "coltrane", "simone", "bowie", "franklin",
    "combs", "smith", "redding", "mitchell", "gaye", "springfield", "russell", "king",
    "morrison", "raitt", "parsons", "harris", "zandt", "williams", "adams", "welch",
    "isbell", "carlile", "simpson", "price")
  private val languages = Array("english", "german", "french", "spanish", "italian")

  private val personFirst = Array(
    "james", "mary", "robert", "patricia", "michael", "jennifer", "william", "linda",
    "david", "elizabeth", "richard", "barbara", "joseph", "susan", "thomas", "jessica",
    "charles", "karen", "christopher", "nancy", "daniel", "lisa", "matthew", "betty",
    "anthony", "margaret", "mark", "sandra", "donald", "ashley", "steven", "kimberly",
    "paul", "emily", "andrew", "donna", "joshua", "michelle", "kenneth", "dorothy",
    "kevin", "carol", "brian", "amanda", "george", "melissa", "edward", "deborah")
  private val personLast = Array(
    "anderson", "baker", "campbell", "dawson", "edwards", "foster", "garcia", "harrison",
    "irwin", "jackson", "keller", "lambert", "mitchell", "nguyen", "osborne", "palmer",
    "quinn", "roberts", "sanders", "taylor", "underwood", "vargas", "walker", "young",
    "zimmerman", "bennett", "carter", "dixon", "ellis", "fleming", "graham", "hayes",
    "jenkins", "kennedy", "lawson", "morgan", "nichols", "owens", "parker", "reeves")
  private val suburbs = Array(
    "brookfield", "clayton", "doncaster", "epping", "footscray", "glenroy", "hawthorn",
    "ivanhoe", "kew", "lalor", "malvern", "northcote", "oakleigh", "prahran", "reservoir",
    "springvale", "toorak", "werribee", "yarraville", "altona", "balwyn", "coburg",
    "dandenong", "elwood", "fitzroy", "geelong", "heidelberg", "keilor", "lilydale", "mentone")

  private val shopeeBrands = Array(
    "vandek", "lumora", "kyoshi", "aerix", "polarus", "nexon", "britelle", "zentra",
    "omicraft", "hexaline", "durano", "fintec")
  private val shopeeCats = Array(
    "senter", "powerbank", "earphone", "speaker", "charger", "keyboard", "mouse",
    "tripod", "smartwatch", "lampu")
  private val shopeeSpecs = Array(
    "mini", "led", "cob", "usb", "zoom", "waterproof", "rechargeable", "wireless",
    "bluetooth", "portable", "original", "premium", "super", "bright", "fast",
    "charging", "stereo", "bass", "gaming", "rgb", "slim", "pro", "max", "ultra",
    "hd", "battery", "outdoor", "police", "q5", "u3", "xpe", "t6", "18650", "5v",
    "2a", "10000mah", "murah", "promo")
  private val shopeeColors = Array("black", "white", "silver", "blue", "red", "green")

  // ------------------------------------------------------------- plumbing --

  /** splitmix64 seed mixer: sequential (seed, cid) seeds fed straight into
    * java.util.Random correlate badly in their first draws, which skews the
    * cluster-size distribution — mix first.
    */
  private[data] def mix(x: Long): Long = {
    var z = x + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  private def rng(parts: Long*): Random =
    new Random(parts.foldLeft(0x51ab3939L)((acc, p) => mix(acc * 31 + p)))

  private def pick(r: Random, a: Array[String]): String = a(r.nextInt(a.length))

  /** Draw a cluster size from a discrete distribution with a uniform draw. */
  private def drawSize(dist: Seq[(Int, Double)], u: Double): Int = {
    var acc = 0.0
    for ((s, p) <- dist) { acc += p; if (u < acc) return s }
    dist.last._1
  }

  /** Typo/noise ops on a whitespace-tokenised string. */
  private[data] def perturbText(s: String, r: Random, typoP: Double, dropP: Double): String = {
    var toks = s.split(" ").filter(_.nonEmpty)
    if (toks.length > 2 && r.nextDouble() < dropP) {
      val i = r.nextInt(toks.length)
      toks = toks.zipWithIndex.filter(_._2 != i).map(_._1)
    }
    toks = toks.map { t =>
      if (t.length >= 4 && r.nextDouble() < typoP) {
        val op = r.nextInt(3)
        val i = 1 + r.nextInt(t.length - 2)
        op match {
          case 0 => t.substring(0, i - 1) + t.charAt(i) + t.charAt(i - 1) + t.substring(i + 1) // swap
          case 1 => t.substring(0, i) + t.substring(i + 1)                                     // delete
          case _ => t.substring(0, i) + t.charAt(i) + t.substring(i)                           // double
        }
      } else t
    }
    toks.mkString(" ")
  }

  /** Base frame of exploded cluster copies: (eid, source, cid, copy, singleton).
    *
    * Sources are assigned per copy by a seeded shuffle of 0..S-1 (wrapping
    * with repeats when a cluster is larger than S, i.e. dirty sources).
    */
  private def copiesFrame(
      spark: SparkSession,
      nTuples: Long,
      nSingletons: Long,
      sizeDist: Seq[(Int, Double)],
      nSources: Int,
      seed: Long,
  ): DataFrame = {
    val copyGen = udf((cid: Long) => {
      val r = rng(seed, 1L, cid)
      val isSingleton = cid >= nTuples
      val size = if (isSingleton) 1 else drawSize(sizeDist, r.nextDouble())
      val srcs = r.shuffle((0 until nSources).toList)
      (0 until size).map(i => (i, srcs(i % nSources)))
    })
    spark
      .range(nTuples + nSingletons)
      .withColumnRenamed("id", "cid")
      .withColumn("cs", explode(copyGen(col("cid"))))
      .select(
        (col("cid") * 16 + col("cs._1")) as "eid",
        col("cs._2") as "source",
        col("cid"),
        col("cs._1") as "copy",
      )
  }

  // ------------------------------------------------------------- datasets --

  /** Geo: 4 sources, attrs (name, longitude, latitude); settlements with
    * abbreviated/typoed names and jittered, variably-formatted coordinates.
    * At scale 1.0: ~820 tuples, ~3,050 entities, ~4,400 pairs (Table III).
    */
  def geo(spark: SparkSession, scale: Double = 1.0, seed: Long = 11L): EmDataset = {
    // Clean sources: cluster sizes never exceed S=4, i.e. at most one copy
    // per source (matching the original multi-source Geo benchmark); the mix
    // lands on ~3 050 entities / ~4 000 pairs per 820 tuples (Table III).
    val nTuples = math.max(1L, (820 * scale).toLong)
    val nSingle = math.max(0L, (102 * scale).toLong)
    val sizeDist = Seq(2 -> 0.10, 3 -> 0.20, 4 -> 0.70)
    val base = copiesFrame(spark, nTuples, nSingle, sizeDist, 4, seed)
    val attrGen = udf((cid: Long, copy: Int) => {
      val rc = rng(seed, 2L, cid)
      val re = rng(seed, 3L, cid, copy.toLong)
      var name = {
        val b = pick(rc, geoSylA) +
          (if (rc.nextDouble() < 0.5) pick(rc, geoSylB) else "") +
          pick(rc, geoSylC)
        val p = if (rc.nextDouble() < 0.4) pick(rc, geoPrefix) + " " else ""
        val s = if (rc.nextDouble() < 0.5) " " + pick(rc, geoSuffix) else ""
        p + b + s
      }
      // copy-level noise: abbreviation, typos, suffix drop
      if (copy > 0) {
        if (name.contains(" ") && re.nextDouble() < 0.15) {
          val parts = name.split(" ")
          parts(0) = parts(0).take(1) + "."
          name = parts.mkString(" ")
        }
        name = perturbText(name, re, typoP = 0.12, dropP = 0.05)
      }
      // Coordinates are *unreliable across sources* (different datums,
      // precisions, plain errors) — that unreliability is why the paper's
      // EER drops them; degree-scale per-copy noise reproduces it.
      val lonBase = -180.0 + rc.nextDouble() * 360.0
      val latBase = -90.0 + rc.nextDouble() * 180.0
      val (lon, lat) =
        if (copy > 0 && re.nextDouble() < 0.10)
          // occasionally a source records plain wrong coordinates
          (-180.0 + re.nextDouble() * 360.0, -90.0 + re.nextDouble() * 180.0)
        else
          (lonBase + re.nextGaussian() * 3.0, latBase + re.nextGaussian() * 2.0)
      val fmt = if (re.nextDouble() < 0.5) "%.4f" else "%.2f"
      (name, fmt.format(lon), fmt.format(lat))
    })
    val df = base
      .withColumn("a", attrGen(col("cid"), col("copy")))
      .select(col("eid"), col("source"), col("cid"),
        col("a._1") as "name", col("a._2") as "longitude", col("a._3") as "latitude")
    EmDataset("Geo", df, Seq("name", "longitude", "latitude"), 4)
  }

  /** Music-N family: 5 sources, attrs (id, number, title, length, artist,
    * album, year, language). `id` is per-entity gibberish (uninformative —
    * EER must reject it); title/artist/album are the informative attributes
    * (EER must keep them, Table VII). At nTuples=5000 this is Music-20
    * (~19.4 k entities, ~16.3 k pairs).
    */
  def music(spark: SparkSession, nTuples: Long = 5000L, seed: Long = 22L, name: String = "Music-20"): EmDataset = {
    val nSingle = (nTuples * 0.975).toLong
    val sizeDist = Seq(2 -> 0.45, 3 -> 0.30, 4 -> 0.15, 5 -> 0.10)
    val base = copiesFrame(spark, nTuples, nSingle, sizeDist, 5, seed)
    val attrGen = udf((cid: Long, copy: Int) => {
      val rc = rng(seed, 2L, cid)
      val re = rng(seed, 3L, cid, copy.toLong)
      val titleLen = 2 + rc.nextInt(3)
      var title = (0 until titleLen).map(_ => pick(rc, musicWords)).mkString(" ")
      var artist = pick(rc, artistFirst) + " " + pick(rc, artistLast)
      var album = pick(rc, musicWords) + (if (rc.nextDouble() < 0.5) " " + pick(rc, musicWords) else "")
      val secs = 90 + rc.nextInt(300)
      val year = 1960 + rc.nextInt(60)
      val lang = pick(rc, languages)
      if (copy > 0) {
        title = perturbText(title, re, typoP = 0.25, dropP = 0.15)
        artist = perturbText(artist, re, typoP = 0.15, dropP = 0.0)
        album = perturbText(album, re, typoP = 0.15, dropP = 0.05)
      }
      // The non-text metadata is *inconsistent across sources* (as in the
      // original MSCD music corpus): track numbers depend on the release,
      // lengths differ by edition, year/language tags are often wrong —
      // which is exactly why EER must learn to drop these attributes.
      val number = 1 + re.nextInt(20)
      val secsE = secs + (if (re.nextDouble() < 0.5) re.nextInt(21) - 10 else 0)
      val yearE = year + (if (re.nextDouble() < 0.3) re.nextInt(3) - 1 else 0)
      val langE = if (re.nextDouble() < 0.2) pick(re, languages) else lang
      val id = "wom" + (math.abs(re.nextLong()) % 100000000L + 10000000L).toString
      (id, number.toString, title, f"${secsE / 60}%02d:${secsE % 60}%02d", artist, album, yearE.toString, langE)
    })
    val df = base
      .withColumn("a", attrGen(col("cid"), col("copy")))
      .select(col("eid"), col("source"), col("cid"),
        col("a._1") as "id", col("a._2") as "number", col("a._3") as "title",
        col("a._4") as "length", col("a._5") as "artist", col("a._6") as "album",
        col("a._7") as "year", col("a._8") as "language")
    EmDataset(name, df, Seq("id", "number", "title", "length", "artist", "album", "year", "language"), 5)
  }

  /** Person: 5 sources, attrs (givenname, surname, suburb, postcode); name
    * typos and digit-corrupted postcodes. At scale 1.0: 500 k tuples / 5 M
    * entities (paper); run scaled-down per DESIGN.md.
    */
  def person(spark: SparkSession, scale: Double = 1.0, seed: Long = 33L): EmDataset = {
    val nTuples = math.max(1L, (500000 * scale).toLong)
    val nSingle = (nTuples * 6.0).toLong // ~3M singletons at scale 1.0
    val sizeDist = Seq(2 -> 0.10, 3 -> 0.20, 4 -> 0.30, 5 -> 0.40)
    val base = copiesFrame(spark, nTuples, nSingle, sizeDist, 5, seed)
    val attrGen = udf((cid: Long, copy: Int) => {
      val rc = rng(seed, 2L, cid)
      val re = rng(seed, 3L, cid, copy.toLong)
      var given = pick(rc, personFirst)
      var sur = pick(rc, personLast)
      var suburb = pick(rc, suburbs)
      var post = (1000 + rc.nextInt(9000)).toString
      if (copy > 0) {
        given = perturbText(given, re, typoP = 0.30, dropP = 0.0)
        sur = perturbText(sur, re, typoP = 0.30, dropP = 0.0)
        suburb = perturbText(suburb, re, typoP = 0.20, dropP = 0.0)
        if (re.nextDouble() < 0.15) {
          val i = re.nextInt(4)
          post = post.substring(0, i) + re.nextInt(10).toString + post.substring(i + 1)
        }
      }
      (given, sur, suburb, post)
    })
    val df = base
      .withColumn("a", attrGen(col("cid"), col("copy")))
      .select(col("eid"), col("source"), col("cid"),
        col("a._1") as "givenname", col("a._2") as "surname",
        col("a._3") as "suburb", col("a._4") as "postcode")
    EmDataset("Person", df, Seq("givenname", "surname", "suburb", "postcode"), 5)
  }

  /** Shopee: 20 sources, single attr (title); product titles assembled from a
    * small shared spec-token pool so *different* products overlap heavily —
    * reproducing the paper's observation that all methods score low here.
    * At scale 1.0: ~11 k tuples / ~33 k entities / ~50 k pairs.
    */
  def shopee(spark: SparkSession, scale: Double = 1.0, seed: Long = 44L): EmDataset = {
    val nTuples = math.max(1L, (10962 * scale).toLong)
    val sizeDist = Seq(2 -> 0.55, 3 -> 0.25, 4 -> 0.10, 6 -> 0.06, 10 -> 0.04)
    val base = copiesFrame(spark, nTuples, 0L, sizeDist, 20, seed)
    val attrGen = udf((cid: Long, copy: Int) => {
      val rc = rng(seed, 2L, cid)
      val re = rng(seed, 3L, cid, copy.toLong)
      val brand = pick(rc, shopeeBrands)
      val cat = pick(rc, shopeeCats)
      val model = "" + ('a' + rc.nextInt(26)).toChar + (1 + rc.nextInt(9)) * 100
      val nSpec = 3 + rc.nextInt(4)
      var specs = (0 until nSpec).map(_ => pick(rc, shopeeSpecs)).toArray
      val color = pick(rc, shopeeColors)
      if (copy > 0) {
        // drop up to 2 spec tokens, maybe add a random one, typo the brand
        val keep = specs.filter(_ => re.nextDouble() > 0.3)
        specs = if (keep.nonEmpty) keep else specs.take(1)
        if (re.nextDouble() < 0.4) specs = specs :+ pick(re, shopeeSpecs)
      }
      var title = (Array(brand, cat, model) ++ specs :+ color).mkString(" ")
      if (copy > 0) title = perturbText(title, re, typoP = 0.10, dropP = 0.0)
      Tuple1(title)
    })
    val df = base
      .withColumn("a", attrGen(col("cid"), col("copy")))
      .select(col("eid"), col("source"), col("cid"), col("a._1") as "title")
    EmDataset("Shopee", df, Seq("title"), 20)
  }

  // ---------------------------------------------------------------- stats --

  /** Table III statistics of a generated dataset. */
  def stats(ds: EmDataset): DatasetStats = {
    val entities = ds.df.count()
    val byCluster = ds.df.groupBy("cid").count()
    val tuples = byCluster.filter(col("count") >= 2).count()
    val pairs = byCluster
      .select(sum((col("count") * (col("count") - 1) / 2).cast("long")).cast("long") as "p")
      .collect()(0).getLong(0)
    DatasetStats(ds.name, ds.nSources, ds.attrs.size, entities, tuples, pairs)
  }
}
