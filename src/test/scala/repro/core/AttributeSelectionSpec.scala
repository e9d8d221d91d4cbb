package repro.core

import org.apache.spark.sql.DataFrame
import repro.SparkSpec

class AttributeSelectionSpec extends SparkSpec {

  /** A corpus where `title` carries shared mid-frequency content words and
    * `id` carries unique gibberish — EER must score title ≫ id.
    */
  private def corpus(n: Int = 60): DataFrame = {
    import spark.implicits._
    val words = Array("river", "midnight", "golden", "shadow", "dancing", "broken", "silver", "summer")
    val rnd = new scala.util.Random(3)
    (0 until n).map { i =>
      val title = Seq.fill(3)(words(rnd.nextInt(words.length))).mkString(" ")
      val id = "zx" + (100000 + rnd.nextInt(900000))
      (i.toLong, title, id)
    }.toDF("eid", "title", "id")
  }

  test("informative attribute scores above gibberish id") {
    val sel = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), sampleRatio = 1.0, gamma = 0.5)
    assert(sel.scores("title") > sel.scores("id"),
      s"title=${sel.scores("title")} id=${sel.scores("id")}")
  }

  test("gamma thresholding keeps the informative attribute and drops the id") {
    val sel = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), sampleRatio = 1.0, gamma = 0.5)
    assert(sel.selected == Seq("title"))
  }

  test("gamma = 0 keeps every attribute") {
    val sel = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), sampleRatio = 1.0, gamma = 0.0)
    assert(sel.selected == Seq("title", "id"))
  }

  test("single attribute short-circuits to itself") {
    val sel = AttributeSelection.select(corpus(), "eid", Seq("title"), sampleRatio = 1.0, gamma = 0.9)
    assert(sel.selected == Seq("title"))
  }

  test("selection preserves schema order of kept attributes") {
    import spark.implicits._
    val rnd = new scala.util.Random(5)
    val words = Array("aaa", "bbb", "ccc", "ddd")
    val df = (0 until 40).map { i =>
      (i.toLong, words(rnd.nextInt(4)) + " " + words(rnd.nextInt(4)),
        words(rnd.nextInt(4)), "u" + rnd.nextInt(1000000))
    }.toDF("eid", "t1", "t2", "junk")
    val sel = AttributeSelection.select(df, "eid", Seq("t1", "t2", "junk"), 1.0, 0.2)
    assert(sel.selected == sel.selected.sortBy(Seq("t1", "t2", "junk").indexOf(_)))
  }

  test("at least one attribute is always selected (argmax fallback)") {
    val sel = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), 1.0, gamma = 5.0)
    assert(sel.selected.nonEmpty)
    assert(sel.selected == Seq(sel.scores.maxBy(_._2)._1))
  }

  test("scores are reported for every candidate attribute") {
    val sel = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), 1.0, 0.5)
    assert(sel.scores.keySet == Set("title", "id"))
    assert(sel.scores.values.forall(s => s >= 0.0 && s <= 2.0))
  }

  test("sampling ratio below 1 still ranks title over id") {
    val sel = AttributeSelection.select(corpus(200), "eid", Seq("title", "id"), sampleRatio = 0.3, gamma = 0.5)
    assert(sel.scores("title") > sel.scores("id"))
  }

  test("selection is deterministic in the seed") {
    val a = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), 0.5, 0.5, seed = 9L)
    val b = AttributeSelection.select(corpus(), "eid", Seq("title", "id"), 0.5, 0.5, seed = 9L)
    assert(a.scores == b.scores && a.selected == b.selected)
  }
}
