package repro.bench

import repro.SparkSpec
import repro.expts.{Datasets, Harness, PaperNumbers, Tables}

/** Table III bench: regenerates the dataset-statistics table and checks the
  * generated statistics track the paper's (proportionally for the scaled
  * datasets).
  */
class TableIIIBench extends SparkSpec {
  test("Table III — dataset statistics (ours vs paper)") {
    val out = Tables.tableIII(spark)
    println(out)
    // Shape assertions: paper-scale datasets within tolerance (skipped when
    // REPRO_BENCH_FAST shrinks every dataset).
    if (!sys.env.get("REPRO_BENCH_FAST").contains("1")) {
      import repro.data.EmDataGen
      val geo = EmDataGen.stats(Datasets.geo(spark).ds)
      assert(math.abs(geo.entities - 3054).toDouble / 3054 < 0.15)
      val shopee = EmDataGen.stats(Datasets.shopee(spark).ds)
      assert(math.abs(shopee.entities - 32563).toDouble / 32563 < 0.15)
    }
  }
}

/** Table IV bench: the effectiveness matrix (all methods × all datasets).
  * The heavy runs are shared with Tables V/VI via the ExperimentCache.
  */
class TableIVBench extends SparkSpec {
  test("Table IV — effectiveness matrix (ours vs paper)") {
    val out = Tables.tableIV(spark)
    println(out)
    val outs = Tables.ExperimentCache.outcomes(spark)
    val multi = outs.filter(o => o.method == "MultiEM" && o.tuple.nonEmpty)
    assert(multi.size == 6, "MultiEM must produce scores on all six datasets")

    // Paper shape 1: MultiEM beats every baseline that ran, on average F1.
    val base = outs.filter(o => !o.method.startsWith("MultiEM") && o.tuple.nonEmpty)
    val multiAvg = multi.map(_.tuple.get.f1).sum / multi.size
    val baseAvg = base.map(_.tuple.get.f1).sum / math.max(1, base.size)
    assert(multiAvg > baseAvg, f"MultiEM avg $multiAvg%.1f vs baselines avg $baseAvg%.1f")

    if (!sys.env.get("REPRO_BENCH_FAST").contains("1")) {
      // Paper shape 2: the large datasets have NO feasible baseline.
      for (d <- Seq("Music-2000", "Person"); o <- outs if o.dataset == d && !o.method.startsWith("MultiEM"))
        assert(o.note.nonEmpty, s"${o.method} should be gated on $d")

      // Paper shape 3: Shopee is the hardest dataset for MultiEM.
      val shopeeF1 = multi.find(_.dataset == "Shopee").get.tuple.get.f1
      assert(multi.forall(o => o.dataset == "Shopee" || o.tuple.get.f1 >= shopeeF1 - 5))
    }
  }
}

/** Table V bench: the running-time matrix. */
class TableVBench extends SparkSpec {
  test("Table V — running time (ours vs paper)") {
    val out = Tables.tableV(spark)
    println(out)
    val outs = Tables.ExperimentCache.outcomes(spark)
    val multi = outs.filter(o => o.method == "MultiEM" && o.seconds.nonEmpty)
    assert(multi.size == 6)
    // Paper shape: MultiEM is the fastest feasible method on every dataset
    // where baselines ran at all (the paper reports ~170× speed-ups; exact
    // factors differ across substrates).
    for (d <- Seq("Geo", "Music-20", "Shopee")
         if !sys.env.get("REPRO_BENCH_FAST").contains("1")) {
      val m = multi.find(_.dataset == d).get.seconds.get
      val bs = outs.filter(o => o.dataset == d && !o.method.startsWith("MultiEM") && o.seconds.nonEmpty)
      assert(bs.nonEmpty)
      val slowest = bs.map(_.seconds.get).max
      assert(m < slowest, s"$d: MultiEM ${m}s not under slowest baseline ${slowest}s")
    }
  }
}

/** Table VI bench: the memory-usage matrix (peak JVM heap as RSS proxy). */
class TableVIBench extends SparkSpec {
  test("Table VI — memory usage (ours vs paper)") {
    val out = Tables.tableVI(spark)
    println(out)
    val outs = Tables.ExperimentCache.outcomes(spark)
    val multi = outs.filter(o => o.method == "MultiEM" && o.peakGB.nonEmpty)
    assert(multi.size == 6)
    assert(multi.forall(_.peakGB.get > 0.0))
  }
}

/** Table VII bench: EER-selected attributes per dataset. */
class TableVIIBench extends SparkSpec {
  test("Table VII — automated selected attributes (ours vs paper)") {
    val out = Tables.tableVII(spark)
    println(out)
    // The music family must keep exactly title/artist/album, Geo just name,
    // Shopee its single title — as in the paper. (Person deviates: our
    // encoder demotes the numeric postcode; see EXPERIMENTS.md.)
    assert(out.contains("Geo"))
    val lines = out.linesIterator.toSeq
    def oursFor(ds: String): String =
      lines.find(l => l.startsWith(ds)).get.split("ours:")(1).trim
    assert(oursFor("Geo") == "name")
    assert(oursFor("Music-20") == "title, artist, album")
    assert(oursFor("Music-200") == "title, artist, album")
    assert(oursFor("Music-2000") == "title, artist, album")
    assert(oursFor("Shopee") == "title")
  }
}
