package repro.baselines

import repro.{SparkSpec, TestUtil}
import repro.TestUtil.{planar, v}
import repro.embed.VecOps

class MscdHacSpec extends SparkSpec {

  test("two tight points below the threshold merge") {
    val labels = MscdHac.cluster(Array(planar(0.0), planar(0.05)), threshold = 0.3)
    assert(labels(0) == labels(1))
  }

  test("two far points stay separate") {
    val labels = MscdHac.cluster(Array(planar(0.0), planar(1.5)), threshold = 0.3)
    assert(labels(0) != labels(1))
  }

  test("three clusters of three resolve correctly") {
    val pts = Seq(0.0, 0.02, 0.04, 1.0, 1.02, 1.04, 2.2, 2.22, 2.24).map(a => planar(a)).toArray
    val labels = MscdHac.cluster(pts, threshold = 0.3)
    assert(labels.slice(0, 3).distinct.length == 1)
    assert(labels.slice(3, 6).distinct.length == 1)
    assert(labels.slice(6, 9).distinct.length == 1)
    assert(Set(labels(0), labels(3), labels(6)).size == 3)
  }

  test("average linkage resists single-link chaining") {
    // A tight pair far from a second tight pair, with a midpoint bridge:
    // single linkage would chain all five; average linkage keeps the two
    // pairs apart at a threshold below the pair-to-pair average distance.
    val pts = Array(
      planar(0.00), planar(0.02),         // cluster A
      planar(0.60),                        // bridge
      planar(1.18), planar(1.20))          // cluster B
    val labels = MscdHac.cluster(pts, threshold = 0.45)
    assert(labels(0) == labels(1))
    assert(labels(3) == labels(4))
    assert(labels(0) != labels(3))
  }

  test("empty and singleton inputs are handled") {
    assert(MscdHac.cluster(Array.empty, 0.5).isEmpty)
    assert(MscdHac.cluster(Array(planar(0.1)), 0.5).sameElements(Array(0)))
  }

  test("threshold zero keeps everything separate") {
    val pts = (0 until 5).map(i => planar(i * 0.3)).toArray
    val labels = MscdHac.cluster(pts, threshold = 0.0)
    assert(labels.distinct.length == 5)
  }

  test("huge threshold merges everything") {
    val pts = (0 until 6).map(i => planar(i * 0.5)).toArray
    val labels = MscdHac.cluster(pts, threshold = 10.0)
    assert(labels.distinct.length == 1)
  }

  test("run() maps labels to tuples with ≥ 2 members") {
    val df = TestUtil.vecDf(spark, Seq(
      1L -> planar(0.0), 2L -> planar(0.03), 9L -> planar(2.0)))
    val out = TestUtil.tupleSet(MscdHac.run(spark, df, threshold = 0.3))
    assert(out == Set(Set(1L, 2L)))
  }

  test("run() enforces the scalability gate") {
    val big = TestUtil.vecDf(spark,
      (0 until 10).map(i => (i.toLong, planar(i * 0.1))))
    // gate is 25 000 — 10 passes; emulate the gate check directly instead
    assert(MscdHac.MaxEntities == 25000)
    assert(MscdHac.run(spark, big, 0.01).count() >= 0)
  }

  test("agrees with exact average-linkage on a brute-force case") {
    // 4 points; verify the dendrogram cut matches hand-computed average
    // linkage: d(01)=0.1, d(23)=0.1, avg cross ≈ 0.9 → threshold 0.5 gives
    // two clusters.
    val pts = Array(planar(0.0), planar(0.1), planar(0.9), planar(1.0))
    val labels = MscdHac.cluster(pts, threshold = 0.5)
    assert(labels(0) == labels(1) && labels(2) == labels(3) && labels(0) != labels(2))
  }
}
