package repro.core

import repro.SparkSpec

/** Contract tests for the offline driver shared by every method. */
class SegmenterSpec extends SparkSpec {

  /** Stub that emits a fixed CP at configured steps. */
  private final class Stub(emitAt: Map[Int, Long]) extends StreamSegmenter {
    override def name = "stub"
    private var i = -1
    override def update(x: Double): Option[Long] = { i += 1; emitAt.get(i) }
  }

  test("driver collects CPs in order") {
    val seg = new Stub(Map(10 -> 5L, 20 -> 15L))
    val cps = StreamSegmenter.segmentSeries(seg, new Array[Double](30))
    assert(cps == Vector(5L, 15L))
  }

  test("driver deduplicates and sorts") {
    val seg = new Stub(Map(5 -> 9L, 10 -> 3L, 15 -> 9L))
    val cps = StreamSegmenter.segmentSeries(seg, new Array[Double](20))
    assert(cps == Vector(3L, 9L))
  }

  test("driver drops boundary positions") {
    val seg = new Stub(Map(5 -> 0L, 10 -> 19L, 15 -> 25L, 18 -> 7L))
    val cps = StreamSegmenter.segmentSeries(seg, new Array[Double](20))
    assert(cps == Vector(7L, 19L)) // 0 (start), 25 (beyond end) removed
  }

  test("driver feeds every point exactly once") {
    var count = 0
    val seg = new StreamSegmenter {
      override def name = "counter"
      override def update(x: Double): Option[Long] = { count += 1; None }
    }
    StreamSegmenter.segmentSeries(seg, new Array[Double](123))
    assert(count == 123)
  }

  test("empty input yields no CPs") {
    assert(StreamSegmenter.segmentSeries(new Stub(Map.empty), Array.empty[Double]).isEmpty)
  }
}
