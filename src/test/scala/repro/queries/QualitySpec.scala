package repro.queries

import repro.SparkSpec

/** F1 quality-measure tests (Eq. 3). */
class QualitySpec extends SparkSpec {

  test("perfect agreement gives F1 = 1") {
    assert(Quality.f1(Set(1, 2, 3), Set(1, 2, 3)) === 1.0)
  }

  test("both empty counts as perfect") {
    assert(Quality.f1(Set.empty[Int], Set.empty[Int]) === 1.0)
  }

  test("one side empty gives 0") {
    assert(Quality.f1(Set(1), Set.empty[Int]) === 0.0)
    assert(Quality.f1(Set.empty[Int], Set(1)) === 0.0)
  }

  test("disjoint sets give 0") {
    assert(Quality.f1(Set(1, 2), Set(3, 4)) === 0.0)
  }

  test("F1 is the harmonic mean of precision and recall") {
    // ro = {1,2,3,4}, rs = {3,4,5}: P=2/3, R=1/2 => F1 = 4/7
    assert(math.abs(Quality.f1(Set(1, 2, 3, 4), Set(3, 4, 5)) - 4.0 / 7.0) < 1e-12)
  }

  test("F1 is symmetric in precision/recall roles only when sizes match") {
    val a = Quality.f1(Set(1, 2, 3), Set(1, 2))
    val b = Quality.f1(Set(1, 2), Set(1, 2, 3))
    assert(a === b) // harmonic mean symmetry
  }

  test("knnF1 is overlap over k") {
    assert(Quality.knnF1(Seq(1L, 2L, 3L), Seq(2L, 3L, 4L)) === 2.0 / 3.0)
  }

  test("knnF1 requires equal-size non-empty results") {
    intercept[IllegalArgumentException] { Quality.knnF1(Seq(1L), Seq(1L, 2L)) }
    intercept[IllegalArgumentException] { Quality.knnF1(Seq.empty, Seq.empty) }
  }

  test("mean and stddev") {
    assert(Quality.mean(Seq(1.0, 2.0, 3.0)) === 2.0)
    assert(Quality.mean(Seq.empty) === 0.0)
    assert(math.abs(Quality.stddev(Seq(2.0, 4.0, 4.0, 4.0, 5.0, 5.0, 7.0, 9.0)) - 2.138089935) < 1e-6)
    assert(Quality.stddev(Seq(5.0)) === 0.0)
  }
}
