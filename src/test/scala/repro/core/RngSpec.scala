package repro.core

import repro.SparkSpec

class RngSpec extends SparkSpec {

  test("same seed yields the same sequence") {
    val a = new Rng(123)
    val b = new Rng(123)
    assert((1 to 100).map(_ => a.nextLong()) == (1 to 100).map(_ => b.nextLong()))
  }

  test("different seeds yield different sequences") {
    val a = new Rng(1)
    val b = new Rng(2)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("zero seed is remapped, not stuck at zero") {
    val r = new Rng(0)
    assert((1 to 5).map(_ => r.nextLong()).distinct.size == 5)
  }

  test("nextInt respects the bound") {
    val r = new Rng(5)
    for (_ <- 1 to 2000) {
      val v = r.nextInt(7)
      assert(v >= 0 && v < 7)
    }
  }

  test("nextInt rejects non-positive bounds") {
    intercept[IllegalArgumentException] { new Rng(1).nextInt(0) }
    intercept[IllegalArgumentException] { new Rng(1).nextInt(-3) }
  }

  test("nextInt hits every residue class") {
    val r = new Rng(6)
    val seen = (1 to 1000).map(_ => r.nextInt(5)).toSet
    assert(seen == Set(0, 1, 2, 3, 4))
  }

  test("nextDouble stays in [0, 1) with a sane mean") {
    val r = new Rng(7)
    val xs = Array.fill(20000)(r.nextDouble())
    assert(xs.forall(v => v >= 0.0 && v < 1.0))
    assert(math.abs(xs.sum / xs.length - 0.5) < 0.02)
  }

  test("nextGaussian has approximately standard moments") {
    val r = new Rng(8)
    val xs = Array.fill(30000)(r.nextGaussian())
    val mean = xs.sum / xs.length
    val variance = xs.map(v => (v - mean) * (v - mean)).sum / xs.length
    assert(math.abs(mean) < 0.03, s"mean=$mean")
    assert(math.abs(variance - 1.0) < 0.05, s"var=$variance")
  }

  test("rng survives java serialization (streaming state requirement)") {
    val r = new Rng(9)
    r.nextLong()
    val bytes = {
      val bos = new java.io.ByteArrayOutputStream()
      val oos = new java.io.ObjectOutputStream(bos)
      oos.writeObject(r); oos.close(); bos.toByteArray
    }
    val r2 = new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bytes))
      .readObject().asInstanceOf[Rng]
    assert(r.nextLong() == r2.nextLong())
  }
}
