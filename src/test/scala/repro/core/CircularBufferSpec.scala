package repro.core

import repro.SparkSpec
import scala.util.Random

class CircularBufferSpec extends SparkSpec {

  test("empty buffer has size 0 and rejects last") {
    val b = new CircularBuffer(4)
    assert(b.size == 0)
    assert(!b.isFull)
    intercept[IllegalArgumentException](b.last)
  }

  test("rejects non-positive capacity") {
    intercept[IllegalArgumentException](new CircularBuffer(0))
    intercept[IllegalArgumentException](new CircularBuffer(-3))
  }

  test("push below capacity keeps all elements in order") {
    val b = new CircularBuffer(5)
    b.push(1); b.push(2); b.push(3)
    assert(b.size == 3)
    assert(b.toArray.toSeq == Seq(1.0, 2.0, 3.0))
    assert(b.last == 3.0)
  }

  test("push beyond capacity evicts the oldest") {
    val b = new CircularBuffer(3)
    Seq(1, 2, 3, 4, 5).foreach(v => b.push(v.toDouble))
    assert(b.isFull)
    assert(b.toArray.toSeq == Seq(3.0, 4.0, 5.0))
  }

  test("fromEnd indexes backwards from newest") {
    val b = new CircularBuffer(4)
    Seq(10, 20, 30, 40, 50).foreach(v => b.push(v.toDouble))
    assert(b.fromEnd(0) == 50.0)
    assert(b.fromEnd(1) == 40.0)
    assert(b.fromEnd(3) == 20.0)
    intercept[IllegalArgumentException](b.fromEnd(4))
    intercept[IllegalArgumentException](b.fromEnd(-1))
  }

  test("dotFromEnd aligns kernel tail with newest element") {
    val b = new CircularBuffer(4)
    Seq(1, 2, 3, 4).foreach(v => b.push(v.toDouble))
    val (dot, mass) = b.dotFromEnd(Array(0.0, 0.0, 0.0, 1.0))
    assert(dot == 4.0)
    assert(mass == 1.0)
  }

  test("dotFromEnd with short buffer uses trailing kernel portion") {
    val b = new CircularBuffer(5)
    b.push(2.0); b.push(3.0)
    val (dot, mass) = b.dotFromEnd(Array(10.0, 10.0, 10.0, 1.0, 2.0))
    // newest (3.0) gets kernel(4)=2, previous (2.0) gets kernel(3)=1
    assert(dot == 3.0 * 2 + 2.0 * 1)
    assert(mass == 3.0)
  }

  test("pushAll keeps only the last capacity values") {
    val b = new CircularBuffer(3)
    b.pushAll(Array(1, 2, 3, 4, 5, 6).map(_.toDouble))
    assert(b.toArray.toSeq == Seq(4.0, 5.0, 6.0))
  }

  // randomized equivalence against a naive reference implementation
  for (trial <- 1 to 10) {
    test(s"random trial $trial matches naive sliding window reference") {
      val rng = new Random(trial)
      val cap = 1 + rng.nextInt(20)
      val b = new CircularBuffer(cap)
      val ref = scala.collection.mutable.ArrayBuffer.empty[Double]
      for (_ <- 0 until 200) {
        val v = rng.nextDouble() * 100 - 50
        b.push(v); ref += v
        val window = ref.takeRight(cap)
        assert(b.size == window.size)
        assert(b.toArray.toSeq == window.toSeq)
        assert(b.last == window.last)
        // random kernel dot check
        val klen = 1 + rng.nextInt(cap)
        val kernel = Array.fill(klen)(rng.nextDouble())
        val (dot, mass) = b.dotFromEnd(kernel)
        val used = math.min(klen, window.size)
        var expDot = 0.0; var expMass = 0.0
        for (j <- 0 until used) {
          expDot += kernel(klen - 1 - j) * window(window.size - 1 - j)
          expMass += kernel(klen - 1 - j)
        }
        assert(math.abs(dot - expDot) < 1e-9, s"dot $dot vs $expDot")
        assert(math.abs(mass - expMass) < 1e-9)
      }
    }
  }

  test("buffer is serializable (streaming state requirement)") {
    val b = new CircularBuffer(8)
    (1 to 10).foreach(v => b.push(v.toDouble))
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(b)
    val b2 = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[CircularBuffer]
    assert(b2.toArray.toSeq == b.toArray.toSeq)
  }
}
