package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class HuffmanSpec extends AnyFunSuite {

  private def roundTrip(symbols: Array[Int]): Unit = {
    val enc = Huffman.encode(symbols)
    val dec = Huffman.decode(enc)
    assert(dec.toSeq == symbols.toSeq)
  }

  test("empty input") { roundTrip(Array.emptyIntArray) }

  test("single symbol repeated") { roundTrip(Array.fill(100)(42)) }

  test("one occurrence of one symbol") { roundTrip(Array(7)) }

  test("two symbols") { roundTrip(Array(1, 2, 1, 1, 2, 1)) }

  test("skewed distribution compresses below 8 bits/symbol") {
    val rnd = new Random(1)
    val symbols = Array.fill(100000)(if (rnd.nextDouble() < 0.95) 5 else rnd.nextInt(20))
    val enc = Huffman.encode(symbols)
    roundTrip(symbols)
    // Huffman's floor is 1 bit/symbol (the Zstd stage of the pipeline
    // squeezes below that); allow table overhead on top.
    assert(enc.length * 8.0 / symbols.length < 1.5,
      s"expected < 1.5 bit/sym for 95%-skewed input, got ${enc.length * 8.0 / symbols.length}")
  }

  test("uniform distribution round-trips") {
    val rnd = new Random(2)
    roundTrip(Array.fill(10000)(rnd.nextInt(256)))
  }

  test("large alphabet (quantizer-style codes around radius)") {
    val rnd = new Random(3)
    val radius = 32768
    val symbols = Array.fill(50000)(radius + (rnd.nextGaussian() * 30).toInt)
    roundTrip(symbols)
  }

  test("symbols including zero (outlier escape code)") {
    roundTrip(Array(0, 5, 0, 5, 5, 0, 12))
  }

  test("negative symbols rejected") {
    intercept[IllegalArgumentException](Huffman.encode(Array(-1)))
  }

  test("entropy of constant stream is 0") {
    assert(Huffman.entropyBits(Array.fill(10)(3)) == 0.0)
  }

  test("entropy of fair coin is 1 bit") {
    val s = Array.tabulate(1000)(i => i % 2)
    assert(math.abs(Huffman.entropyBits(s) - 1.0) < 1e-9)
  }

  test("entropy of uniform 4-symbol stream is 2 bits") {
    val s = Array.tabulate(1000)(i => i % 4)
    assert(math.abs(Huffman.entropyBits(s) - 2.0) < 1e-9)
  }

  test("encoded size tracks entropy for geometric distribution") {
    val rnd = new Random(4)
    val symbols = Array.fill(100000) {
      var k = 0
      while (rnd.nextDouble() < 0.5 && k < 30) k += 1
      k
    }
    val enc = Huffman.encode(symbols)
    val bitsPerSym = enc.length * 8.0 / symbols.length
    val h = Huffman.entropyBits(symbols)
    assert(bitsPerSym < h + 1.0, s"huffman $bitsPerSym should be within 1 bit of entropy $h")
  }

  test("randomized fuzz (seeded)") {
    val rnd = new Random(5)
    for (_ <- 0 until 10) {
      val n = rnd.nextInt(2000)
      val alphabet = 1 + rnd.nextInt(500)
      roundTrip(Array.fill(n)(rnd.nextInt(alphabet)))
    }
  }
}

class LosslessSpec extends AnyFunSuite {

  test("round-trip small") {
    val data = "hello zstd world".getBytes
    assert(Lossless.decompress(Lossless.compress(data)).toSeq == data.toSeq)
  }

  test("round-trip empty") {
    assert(Lossless.decompress(Lossless.compress(Array.emptyByteArray)).isEmpty)
  }

  test("round-trip binary with all byte values") {
    val data = Array.tabulate[Byte](4096)(i => (i % 256).toByte)
    assert(Lossless.decompress(Lossless.compress(data)).toSeq == data.toSeq)
  }

  test("compresses repetitive data substantially") {
    val data = Array.fill[Byte](100000)(7)
    val c = Lossless.compress(data)
    assert(c.length < data.length / 50)
    assert(Lossless.decompress(c).toSeq == data.toSeq)
  }

  test("random data round-trips (seeded)") {
    val rnd = new Random(6)
    val data = Array.fill[Byte](50000)(rnd.nextInt(256).toByte)
    assert(Lossless.decompress(Lossless.compress(data)).toSeq == data.toSeq)
  }
}
