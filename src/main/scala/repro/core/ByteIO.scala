package repro.core

import java.nio.{ByteBuffer, ByteOrder}

/** Growable little-endian byte writer for compressed-stream headers and
  * payloads. All compressors in this repo serialize through this pair so
  * formats stay self-describing and platform-independent.
  */
final class ByteWriter(initial: Int = 1 << 12) {
  private var buf = new Array[Byte](initial)
  private var pos = 0

  private def ensure(n: Int): Unit =
    if (pos + n > buf.length) {
      var cap = buf.length
      while (cap < pos + n) cap *= 2
      buf = java.util.Arrays.copyOf(buf, cap)
    }

  def writeByte(b: Int): Unit = { ensure(1); buf(pos) = b.toByte; pos += 1 }

  def writeInt(v: Int): Unit = {
    ensure(4)
    buf(pos) = v.toByte; buf(pos + 1) = (v >> 8).toByte
    buf(pos + 2) = (v >> 16).toByte; buf(pos + 3) = (v >> 24).toByte
    pos += 4
  }

  def writeLong(v: Long): Unit = { writeInt(v.toInt); writeInt((v >> 32).toInt) }

  def writeDouble(v: Double): Unit = writeLong(java.lang.Double.doubleToRawLongBits(v))

  def writeFloat(v: Float): Unit = writeInt(java.lang.Float.floatToRawIntBits(v))

  /** Unsigned LEB128 — used for outlier indices and counts. */
  def writeVarInt(value: Long): Unit = {
    var v = value
    require(v >= 0, s"varint must be non-negative: $v")
    while ((v & ~0x7fL) != 0) { writeByte(((v & 0x7f) | 0x80).toInt); v >>>= 7 }
    writeByte(v.toInt)
  }

  def writeBytes(b: Array[Byte]): Unit = { ensure(b.length); System.arraycopy(b, 0, buf, pos, b.length); pos += b.length }

  /** Length-prefixed byte blob. */
  def writeBlob(b: Array[Byte]): Unit = { writeVarInt(b.length.toLong); writeBytes(b) }

  def writeIntArray(a: Array[Int]): Unit = { writeVarInt(a.length.toLong); a.foreach(writeInt) }

  def writeFloatArray(a: Array[Float]): Unit = { writeVarInt(a.length.toLong); a.foreach(writeFloat) }

  def writeDoubleArray(a: Array[Double]): Unit = { writeVarInt(a.length.toLong); a.foreach(writeDouble) }

  def size: Int = pos

  def toBytes: Array[Byte] = java.util.Arrays.copyOf(buf, pos)
}

/** Reader mirroring [[ByteWriter]]. */
final class ByteReader(bytes: Array[Byte]) {
  private val bb = ByteBuffer.wrap(bytes).order(ByteOrder.LITTLE_ENDIAN)

  def readByte(): Int = bb.get() & 0xff
  def readInt(): Int = bb.getInt()
  def readLong(): Long = bb.getLong()
  def readDouble(): Double = bb.getDouble()
  def readFloat(): Float = bb.getFloat()

  def readVarInt(): Long = {
    var shift = 0; var result = 0L; var b = 0
    do {
      b = bb.get() & 0xff
      result |= (b & 0x7fL) << shift
      shift += 7
    } while ((b & 0x80) != 0)
    result
  }

  def readBytes(n: Int): Array[Byte] = { val out = new Array[Byte](n); bb.get(out); out }

  def readBlob(): Array[Byte] = readBytes(readVarInt().toInt)

  def readIntArray(): Array[Int] = Array.fill(readVarInt().toInt)(readInt())

  def readFloatArray(): Array[Float] = Array.fill(readVarInt().toInt)(readFloat())

  def readDoubleArray(): Array[Double] = Array.fill(readVarInt().toInt)(readDouble())

  def remaining: Int = bb.remaining()
}
