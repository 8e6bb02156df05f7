package repro.storage

/** Variable-width offset-list encoding (§4.3): every offset in a list is
  * encoded with the maximum byte-width any offset in that list needs, and
  * that width is stored as a single-byte header at the start of the list.
  */
object OffsetListCodec {

  def widthFor(maxOffset: Int): Int = {
    require(maxOffset >= 0)
    if (maxOffset < (1 << 8)) 1
    else if (maxOffset < (1 << 16)) 2
    else if (maxOffset < (1 << 24)) 3
    else 4
  }

  /** Encode `offsets` as [width: 1 byte][offset: width bytes]... (little endian). */
  def encode(offsets: Array[Int]): Array[Byte] = {
    val w = if (offsets.isEmpty) 1 else widthFor(offsets.max)
    val out = new Array[Byte](1 + w * offsets.length)
    out(0) = w.toByte
    var i = 0
    while (i < offsets.length) {
      var v = offsets(i)
      var b = 0
      while (b < w) {
        out(1 + i * w + b) = (v & 0xff).toByte
        v >>>= 8
        b += 1
      }
      i += 1
    }
    out
  }

  def width(encoded: Array[Byte]): Int = encoded(0).toInt

  def length(encoded: Array[Byte]): Int = (encoded.length - 1) / width(encoded)

  /** Read the i-th offset without materializing the whole list. */
  def get(encoded: Array[Byte], i: Int): Int = {
    val w = encoded(0).toInt
    var v = 0
    var b = 0
    while (b < w) {
      v |= (encoded(1 + i * w + b) & 0xff) << (8 * b)
      b += 1
    }
    v
  }

  def decode(encoded: Array[Byte]): Array[Int] = {
    val n = length(encoded)
    val out = new Array[Int](n)
    var i = 0
    while (i < n) { out(i) = get(encoded, i); i += 1 }
    out
  }
}
