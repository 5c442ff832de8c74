package repro.mpc

/** Fixed-point encoding of relation values inside MPC.
  *
  * Secret sharing works over the ring Z_2^64; relation values (which are
  * doubles at the Spark layer) are encoded as 64-bit fixed-point with a
  * 2^16 scale — the same approach real Sharemind takes for non-integer
  * arithmetic. Integer-valued data round-trips exactly for |x| < 2^45, so
  * count/sum queries match the DuckDB oracle bit-for-bit; genuine fractions
  * (e.g. an HHI share) carry ~1.5e-5 granularity.
  */
object Fixed {
  val ScaleBits: Int = 16
  val Scale: Long = 1L << ScaleBits

  /** Largest encodable magnitude; beyond this, sums/products risk wrap. */
  val MaxAbs: Double = math.pow(2, 45)

  def encode(x: Double): Long = {
    require(!x.isNaN && !x.isInfinite, s"cannot encode $x")
    require(math.abs(x) <= MaxAbs, s"fixed-point overflow: |$x| > 2^45")
    math.rint(x * Scale).toLong
  }

  def decode(v: Long): Double = v.toDouble / Scale

  /** Rescale after a fixed-point multiply: (a*2^16)(b*2^16) -> ab*2^16. */
  def rescale(prod: Long): Long = prod >> ScaleBits

  /** A public constant larger than any encoded data value; used to build
    * composite sort keys that push invalid/padded rows to the end.
    */
  val Big: Long = 1L << 62
}
