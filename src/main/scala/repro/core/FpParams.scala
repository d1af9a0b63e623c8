package repro.core

/** IEEE-754 binary64 parameters for the RSUM algorithm (paper §III, Table I).
  *
  * `M` is the number of explicit mantissa bits, so `ulp(x) = 2^(E-M)` for
  * `x = 1.f * 2^E`. `W` is the log2 ratio between two consecutive extractors
  * (the paper's recommended value for double precision). `NB` is the tile
  * size between carry-bit propagations in the batched kernel; the per-value
  * drift of a running sum is at most `2^(W-1) * ulp(S)` and the band
  * `[1.5, 1.75) * ufp` has `0.25 * ufp` of headroom before the exponent
  * could change, so any `NB <= 2^(M-W-1)` is safe — we use `2^(M-W-2)` for
  * margin. `V` is the lane count of the batched ("SIMD") kernel.
  */
object FpD {
  val M: Int = 52
  val W: Int = 40
  val NB: Int = 1 << (M - W - 2) // 1024
  val V: Int = 4

  /** Lowest admissible level-1 extractor exponent (a multiple of W so the
    * global exponent grid stays aligned across independently built states).
    */
  val E1MIN: Int = -960

  /** Clamp for any level exponent: keeps `0.25 * ufp = 2^(e-2)` a normal
    * double. Levels pushed below this are frozen at ELMIN (they then only
    * capture what is representable at that grid; deterministic).
    */
  val ELMIN: Int = -1000
}

/** IEEE-754 binary32 parameters, mirroring [[FpD]] (paper uses W=18 for
  * single precision).
  */
object FpF {
  val M: Int = 23
  val W: Int = 18
  val NB: Int = 1 << (M - W - 2) // 8
  val V: Int = 8
  val E1MIN: Int = -108
  val ELMIN: Int = -120
}
