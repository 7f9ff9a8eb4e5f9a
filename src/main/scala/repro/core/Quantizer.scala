package repro.core

/** Value quantization to boost duplicate density (paper §3.1).
  *
  * "Some insignificant low-order digits of streamed values may be zeroed out.
  * Often, we consider only the three most significant digits of the original
  * value, which ensures the quantized value within less than 1% relative
  * error."
  */
object Quantizer {

  /** Keep the `digits` most significant decimal digits of `v` (round to
    * nearest); sign is preserved, 0 and non-finite values pass through.
    * With `digits = 3` the relative error is at most 0.5%.
    */
  def quantize(v: Double, digits: Int = 3): Double = {
    require(digits >= 1, s"digits must be >= 1, got $digits")
    if (v == 0.0 || v.isNaN || v.isInfinite) return v
    val a = math.abs(v)
    val exp = math.floor(math.log10(a)).toInt - (digits - 1)
    val scale = math.pow(10.0, exp)
    val q = math.rint(a / scale) * scale
    if (v < 0) -q else q
  }
}
