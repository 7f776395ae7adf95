package repro.text

/** The paper's softened-FD similarity (Section 4).
  *
  * Strings:   Sim(a,b) = 1 − 2·ED(a,b) / (len(a)+len(b))   (clamped to [0,1])
  * Numerics:  Sim(a,b) = 1 − |a−b| / ((|a|+|b|)/2)          (clamped to [0,1])
  *
  * A null/empty observation has no evidence value; we define its similarity
  * to anything as 0 (and 1 for two equal nulls, matching strict FD semantics).
  */
object Similarity {

  def string(a: String, b: String): Double = {
    if (a == null || b == null) return if (a == null && b == null) 1.0 else 0.0
    if (a.isEmpty || b.isEmpty) return if (a.isEmpty && b.isEmpty) 1.0 else 0.0
    if (a == b) return 1.0
    val d = EditDistance(a, b)
    clamp(1.0 - 2.0 * d / (a.length + b.length))
  }

  def numeric(a: Double, b: Double): Double = {
    if (a == b) return 1.0
    val denom = (math.abs(a) + math.abs(b)) / 2.0
    if (denom == 0.0) return 0.0
    clamp(1.0 - math.abs(a - b) / denom)
  }

  /** Dispatch: numeric similarity when both parse as doubles, else string. */
  def value(a: String, b: String): Double = {
    val na = parse(a); val nb = parse(b)
    if (na.isDefined && nb.isDefined) numeric(na.get, nb.get) else string(a, b)
  }

  private def parse(s: String): Option[Double] =
    if (s == null || s.isEmpty) None else s.toDoubleOption

  private def clamp(x: Double): Double = math.min(1.0, math.max(0.0, x))
}
