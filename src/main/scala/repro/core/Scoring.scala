package repro.core

/** Cycle scoring functions σ(n) from the CycleRank definition (Eq. 1).
  *
  * σ weights each cycle by its length n (in edges); shorter cycles mean a
  * stronger relationship. The paper's default for Wikipedia is the
  * exponential damping `σ(n) = e^{-n}`.
  */
sealed abstract class Scoring(val name: String) extends Serializable {
  /** Weight assigned to every node of a cycle of length `n` (n ≥ 2). */
  def sigma(n: Int): Double
}

object Scoring {
  /** `σ(n) = e^{-n}` — the paper's default. */
  case object Exponential extends Scoring("exp") {
    def sigma(n: Int): Double = math.exp(-n.toDouble)
  }
  /** `σ(n) = 1/n`. */
  case object Linear extends Scoring("lin") {
    def sigma(n: Int): Double = 1.0 / n
  }
  /** `σ(n) = 1/n²`. */
  case object Quadratic extends Scoring("quad") {
    def sigma(n: Int): Double = 1.0 / (n.toDouble * n)
  }
  /** `σ(n) = 1` — raw cycle counts. */
  case object Constant extends Scoring("const") {
    def sigma(n: Int): Double = 1.0
  }

  val all: Seq[Scoring] = Seq(Exponential, Linear, Quadratic, Constant)

  def byName(name: String): Scoring =
    all.find(_.name == name).getOrElse(
      throw new IllegalArgumentException(
        s"unknown scoring '$name'; known: ${all.map(_.name).mkString(", ")}"))
}
