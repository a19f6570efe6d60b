package repro.graphgen

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Degree-distribution families for the planted generator (§5).
  *
  * A family maps a uniform draw u ∈ [0,1) to a node *rank* within a class
  * of a given size; endpoints of generated edges are drawn by this
  * inverse-CDF, so a node's expected degree is proportional to its rank
  * weight. ``Uniform`` gives flat degrees; ``PowerLaw(0.3)`` matches the
  * paper's power-law experiments (rank weight ∝ rank^−0.3).
  */
sealed trait DegreeDist {

  /** Column expression: rank ∈ [0, classSize) drawn from this family. */
  def rank(u: Column, classSize: Long): Column
}

object DegreeDist {

  case object Uniform extends DegreeDist {
    def rank(u: Column, classSize: Long): Column =
      least(lit(classSize - 1), floor(u * classSize)).cast("long")
  }

  /** Rank weight ∝ (rank+1)^−gamma; inverse CDF of the continuous
    * approximation is rank = classSize · u^(1/(1−gamma)).
    */
  final case class PowerLaw(gamma: Double = 0.3) extends DegreeDist {
    require(gamma > 0 && gamma < 1, s"need 0 < gamma < 1, got $gamma")
    def rank(u: Column, classSize: Long): Column =
      least(lit(classSize - 1), floor(pow(u, 1.0 / (1.0 - gamma)) * classSize)).cast("long")
  }
}
