package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Boosting objectives (paper Appendix B, Table 3). `grad` is the NEGATIVE
  * gradient (so leaf p* = G/(H+β) and predictions move toward y), matching
  * LightGBM's practical (non-rigorous) formulas noted by the paper — e.g.
  * L1/huber use unit hessians.
  */
trait Loss extends Serializable {
  def name: String
  /** negative gradient g(y, pred) */
  def grad(y: Column, pred: Column): Column
  def hess(y: Column, pred: Column): Column
  /** per-row loss, for evaluation */
  def loss(y: Column, pred: Column): Column
}

object L2Loss extends Loss {
  val name = "rmse"
  def grad(y: Column, p: Column): Column = y - p
  def hess(y: Column, p: Column): Column = lit(1.0)
  def loss(y: Column, p: Column): Column = pow(y - p, 2.0)
}

object L1Loss extends Loss {
  val name = "mae"
  def grad(y: Column, p: Column): Column = signum(y - p)
  def hess(y: Column, p: Column): Column = lit(1.0)
  def loss(y: Column, p: Column): Column = abs(y - p)
}

final case class HuberLoss(delta: Double = 1.0) extends Loss {
  val name = s"huber($delta)"
  def grad(y: Column, p: Column): Column = {
    val e = y - p
    when(abs(e) <= delta, e).otherwise(lit(delta) * signum(e))
  }
  def hess(y: Column, p: Column): Column = lit(1.0)
  def loss(y: Column, p: Column): Column = {
    val e = y - p
    when(abs(e) <= delta, lit(0.5) * e * e).otherwise(lit(delta) * (abs(e) - lit(0.5) * delta))
  }
}

final case class FairLoss(c: Double = 1.0) extends Loss {
  val name = s"fair($c)"
  def grad(y: Column, p: Column): Column = {
    val e = y - p
    lit(c) * e / (abs(e) + c)
  }
  def hess(y: Column, p: Column): Column = {
    val e = y - p
    lit(c * c) / pow(abs(e) + c, 2.0)
  }
  def loss(y: Column, p: Column): Column = {
    val e = y - p
    lit(c) * abs(e) - lit(c * c) * log(abs(e) / c + 1.0)
  }
}
