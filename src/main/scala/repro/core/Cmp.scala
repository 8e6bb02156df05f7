package repro.core

import org.apache.spark.sql.Column
import repro.core.query._

/** Shared predicate-to-Column translation. */
object Cmp {
  def apply(l: Column, op: CmpOp, r: Column): Column = op match {
    case Lt   => l < r
    case Le   => l <= r
    case Gt   => l > r
    case Ge   => l >= r
    case EqOp => l === r
  }
}
