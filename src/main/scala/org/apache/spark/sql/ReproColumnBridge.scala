package org.apache.spark.sql

import org.apache.spark.sql.catalyst.expressions.Expression
import org.apache.spark.sql.classic.ExpressionUtils

/** Bridge into `private[sql]` conversions between [[Column]] and Catalyst
  * [[Expression]] in Spark 4.x classic. Spark 4 routes Column through
  * ColumnNode (for Connect compatibility), so third-party Catalyst
  * expressions need this one-hop bridge to surface as typed Columns.
  */
object ReproColumnBridge {
  def column(e: Expression): Column = ExpressionUtils.column(e)
  def expression(c: Column): Expression = ExpressionUtils.expression(c)
}
