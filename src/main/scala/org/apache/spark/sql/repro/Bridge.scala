package org.apache.spark.sql.repro

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan
import org.apache.spark.sql.classic

/** `classic.Dataset.ofRows` is `private[sql]`; this bridge lives inside the
  * `org.apache.spark.sql` namespace to expose exactly the one constructor a
  * custom logical operator needs — the same trick third-party Spark
  * extensions use.
  */
object Bridge {
  def ofRows(session: classic.SparkSession, plan: LogicalPlan): DataFrame =
    classic.Dataset.ofRows(session, plan)
}
