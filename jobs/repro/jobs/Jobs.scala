package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.harness.{Experiments, Report, TableFormat}

/** Shared bootstrap for the spark-submit entrypoints: one main per
  * reproduced exhibit (DESIGN.md §4). Example:
  *
  * {{{
  * spark-submit --class repro.jobs.Table2Job repro.jar
  * }}}
  */
object JobUtil {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def emit(t: (String, Seq[String], Seq[Seq[String]])): Unit =
    TableFormat.emit(t._1, t._2, t._3)
}

object Fig10Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig10(Experiments.fig10(JobUtil.session("grasp-fig10"))))
}

object Fig11Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig11(Experiments.fig11(JobUtil.session("grasp-fig11"))))
}

object Fig12Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig12(Experiments.fig12(JobUtil.session("grasp-fig12"))))
}

object Fig14Job {
  def main(args: Array[String]): Unit = {
    val (base, cases) = Experiments.fig14(JobUtil.session("grasp-fig14"))
    JobUtil.emit(Report.fig14(base, cases))
  }
}

object Fig15Job {
  def main(args: Array[String]): Unit = {
    val (one, all) = Experiments.fig15(JobUtil.session("grasp-fig15"))
    JobUtil.emit(Report.fig15(one, all))
  }
}

object Fig16Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig16(Experiments.fig16(JobUtil.session("grasp-fig16"))))
}

object Fig17Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig17(Experiments.fig17(JobUtil.session("grasp-fig17"))))
}

object Table2Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.table2(Experiments.table2(JobUtil.session("grasp-table2"))))
}

object Fig19Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig19(Experiments.fig19(JobUtil.session("grasp-fig19"))))
}

object Fig20Job {
  def main(args: Array[String]): Unit =
    JobUtil.emit(Report.fig20(Experiments.fig20(JobUtil.session("grasp-fig20"))))
}
