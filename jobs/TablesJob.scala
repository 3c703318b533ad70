package repro.jobs

import repro.eval.Tables

/** spark-submit entrypoint that regenerates any of the paper's evaluation
  * tables (paper numbers printed alongside ours).
  *
  * Usage: TablesJob [1|2|3|4|5|6|all] [shrink]
  */
object TablesJob {
  def main(args: Array[String]): Unit = {
    val which = if (args.length > 0) args(0) else "all"
    val shrink = if (args.length > 1) args(1).toDouble else 1.0
    def emit(n: String, s: => String): Unit =
      if (which == "all" || which == n) println(s + "\n")
    emit("1", Tables.table1(shrink))
    emit("2", Tables.table2(shrink))
    emit("3", Tables.table3(shrink))
    emit("4", Tables.table4(shrink))
    emit("5", Tables.table5(shrink))
    emit("6", Tables.table6(shrink))
  }
}
