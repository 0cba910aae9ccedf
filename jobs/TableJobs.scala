package repro.jobs

import repro.experiments.Tables

/** spark-submit entrypoints, one per evaluation table:
  * `spark-submit --class repro.jobs.Table1Job repro.jar`.
  * The storage-engine simulation runs on the driver; scenarios that involve
  * Spark-side computation (TRA operators, Spark equivalent-class formation)
  * are exercised by the test suites (see DESIGN.md §4).
  */
object Table1Job { def main(args: Array[String]): Unit = println(Tables.table1().render) }
object Table2Job { def main(args: Array[String]): Unit = println(Tables.table2().render) }
object Table3Job { def main(args: Array[String]): Unit = println(Tables.table3().render) }
object Table4Job { def main(args: Array[String]): Unit = println(Tables.table4().render) }
object Table5Job { def main(args: Array[String]): Unit = println(Tables.table5().render) }
object Table6Job { def main(args: Array[String]): Unit = println(Tables.table6().render) }
object Table7Job { def main(args: Array[String]): Unit = println(Tables.table7().render) }
object Table8Job { def main(args: Array[String]): Unit = println(Tables.table8().render) }
object Table9Job { def main(args: Array[String]): Unit = println(Tables.table9().render) }
object Table10Job { def main(args: Array[String]): Unit = println(Tables.table10().render) }
object Table11Job { def main(args: Array[String]): Unit = println(Tables.table11().render) }
object Table12Job { def main(args: Array[String]): Unit = println(Tables.table12().render) }
object Table13Job { def main(args: Array[String]): Unit = println(Tables.table13().render) }
object Table14Job { def main(args: Array[String]): Unit = println(Tables.table14().render) }

/** Every table in order — regenerates the full evaluation section. */
object AllTablesJob {
  def main(args: Array[String]): Unit =
    Tables.all().foreach(t => println(t.render + "\n"))
}
