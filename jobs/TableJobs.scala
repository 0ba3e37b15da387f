package repro.jobs

import repro.eval.Tables

/** spark-submit entrypoints, one per evaluation table/figure:
  *
  *   spark-submit --class repro.jobs.Fig5bJob target/scala-2.13/repro_2.13-*.jar
  *
  * Each prints the reproduced table (the same builder the bench suites
  * assert on). The core engine is single-JVM; the Spark layer is exercised
  * by `repro.jobs.SparkPipelineJob`.
  */
object Table4Job { def main(a: Array[String]): Unit = println(Tables.table4()._1) }
object Fig4Job   { def main(a: Array[String]): Unit = println(Tables.fig4()._1) }
object Fig5aJob  { def main(a: Array[String]): Unit = println(Tables.fig5a()._1) }
object Fig5bJob  { def main(a: Array[String]): Unit = println(Tables.fig5b()._1) }
object Fig6Job   { def main(a: Array[String]): Unit = println(Tables.fig6()._1) }
object Fig7Job   { def main(a: Array[String]): Unit = println(Tables.fig7()._1) }
object Fig8Job   { def main(a: Array[String]): Unit = println(Tables.fig8()._1) }
object Fig9Job   { def main(a: Array[String]): Unit = println(Tables.fig9()._1) }
object Fig10Job  { def main(a: Array[String]): Unit = println(Tables.fig10()._1) }
object Fig11Job  { def main(a: Array[String]): Unit = println(Tables.fig11()._1) }
object Fig12Job  { def main(a: Array[String]): Unit = println(Tables.fig12()._1) }
object Fig13Job  { def main(a: Array[String]): Unit = println(Tables.fig13()._1) }
object Fig14Job  { def main(a: Array[String]): Unit = println(Tables.fig14()._1) }
object Fig15Job  { def main(a: Array[String]): Unit = println(Tables.fig15()._1) }
object Fig16Job  { def main(a: Array[String]): Unit = println(Tables.fig16()._1) }
object Fig17Job  { def main(a: Array[String]): Unit = println(Tables.fig17()._1) }
