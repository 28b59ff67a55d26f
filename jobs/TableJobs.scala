package repro.jobs

import repro.tables._

/** spark-submit entrypoints, one per evaluation table. Each prints the
  * reproduced table to stdout (the bench suites run the same harnesses and
  * additionally assert the paper's qualitative shape).
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val rows = Table1.run(timeLimitSec = args.headOption.map(_.toDouble).getOrElse(300.0))
    println("Table 1: square query over LJ-lite\n" + Table1.render(rows))
  }
}

object Table2Job {
  def main(args: Array[String]): Unit =
    println("Table 2: existing works and their execution plans\n" + Table2.render(Table2.run()))
}

object Table3Job {
  def main(args: Array[String]): Unit =
    println("Table 3: datasets (laptop-scale analogues)\n" + Table3.render(Table3.run()))
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val rows = Table4.run(durationSec = args.headOption.map(_.toDouble).getOrElse(15.0))
    println("Table 4: throughput on CW-lite\n" + Table4.render(rows))
  }
}

object Table5Job {
  def main(args: Array[String]): Unit =
    println("Table 5: cache designs\n" + Table5.render(Table5.run()))
}

object Table6Job {
  def main(args: Array[String]): Unit =
    println("Table 6: execution plans on GO-lite\n" + Table6.render(Table6.run()))
}
