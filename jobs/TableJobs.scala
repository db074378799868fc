package repro.jobs

import repro.SparkEnv
import repro.exp._

/** spark-submit entrypoints, one per evaluation table. Each prints the
  * reproduced table rows to stdout; EXPERIMENTS.md records paper-vs-ours.
  *
  *   spark-submit --class repro.jobs.TableIJob target/scala-2.13/repro_*.jar
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkEnv.session
    println(TableI.render(TableI.run(spark)))
    spark.stop()
  }
}

object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkEnv.session
    println(TableII.render(TableII.run(spark)))
    spark.stop()
  }
}

object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkEnv.session
    println(TableIII.render(TableIII.run(spark)))
    spark.stop()
  }
}

object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkEnv.session
    println(TableIV.render(TableIV.run(spark)))
    spark.stop()
  }
}

object TableVJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkEnv.session
    println(TableV.render(TableV.run(spark)))
    spark.stop()
  }
}

/** Runs every table job in sequence — the full evaluation. */
object AllTablesJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkEnv.session
    println(TableI.render(TableI.run(spark)))
    println(TableII.render(TableII.run(spark)))
    println(TableIII.render(TableIII.run(spark)))
    println(TableIV.render(TableIV.run(spark)))
    println(TableV.render(TableV.run(spark)))
    spark.stop()
  }
}
