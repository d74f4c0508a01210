package repro.jobs

import repro.exp._

/** spark-submit entrypoints, one per evaluation table:
  *
  *   spark-submit --class repro.jobs.TableIJob repro-jobs.jar
  *
  * Each prints the same rows the corresponding bench suite records in
  * EXPERIMENTS.md.
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-i")
    println(TableI.run(spark).render); spark.stop()
  }
}

object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-ii")
    println(TableII.run(spark).render); spark.stop()
  }
}

object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-iii")
    println(TableIII.run(spark).render); spark.stop()
  }
}

object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-iv")
    println(TableIV.run(spark).render); spark.stop()
  }
}

object TablesVVIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("tables-v-vi")
    val (v, vi) = TablesVVI.run(spark)
    println(v.render); println(vi.render); spark.stop()
  }
}

object TableVIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-vii")
    println(TableVII.run(spark).render); spark.stop()
  }
}

object TableVIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-viii")
    println(TableVIII.run(spark).render); spark.stop()
  }
}

object TableIXJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-ix")
    println(TableIX.run(spark).render); spark.stop()
  }
}

object TableXJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-x")
    println(TableX.run(spark).render); spark.stop()
  }
}

object TableXIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-xi")
    println(TableXI.run(spark).render); spark.stop()
  }
}

object TableXIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-xii")
    println(TableXII.run(spark).render); spark.stop()
  }
}

object TableXIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-xiii")
    println(SamplingTables.tableXIII(spark).render); spark.stop()
  }
}

object TableXIVJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-xiv")
    println(SamplingTables.tableXIV(spark).render); spark.stop()
  }
}

object TableXVJob {
  def main(args: Array[String]): Unit = {
    val spark = Harness.localSpark("table-xv")
    println(TableXV.run(spark).render); spark.stop()
  }
}
