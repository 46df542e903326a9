package repro.jobs

import repro.eval.tables._

/** `spark-submit --class repro.jobs.TableIJob repro.jar [scale]` — one
  * entrypoint per evaluation table; [[AllTablesJob]] runs everything.
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lovo-table1")
    TableFmt.publish("table1", TableI.render(TableI.run(spark, JobSession.scaleArg(args))))
    spark.stop()
  }
}

object TableIIJob {
  def main(args: Array[String]): Unit = {
    TableFmt.publish("table2", TableII.render(TableII.run()))
  }
}

object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lovo-table3")
    TableFmt.publish("table3", TableIII.render(TableIII.run(spark, JobSession.scaleArg(args))))
    spark.stop()
  }
}

object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lovo-table4")
    TableFmt.publish("table4", TableIV.render(TableIV.run(spark, JobSession.scaleArg(args))))
    spark.stop()
  }
}

object TableVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lovo-table5")
    TableFmt.publish("table5", TableV.render(TableV.run(spark, JobSession.scaleArg(args))))
    spark.stop()
  }
}

object TableVIJob {
  def main(args: Array[String]): Unit = {
    TableFmt.publish("table6", TableVI.render(TableVI.run()))
  }
}

object TableVIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lovo-table7")
    TableFmt.publish("table7", TableVII.render(TableVII.run(spark, JobSession.scaleArg(args))))
    spark.stop()
  }
}

object AllTablesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.spark("lovo-all-tables")
    val scale = JobSession.scaleArg(args)
    TableFmt.publish("table2", TableII.render(TableII.run()))
    TableFmt.publish("table6", TableVI.render(TableVI.run()))
    TableFmt.publish("table1", TableI.render(TableI.run(spark, scale)))
    TableFmt.publish("table3", TableIII.render(TableIII.run(spark, scale)))
    TableFmt.publish("table4", TableIV.render(TableIV.run(spark, scale)))
    TableFmt.publish("table5", TableV.render(TableV.run(spark, scale)))
    TableFmt.publish("table7", TableVII.render(TableVII.run(spark, scale)))
    spark.stop()
  }
}
