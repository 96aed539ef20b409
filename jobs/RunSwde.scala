package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.exp.{SwdeExperiment, TableFmt}

/** spark-submit entrypoint for the SWDE experiment (Tables 1, 3, 4).
  *
  * Usage: spark-submit --class repro.jobs.RunSwde repro.jar [pagesPerSite]
  */
object RunSwde {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("ceres-swde")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    val pagesPerSite = args.headOption.map(_.toInt).getOrElse(120)

    val runs = SwdeExperiment.run(pagesPerSite)

    println(TableFmt.render("Table 1: SWDE-lite dataset",
      Vector("Vertical", "#Sites", "#Pages"),
      runs.filter(_.system == "CERES-Full").groupBy(_.vertical).toVector.sortBy(_._1).map {
        case (v, rs) => Vector(v, rs.map(_.site).distinct.size.toString,
          (rs.map(_.nTrainPages).sum * 2).toString)
      }))

    val t3 = SwdeExperiment.table3(runs)
    println(TableFmt.render("Table 3: page-hit F1 per vertical",
      Vector("System", "movie", "nbaplayer", "university", "book"),
      SwdeExperiment.Systems.map { sys =>
        sys +: Vector("movie", "nbaplayer", "university", "book").map(v =>
          t3.find(r => r._1 == v && r._2 == sys).map(r => TableFmt.f2(r._3)).getOrElse("NA"))
      }))

    Seq("Vertex++", "CERES-Full").foreach { sys =>
      println(TableFmt.render(s"Table 4 ($sys): mention-level P/R/F1",
        Vector("Vertical", "Predicate", "P", "R", "F1"),
        SwdeExperiment.table4(runs, sys).map { case (v, p, m) =>
          TableFmt.prfRow(Vector(v, p), m)
        }))
    }

    println("Annotated-page fraction (CERES-Full): " +
      SwdeExperiment.annotatedFraction(runs).toVector.sortBy(_._1)
        .map { case (v, f) => f"$v=${f * 100}%.0f%%" }.mkString(", "))
    spark.stop()
  }
}
