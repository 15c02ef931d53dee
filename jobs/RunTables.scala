package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.ERParams
import repro.data.{Categorical, DatasetProfile, Numeric, Textual}
import repro.exp.{Harness, Sweeps, Tables}

/** spark-submit entrypoints — one per evaluation-section table.
  *
  *   spark-submit --class repro.jobs.Table2Job repro.jar
  *
  * Each prints the paper's numbers next to ours (same rows as the
  * corresponding bench suite; see EXPERIMENTS.md).
  */
object JobSpark {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("ERROR")
    s
  }
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    println("== Table 1: dataset statistics ==")
    DatasetProfile.all.foreach { p =>
      println(f"${p.name}%-10s #Rec=${p.numRecords}%6d #Ent=${p.numEntities}%6d " +
        f"Ed=${p.dispersion}%5.1f #Attr=${p.attrs.size}%2d types=${p.attrCountsByKind}")
    }
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table2")
    for (name <- Seq("Cora", "Alaska", "AS")) {
      val p    = DatasetProfile.byName(name)
      val clu  = Harness.run(spark, p, Harness.MCer)
      val pair = Harness.run(spark, p, Harness.MPair)
      println(s"[Table2] ${pair.fmt}")
      println(s"[Table2] ${clu.fmt}")
      println(s"[Table3] $name levels: paper=${Tables.table3Paper(name).mkString(",")} " +
              s"ours=${clu.setsPerLevel.mkString(",")}")
    }
    spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table4")
    val methods = Seq(Harness.MCer, Harness.MBooster, Harness.MBq, Harness.MCrowd)
    DatasetProfile.all.foreach { p =>
      methods.foreach(m => println(s"[Table4] ${Harness.run(spark, p, m).fmt}"))
    }
    spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val configs = Seq(
      "Cora-A4" -> DatasetProfile.cora.withAttrCount(4),
      "Cora-A8" -> DatasetProfile.cora.withAttrCount(8),
      "Cora-A12" -> DatasetProfile.cora.withAttrCount(12),
      "WA-full" -> DatasetProfile.walmartAmazon,
      "WA-noT" -> DatasetProfile.walmartAmazon.withoutKind(Textual),
      "Citeseer-full" -> DatasetProfile.citeseer.scaledTo(2400),
    )
    configs.foreach { case (label, p) =>
      val (ss, sd) = Sweeps.optimalFactors(p, n = 80)
      println(s"[Table5] $label optimal Ss=$ss Sd=$sd " +
              s"(paper: ${Tables.table5Paper.get(label)})")
    }
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table6")
    for ((name, counts, base) <- Seq(("Cora", Seq(4, 8, 12), DatasetProfile.cora),
                                     ("Alaska", Seq(3, 6, 9), DatasetProfile.alaska));
         n <- counts)
      println(s"[Table6] An=$n ${Harness.run(spark, base.withAttrCount(n), Harness.MCer).fmt}")
    spark.stop()
  }
}

object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table7")
    for (base <- Seq(DatasetProfile.walmartAmazon, DatasetProfile.citeseer);
         (label, p) <- Seq("full" -> base, "noT" -> base.withoutKind(Textual),
                           "noN" -> base.withoutKind(Numeric),
                           "noC" -> base.withoutKind(Categorical)))
      println(s"[Table7] ${base.name}/$label ${Harness.run(spark, p, Harness.MCer).fmt}")
    spark.stop()
  }
}

object Table8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table8")
    for (name <- Seq("Cora", "Alaska", "AS"); mdg <- Seq(false, true)) {
      val row = Harness.run(spark, DatasetProfile.byName(name), Harness.MCer,
                            params = ERParams(useMDG = mdg))
      println(s"[Table8] mdg=$mdg ${row.fmt}")
    }
    spark.stop()
  }
}
