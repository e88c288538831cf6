package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.CityConfig
import repro.exp.Experiments
import repro.model.Models

/** Quick calibration sweep: upper-bound components at a few grid sizes.
  *
  * {{{ sbt "runMain repro.jobs.Calibrate nyc 2,8,16,32,48,64" }}}
  */
object Calibrate {
  def main(args: Array[String]): Unit = {
    val city = CityConfig.benchCities
      .find(_.name == args.headOption.getOrElse("nyc"))
      .getOrElse(sys.error("unknown city"))
    val nSides =
      if (args.length > 1) args(1).split(",").map(_.toInt).toSeq
      else Seq(2, 4, 8, 16, 24, 32)
    val spark = SparkSession.builder.master("local[*]")
      .appName("calibrate").config("spark.ui.enabled", false).getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    try {
      val env = Experiments.prepare(spark, city)
      for (r <- Experiments.trend(env, nSides)) {
        println(f"CAL | ${r.city}%-7s | ${r.model}%-7s | ${r.nSide}%2d | expr=${r.exprErr}%10.1f | " +
          f"model=${r.modelErr}%10.1f | upper=${r.upper}%10.1f | real=${r.realErr}%10.1f")
      }
    } finally spark.stop()
  }
}
