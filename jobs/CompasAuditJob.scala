package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.spark.{CoverageData, SparkCoverage}

/** spark-submit entrypoint reproducing the §V-B coverage audit of the COMPAS
  * stand-in: MUPs at τ=10 over (sex, age, race, marital), per-level counts,
  * and the widowed-Hispanic (`XX23`) cell the paper highlights.
  */
object CompasAuditJob {
  def main(args: Array[String]): Unit = {
    JobEnv.withSpark("compas-audit") { spark =>
      val df = CoverageData.compas(spark).cache()
      val a  = SparkCoverage.assess(df, CoverageData.compasAttrs, CoverageData.compasCards, tau = 10)
      println(s"rows=${a.totalRows} distinctCombos=${a.distinctCombos} mups=${a.mups.size}")
      println(s"level histogram: ${a.levelHistogram.toSeq.sortBy(_._1).mkString(", ")}")
      val wh = df.filter("race = 2 AND marital = 3")
      println(s"widowed Hispanics: ${wh.count()} (recidivists: ${wh.filter("recid = 1").count()})")
      a.mups.toSeq.sortBy(p => (p.level, p.toString)).foreach(p => println(s"  MUP $p"))
    }
  }
}
