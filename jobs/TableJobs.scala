package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{Datasets, Sizes, Tables}

/** Shared bootstrap for the per-table spark-submit entrypoints.
  *
  * Usage: `spark-submit --class repro.jobs.TableII <jar> [bench|tiny]`
  */
object JobContext {
  def spark(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sizes(args: Array[String]): Sizes =
    if (args.headOption.contains("tiny")) Sizes.tiny else Sizes.bench

  def bundle(name: String, args: Array[String]): Datasets.Bundle =
    Datasets.build(spark(name), sizes(args))
}

/** Table II: statistics of all 16 difference graphs. */
object TableII {
  def main(args: Array[String]): Unit = {
    val b = JobContext.bundle("dcs-table2", args)
    println(Tables.renderII(Tables.tableII(b)))
  }
}

/** Tables III and IV: DBLP co-author groups under both density measures. */
object TableIII_IV {
  def main(args: Array[String]): Unit = {
    val b = JobContext.bundle("dcs-table3-4", args)
    println(Tables.renderIII_IV(Tables.tableIII_IV(b)))
  }
}

/** Tables V and VI: emerging/disappearing and single-graph DM topics. */
object TableV_VI {
  def main(args: Array[String]): Unit = {
    val b = JobContext.bundle("dcs-table5-6", args)
    val t = Tables.tableV_VI(b)
    println(Tables.renderTopics("Table V emerging", t.emerging))
    println(Tables.renderTopics("Table V disappearing", t.disappearing))
    println(Tables.renderTopics("Table VI G1 (1998-2007)", t.g1Top))
    println(Tables.renderTopics("Table VI G2 (2008-2017)", t.g2Top))
  }
}

/** Table VII: running time of the three DCSGA algorithms on all 16 configs. */
object TableVII {
  def main(args: Array[String]): Unit = {
    val b = JobContext.bundle("dcs-table7", args)
    println(Tables.renderVII(Tables.tableVII(b.diffSets)))
  }
}

/** Tables VIII and IX: EgoScan comparison on the DBLP configurations. */
object TableVIII_IX {
  def main(args: Array[String]): Unit = {
    val b = JobContext.bundle("dcs-table8-9", args)
    println(Tables.renderVIII_IX(Tables.tableVIII_IX(b)))
  }
}

/** Appendix tables X-XIV: Wiki, Douban, DBLP-C and Actor results. */
object AppendixTables {
  def main(args: Array[String]): Unit = {
    val b = JobContext.bundle("dcs-appendix", args)
    val byKey = b.diffSets.map(ds => ds.key -> ds).toMap
    println("Table X (Wiki DCSGA):")
    println(Tables.renderGa(Seq(Tables.dcsgaRow(byKey("Wiki/-/Consistent")), Tables.dcsgaRow(byKey("Wiki/-/Conflicting")))))
    println("\nTable XI (Wiki DCSAD):")
    println(Tables.renderAd(Seq("Wiki/-/Consistent", "Wiki/-/Conflicting").flatMap(k => Tables.dcsadComparison(byKey(k)))))
    println("\nTable XII (Douban DCSAD):")
    println(Tables.renderAd(Seq("Movie/-/Interest-Social", "Movie/-/Social-Interest",
      "Book/-/Interest-Social", "Book/-/Social-Interest").flatMap(k => Tables.dcsadComparison(byKey(k)))))
    println("\nTable XIII (Douban DCSGA):")
    println(Tables.renderGa(Seq("Movie/-/Interest-Social", "Movie/-/Social-Interest",
      "Book/-/Interest-Social", "Book/-/Social-Interest").map(k => Tables.dcsgaRow(byKey(k)))))
    println("\nTable XIV (DBLP-C and Actor DCSGA):")
    println(Tables.renderGa(Seq("DBLP-C/Weighted/-", "DBLP-C/Discrete/-",
      "Actor/Weighted/-", "Actor/Discrete/-").map(k => Tables.dcsgaRow(byKey(k)))))
  }
}
