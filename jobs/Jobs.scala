package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.{BlockingExperiments, Experiments}

/** spark-submit entrypoints, one per evaluation table/figure, e.g.:
  * {{{
  * spark-submit --class repro.jobs.Table4Comparison target/scala-2.13/repro_2.13-0.1.0-SNAPSHOT.jar
  * }}}
  * Each prints the same paper-vs-measured table as the corresponding
  * bench suite.
  */
object JobSession {
  def local(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

object Table3Stats {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table3")
    println(Experiments.render("Table 3: data statistics",
      Seq("dataset", "tuples(repro)", "matches", "attrs", "tuples(paper)", "matches(paper)", "attrs(paper)"),
      Experiments.table3(spark)))
    spark.stop()
  }
}

object Table4Comparison {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table4")
    println(Experiments.render("Table 4: DeepER vs Magellan (measured | paper)",
      Seq("dataset", "Magellan", "DeepER", "Magellan(paper)", "DeepER(paper)", "published"),
      Experiments.table4(spark)))
    spark.stop()
  }
}

object Table5Dictionaries {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table5")
    println(Experiments.render("Table 5: dictionary impact (measured | paper)",
      Seq("dataset", "GloVe", "GloVe-Wiki", "Wiki+retrofit", "GloVe(paper)", "GloVe-Wiki(paper)"),
      Experiments.table5(spark)))
    spark.stop()
  }
}

object Table6Models {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table6")
    println(Experiments.render("Table 6: embedding model impact (measured | paper)",
      Seq("dataset", "GloVe", "Word2Vec", "FastText", "GloVe(p)", "W2V(p)", "FT(p)"),
      Experiments.table6(spark)))
    spark.stop()
  }
}

object Table7Multilingual {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table7")
    println(Experiments.render("Table 7: multilingual (measured | paper)",
      Seq("dataset", "English", "Spanish", "English(paper)", "Spanish(paper)"),
      Experiments.table7(spark)))
    spark.stop()
  }
}

object Fig6TrainingSize {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig6")
    println(Experiments.render("Figure 6: training size (measured | paper)",
      Seq("dataset", "10%", "30%", "50%", "10%(p)", "30%(p)", "50%(p)"),
      Experiments.trainingSize(spark)))
    spark.stop()
  }
}

object Fig7LabelNoise {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig7")
    println(Experiments.render("Figure 7: label noise (measured | paper)",
      Seq("dataset", "clean", "10%", "30%", "clean(p)", "10%(p)", "30%(p)"),
      Experiments.labelNoise(spark)))
    spark.stop()
  }
}

object Fig8VectorUpdate {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig8")
    println(Experiments.render("Figure 8: embedding updates (measured | paper)",
      Seq("dataset", "NoUpdate", "Update", "NoUpdate(p)", "Update(p)"),
      Experiments.vectorUpdate(spark)))
    spark.stop()
  }
}

object Fig9Composition {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig9")
    println(Experiments.render("Figure 9: composition (measured | paper)",
      Seq("dataset", "Average", "Bi-LSTM", "Sent2Vec", "Avg(p)", "BiLSTM(p)", "S2V(p)"),
      Experiments.composition(spark)))
    spark.stop()
  }
}

object Fig10BlockingSweep {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig10")
    val (rowsK, rowsL) = BlockingExperiments.blockingSweepRows(spark)
    println(Experiments.render("Figure 10 a-b: vary K at L=10 (measured | paper)",
      Seq("K", "PC AG", "PC DS", "PC AG(p)", "PC DS(p)", "RR AG", "RR DS", "RR AG(p)", "RR DS(p)"), rowsK))
    println(Experiments.render("Figure 10 c-d: vary L at K=4 (measured | paper)",
      Seq("L", "PC AG", "PC DS", "PC AG(p)", "PC DS(p)", "RR AG", "RR DS", "RR AG(p)", "RR DS(p)"), rowsL))
    spark.stop()
  }
}

object Fig11EndToEndBlocking {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig11")
    val p = BlockingExperiments.prepareBlocks(spark, repro.data.ERDatasets.prodAG(spark))
    val rows = BlockingExperiments.endToEnd(spark, p,
      Seq((1, 10), (4, 10), (10, 10), (4, 1), (4, 4)))
    println(Experiments.render("Figure 11: end-to-end blocking + classifier (Prod-AG)",
      Seq("K", "L", "precision", "recall"),
      rows.map { case (k, l, pr, re) =>
        Seq(k.toString, l.toString, Experiments.fmtPct(pr), Experiments.fmtPct(re)) }))
    spark.stop()
  }
}

object Fig12MultiProbe {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("fig12")
    val p = BlockingExperiments.prepareBlocks(spark, repro.data.ERDatasets.prodAG(spark))
    println(Experiments.render("Figure 12: multi-probe recall on Prod-AG (measured | paper)",
      Seq("MP", "top-N", "recall", "recall(paper)"),
      BlockingExperiments.multiProbe(spark, p).map { case (mp, n, r) =>
        Seq(mp.toString, n.toString, Experiments.fmtPct(r),
          Experiments.fmtPct(BlockingExperiments.fig12Paper((mp, n)))) }))
    spark.stop()
  }
}

object NucleotideDomain {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("nucleotide")
    println(Experiments.render("Nucleotide benchmark (measured | paper state of the art)",
      Seq("dataset", "DeepER", "hand-crafted ML", "DeepER(paper)", "SOTA(paper)"),
      Experiments.nucleotide(spark)))
    spark.stop()
  }
}
