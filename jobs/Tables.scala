package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.{EfficiencyHarness, TableRunners}

/** spark-submit entrypoints — one object per paper table. Each prints the
  * reproduced rows to stdout (paper-side numbers live in EXPERIMENTS.md).
  *
  *   spark-submit --class repro.jobs.TableIII <repro.jar>
  */
object JobSupport {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def run(name: String)(body: SparkSession => Unit): Unit = {
    val spark = session(name)
    try body(spark) finally spark.stop()
  }
}

object TableIII {
  def main(args: Array[String]): Unit = JobSupport.run("TableIII") { spark =>
    println(TableRunners.renderAccuracy("Table III (MIT-States)", TableRunners.tableIII(spark)))
  }
}

object TableIV {
  def main(args: Array[String]): Unit = JobSupport.run("TableIV") { spark =>
    println(TableRunners.renderAccuracy("Table IV (CelebA)", TableRunners.tableIV(spark)))
  }
}

object TableV {
  def main(args: Array[String]): Unit = JobSupport.run("TableV") { spark =>
    println(TableRunners.renderAccuracy("Table V (Shopping T-shirt)", TableRunners.tableV(spark)))
  }
}

object TableVI {
  def main(args: Array[String]): Unit = JobSupport.run("TableVI") { spark =>
    println(TableRunners.renderAccuracy("Table VI (MS-COCO)", TableRunners.tableVI(spark)))
  }
}

object TableVII {
  def main(args: Array[String]): Unit = JobSupport.run("TableVII") { spark =>
    println("== Table VII (response time vs data volume) ==")
    TableRunners.tableVII(spark).foreach { case (label, r: EfficiencyHarness.ScaleRow) =>
      println(f"$label%-4s n=${r.n}%-6d brute=${r.bruteMs / 1000}%.2fs must=${r.mustMs / 1000}%.2fs " +
        f"l=${r.lUsed} recall=${r.recall}%.4f dots/query brute=${r.bruteDotsPerQuery} must=${r.mustDotsPerQuery}")
    }
  }
}

object TableVIII {
  def main(args: Array[String]): Unit = JobSupport.run("TableVIII") { spark =>
    println("== Table VIII (recall vs number of modalities) ==")
    TableRunners.tableVIII(spark).foreach(r =>
      println(f"m=${r.m} MUST R@10=${r.mustRecall10}%.4f MR R@10=${r.mrRecall10}%.4f"))
  }
}

object TableIX {
  def main(args: Array[String]): Unit = JobSupport.run("TableIX") { spark =>
    println("== Table IX (user-defined weights) ==")
    TableRunners.tableIX(spark).foreach(r =>
      println(f"w0=${r.w0}%.1f w1=${r.w1}%.1f IP(mod0)=${r.ip0}%.4f IP(mod1)=${r.ip1}%.4f"))
  }
}

object TableX {
  def main(args: Array[String]): Unit = JobSupport.run("TableX") { spark =>
    println("== Table X (single query modality, MIT-States) ==")
    TableRunners.tableX(spark).foreach { r =>
      val rs = r.recalls.map { case (k, v) => f"R@$k=$v%.4f" }.mkString(" ")
      println(f"${r.modality}%-9s ${r.encoder}%-24s $rs")
    }
  }
}

object TableXI {
  def main(args: Array[String]): Unit = JobSupport.run("TableXI") { spark =>
    println("== Table XI (graph quality vs NNDescent iterations) ==")
    TableRunners.tableXI(spark).foreach(r =>
      println(f"${r.dataset}%-12s eps=${r.epsilon} quality=${r.quality}%.4f"))
  }
}

object TableXII {
  def main(args: Array[String]): Unit = JobSupport.run("TableXII") { spark =>
    println("== Table XII (search performance vs l) ==")
    TableRunners.tableXII(spark).foreach { case (paperL, ourL, row) =>
      println(f"paper l=$paperL%-5d our l=$ourL%-4d recall@10(10)=${row.recall}%.4f " +
        f"batch=${row.batchMs}%.0fms dots/query=${row.dotsPerQuery}")
    }
  }
}

object TableXIIIToXVIII {
  def main(args: Array[String]): Unit = JobSupport.run("TableXIIIToXVIII") { spark =>
    println("== Tables XIII-XVIII (learned weights) ==")
    TableRunners.tableXIIIToXVIII(spark).foreach(r =>
      println(f"${r.dataset}%-16s ${r.encoder}%-32s w=${r.weights.map(w => f"$w%.4f").mkString(", ")}"))
  }
}

object TableXIXXX {
  def main(args: Array[String]): Unit = JobSupport.run("TableXIXXX") { spark =>
    println("== Tables XIX/XX (single-modality accuracy, CelebA + Shopping) ==")
    TableRunners.tableXIXXX(spark).foreach { r =>
      val rs = r.recalls.map { case (k, v) => f"R@$k=$v%.4f" }.mkString(" ")
      println(f"${r.dataset}%-16s ${r.modality}%-9s ${r.encoder}%-24s $rs")
    }
  }
}

object TableXXI {
  def main(args: Array[String]): Unit = JobSupport.run("TableXXI") { spark =>
    println(TableRunners.renderAccuracy("Table XXI (Shopping Bottoms)", TableRunners.tableXXI(spark)))
  }
}
