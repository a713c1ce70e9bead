package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.core.Queries

/** Shared spark-submit plumbing for the per-table jobs.
  *
  * Each job regenerates one EXPERIMENTS.md table at full benchmark scale:
  * {{{
  *   spark-submit --class repro.jobs.Table1Job target/scala-2.13/repro_2.13-*.jar [sf]
  * }}}
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sfArg(args: Array[String], default: Double): Double =
    args.headOption.map(_.toDouble).getOrElse(default)
}

/** Table 1 — IVM vs full recomputation on the four benchmark queries. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table1")
    val sf = Jobs.sfArg(args, 0.05)
    println(Harness.header(s"Table 1: IVM vs full recomputation (SF=$sf)", Harness.runCols))
    Queries.all.foreach { case (name, cypher, _) =>
      println(Harness.fmtRun(Harness.ivmVsBatch(spark, name, cypher, sf, batches = 5, batchSize = 10)))
    }
    spark.stop()
  }
}

/** Table 2 — scalability sweep for Q1. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table2")
    println(Harness.header("Table 2: Q1 scalability", Harness.runCols))
    Seq(0.01, 0.03, 0.1).foreach { sf =>
      println(Harness.fmtRun(Harness.ivmVsBatch(spark, f"Q1 @ SF=$sf%.2f", Queries.q1Cypher,
        sf, batches = 4, batchSize = 10)))
    }
    spark.stop()
  }
}

/** Table 3 — batch-size sweep for Q1. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table3")
    val sf = Jobs.sfArg(args, 0.05)
    println(Harness.header(s"Table 3: Q1 batch-size sweep (SF=$sf)", Harness.runCols))
    Seq(1, 10, 100, 1000).foreach { bs =>
      println(Harness.fmtRun(Harness.ivmVsBatch(spark, f"Q1 batch=$bs%-4d", Queries.q1Cypher,
        sf, batches = 3, batchSize = bs)))
    }
    spark.stop()
  }
}

/** Table 4 — fine-grained vs coarse-grained property updates. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table4")
    val sf = Jobs.sfArg(args, 0.05)
    println(Harness.header(s"Table 4: FGN on Q1 (SF=$sf)", Harness.runCols))
    val r = Harness.fgn(spark, Queries.q1Cypher, sf, batches = 4, flipsPerBatch = 20)
    println(Harness.fmtRun(r.fine))
    println(Harness.fmtRun(r.coarse))
    println(f"fine-grained advantage: ${r.coarse.meanIvm / r.fine.meanIvm}%.2fx")
    spark.stop()
  }
}

/** Table 5 — atomic path maintenance under reply churn. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table5")
    val sf = Jobs.sfArg(args, 0.05)
    println(Harness.header(s"Table 5: path view under churn (SF=$sf)", Harness.runCols))
    println(Harness.fmtRun(Harness.ivmVsBatch(spark, "Q-path reply churn",
      "MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) RETURN p, t",
      sf, batches = 5, batchSize = 10, opsFactory = Some(s => s.replyChurnBatch(10)))))
    spark.stop()
  }
}

/** Table 6 — minimal-schema inference state footprint. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table6")
    val sf = Jobs.sfArg(args, 0.02)
    println(Harness.header(s"Table 6: schema inference (SF=$sf)",
      f"${"query"}%-18s ${"mode"}%-10s ${"init ms"}%9s ${"state rows"}%11s ${"state cells"}%12s"))
    Harness.schemaFootprint(spark, Seq(
      ("Q1 reply-thread", Queries.q1Cypher),
      ("Q2 two-hop KNOWS", Queries.q2Cypher),
      ("Q3 same-country", Queries.q3Cypher)), sf)
      .foreach(p =>
        println(f"${p.query}%-18s ${p.mode}%-10s ${p.initMs}%9.0f ${p.stateRows}%11d ${p.stateCells}%12d"))
    spark.stop()
  }
}
