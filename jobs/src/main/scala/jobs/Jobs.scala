package jobs

import org.apache.spark.sql.SparkSession

import repro.tables._

/** Shared session bootstrap for the spark-submit entrypoints. */
object Jobs {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def emit(out: TableOutput): Unit = {
    println(out.render)
    val failed = out.checks.filterNot(_._2)
    if (failed.nonEmpty) {
      Console.err.println(failed.map("CHECK FAILED: " + _._1).mkString("\n"))
      sys.exit(1)
    }
  }
}

/** Table 1: insertion-only ND success vs Theorem 3.2. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table1"); try Jobs.emit(Table1InsertionOnly.run()) finally s.stop()
  }
}

/** Table 2: Algorithm 2 space vs exact nd baseline. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table2"); try Jobs.emit(Table2Space.run()) finally s.stop()
  }
}

/** Table 3: Deg-Res-Sampling success vs Lemma 3.1. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table3"); try Jobs.emit(Table3DegRes.run()) finally s.stop()
  }
}

/** Table 4: turnstile ND with deletions (distributed sketch build). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table4"); try Jobs.emit(Table4Turnstile.run(s)) finally s.stop()
  }
}

/** Table 5: frequent elements with witnesses vs baselines. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table5"); try Jobs.emit(Table5Witness.run(s)) finally s.stop()
  }
}

/** Table 6: Star Detection approximation. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table6"); try Jobs.emit(Table6Star.run()) finally s.stop()
  }
}

/** Table 7: lower-bound reductions end-to-end. */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table7"); try Jobs.emit(Table7LowerBound.run()) finally s.stop()
  }
}
