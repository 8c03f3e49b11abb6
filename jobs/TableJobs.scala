package repro.jobs

import repro.exp.Tables

/** spark-submit entrypoints, one per evaluation table. The event-driven
  * structures are driver-side (the paper's algorithms are sequential);
  * Spark-side reproductions live in SnapshotSurgeJob / StreamingSurgeJob.
  * Usage: spark-submit --class repro.jobs.TableIIJob repro.jar [n]
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(Tables.envN(100000))
    val rows = Tables.tableI(n)
    println(s"Table I (datasets, n=$n; paper rates are for 1M objects):")
    println(Tables.fmtTable(
      Seq("Dataset", "#Objects", "Rate(/h)", "Lat range", "Lon range"),
      rows.map(r => Seq(r.name, r.n.toString, f"${r.ratePerHour}%.0f",
                        f"${r.latLo}%.1f..${r.latHi}%.1f", f"${r.lonLo}%.1f..${r.lonHi}%.1f")),
    ))
  }
}

object TableIIJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(Tables.envN(20000))
    val rows = Tables.tableII(n)
    println(s"Table II (search-trigger ratio, n=$n):")
    println(Tables.fmtTable(
      Seq("Dataset", "Window", "CCS", "B-CCS", "paper CCS", "paper B-CCS"),
      rows.map(r => Seq(r.dataset, r.window, Tables.pct(r.ccs), Tables.pct(r.bccs),
                        Tables.pct(r.paperCcs), Tables.pct(r.paperBccs))),
    ))
  }
}

object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(Tables.envN(20000))
    val rows = Tables.tableIII(n, Tables.envSample(200))
    println(s"Table III (approx ratio vs alpha, US, |W|=1h, n=$n):")
    println(Tables.fmtTable(
      Seq("alpha", "GAPS", "MGAPS", "paper GAPS", "paper MGAPS"),
      rows.map(r => Seq(r.alpha.toString, Tables.pct(r.gaps), Tables.pct(r.mgaps),
                        Tables.pct(r.paperGaps), Tables.pct(r.paperMgaps))),
    ))
  }
}

object TableIVJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(Tables.envN(20000))
    val rows = Tables.tableIV(n, Tables.envSample(200))
    println(s"Table IV (approx ratio vs window, n=$n):")
    println(Tables.fmtTable(
      Seq("Dataset", "Window", "GAPS", "MGAPS", "paper GAPS", "paper MGAPS"),
      rows.map(r => Seq(r.dataset, r.window, Tables.pct(r.gaps), Tables.pct(r.mgaps),
                        Tables.pct(r.paperGaps), Tables.pct(r.paperMgaps))),
    ))
  }
}
