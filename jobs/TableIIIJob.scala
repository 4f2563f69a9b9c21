package repro.jobs

import repro.tables.TableIII

/** Entrypoint reproducing Table III (from-scratch vs incremental learning
  * cost; no Spark needed — the claim is about per-model arithmetic).
  * Args: [n] [lMax] [step].
  */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(800)
    val lMax = args.lift(1).map(_.toInt).getOrElse(300)
    val step = args.lift(2).map(_.toInt).getOrElse(1)
    println(TableIII.format(TableIII.run(n, lMax, step)))
  }
}
