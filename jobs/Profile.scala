package jobs

import repro.core._
import repro.corpus.TextGen

/** Ad-hoc per-OP microprofiler (dev aid, not part of the evaluation). */
object Profile {
  def main(args: Array[String]): Unit = {
    val docs = (0 until 300).map(i => TextGen.genDoc("clean", 1000L + i, 400, new java.util.Random(i)))
    val ops = repro.exp.Recipes.fusion14.ops
    // warm-up
    ops.foreach {
      case m: Mapper => docs.take(20).foreach(m.mapText)
      case f: Filter => docs.take(20).foreach(d => f.computeStatsRow(new TextContext(d)))
      case _ => ()
    }
    ops.foreach {
      case m: Mapper =>
        val t0 = System.nanoTime()
        docs.foreach(m.mapText)
        println(f"${m.name}%-45s ${(System.nanoTime() - t0) / 1e6 / docs.size}%8.3f ms/doc")
      case f: Filter =>
        val t0 = System.nanoTime()
        docs.foreach(d => f.computeStatsRow(new TextContext(d)))
        println(f"${f.name}%-45s ${(System.nanoTime() - t0) / 1e6 / docs.size}%8.3f ms/doc")
      case o => println(s"${o.name} (skipped)")
    }
  }
}
