package repro.bench

import scala.collection.mutable

/** A small result-table model shared by the benchmark suites and the
  * spark-submit jobs: systems × configurations of one measured quantity,
  * rendered in the layout of the corresponding paper figure.
  */
final case class Table(
    title: String,
    unit: String,
    configs: Seq[String],
    systems: Seq[String],
    cells: Map[(String, String), Double],
) {
  def value(system: String, config: String): Double = cells((system, config))

  def render: String = {
    val sb = new StringBuilder
    sb.append(s"== $title  [$unit]\n")
    val w = math.max(12, systems.map(_.length).max + 2)
    sb.append(" " * w)
    configs.foreach(c => sb.append(f"$c%16s"))
    sb.append('\n')
    systems.foreach { s =>
      sb.append(s.padTo(w, ' '))
      configs.foreach { c =>
        cells.get((s, c)) match {
          case Some(v) if v >= 1000 => sb.append(f"$v%16.0f")
          case Some(v)              => sb.append(f"$v%16.3f")
          case None                 => sb.append(" " * 15 + "-")
        }
      }
      sb.append('\n')
    }
    sb.toString
  }
}

object Table {
  /** Collect cells produced as (system, config, value) triples. */
  def build(title: String, unit: String, configs: Seq[String], systems: Seq[String])
           (fill: ((String, String, Double) => Unit) => Unit): Table = {
    val m = mutable.LinkedHashMap.empty[(String, String), Double]
    fill((s, c, v) => m((s, c)) = v)
    Table(title, unit, configs, systems, m.toMap)
  }
}
