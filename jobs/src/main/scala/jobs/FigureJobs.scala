package jobs

import repro.bench.Experiments

/** Spark-submit / sbt-run entrypoints, one per paper figure (DESIGN.md §4).
  * Each prints the regenerated result table; the `bench/` suites run the
  * same harnesses with shape assertions.
  *
  * Usage: `sbt "jobs/runMain jobs.Fig8a"` (or spark-submit the assembly
  * with the same main class).
  */
object Fig8a { def main(args: Array[String]): Unit = println(Experiments.fig8a().render) }

object Fig8b { def main(args: Array[String]): Unit = println(Experiments.fig8b().render) }

object Fig8c {
  def main(args: Array[String]): Unit = {
    val (space, fill) = Experiments.fig8c()
    println(space.render); println(fill.render)
  }
}

object Fig8d { def main(args: Array[String]): Unit = println(Experiments.fig8de(materialized = true).render) }

object Fig8e { def main(args: Array[String]): Unit = println(Experiments.fig8de(materialized = false).render) }

object Fig8f { def main(args: Array[String]): Unit = println(Experiments.fig8f().render) }

object Fig9a { def main(args: Array[String]): Unit = println(Experiments.fig9a().render) }

object Fig9b { def main(args: Array[String]): Unit = println(Experiments.fig9b().render) }

object Fig9cdef {
  def main(args: Array[String]): Unit = {
    val (c, d, e, f) = Experiments.fig9cdef()
    println(c.render); println(d.render); println(e.render); println(f.render)
  }
}

object Fig10a { def main(args: Array[String]): Unit = println(Experiments.fig10a().render) }

object Fig10b { def main(args: Array[String]): Unit = println(Experiments.fig10bc("astronomy").render) }

object Fig10c { def main(args: Array[String]): Unit = println(Experiments.fig10bc("seismic").render) }
