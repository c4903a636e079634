package repro.jobs

import repro.experiments.ViewCatalog

/** Entrypoint reproducing Tables I/II (view-type catalog via enumeration)
  * and the § IV-B kHopConnector instantiation listing. Pure inference — no
  * Spark needed.
  */
object ViewCatalogJob {
  def main(args: Array[String]): Unit = {
    println("== Tables I & II: view types produced by the enumerator ==")
    println(ViewCatalog.format(ViewCatalog.run()))
    println()
    println("== § IV-B: kHopConnector instantiations for the blast-radius query ==")
    ViewCatalog.instantiations().foreach(println)
  }
}
