package repro.bench

import repro.core.AdjGraph
import repro.graphgen.GraphGen

/** Synthetic analogs of the paper's 13 real-world datasets (Table 1).
  *
  * Each entry maps a paper dataset to a generator from the same structural
  * family at a bench-friendly scale (see DESIGN.md §3): absolute sizes are
  * 3–100× smaller than the originals, but the density/diameter/hub regime —
  * what drives the relative behaviour of h-BZ / h-LB / h-LB+UB — matches.
  * All generators are deterministic.
  */
object Datasets {

  final case class Entry(name: String, kind: String, build: () => AdjGraph)

  val all: Seq[Entry] = Seq(
    Entry("coli",  "biological (sparse ER)",        () => GraphGen.er(330, 456, 1).largestComponent()._1),
    Entry("cele",  "biological (hubby BA)",         () => GraphGen.ba(346, 5, 4, 2)),
    Entry("jazz",  "collaboration (dense comm.)",   () => GraphGen.communities(4, 50, 0.55, 0.02, 3)),
    Entry("FBco",  "social (dense communities)",    () => GraphGen.communities(6, 100, 0.25, 0.005, 4)),
    Entry("caHe",  "collaboration (communities)",   () => GraphGen.communities(25, 40, 0.35, 0.002, 5)),
    Entry("caAs",  "collaboration (communities)",   () => GraphGen.communities(35, 40, 0.38, 0.002, 6)),
    Entry("doub",  "social (sparse BA)",            () => GraphGen.ba(3000, 3, 2, 7)),
    Entry("amzn",  "co-purchase (sparse comm.)",    () => GraphGen.communities(600, 5, 0.6, 0.00025, 8)),
    Entry("rnPA",  "road (perturbed grid)",         () => GraphGen.gridRoad(50, 50, 0.75, 9)),
    Entry("rnTX",  "road (perturbed grid)",         () => GraphGen.gridRoad(60, 60, 0.75, 10)),
    Entry("sytb",  "social (mega-hub BA)",          () => GraphGen.ba(4000, 10, 2, 11)),
    Entry("hyves", "social (mega-hub BA)",          () => GraphGen.ba(6000, 10, 2, 12)),
    Entry("lj",    "social (large BA)",             () => GraphGen.ba(8000, 8, 7, 13)),
  )

  private val cache = scala.collection.mutable.Map.empty[String, AdjGraph]

  def apply(name: String): AdjGraph = synchronized {
    cache.getOrElseUpdate(name,
      all.find(_.name == name)
        .getOrElse(throw new NoSuchElementException(s"unknown dataset $name"))
        .build())
  }

  /** Datasets of each table, in the paper's order. */
  val table2Names: Seq[String] = Seq("coli", "cele", "jazz", "FBco", "caHe", "caAs")
  val table3Names: Seq[String] = Seq("FBco", "caHe", "caAs", "doub", "amzn", "rnPA",
                                     "rnTX", "sytb", "hyves")
  val table45Names: Seq[String] = Seq("caHe", "caAs", "amzn", "rnPA")
  val table6Names: Seq[String] = Seq("FBco", "caHe", "amzn", "rnTX", "rnPA")
  val table7Names: Seq[String] = Seq("FBco", "caHe", "caAs", "doub")

  /** The paper parallelizes the two hardest networks (52 threads); we use
    * the multithreaded engine on their analogs.
    */
  val threadedNames: Set[String] = Set("sytb", "hyves")
}
