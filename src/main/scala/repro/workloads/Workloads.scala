package repro.workloads

import repro.core.Model._

/** Query workloads for each evaluation dataset (paper §5.1.2).
  *
  * The paper's exact query sets are elided ("full details ... are elided for
  * space"; the linked repository is dead), so we define common-sense
  * workloads following its published examples (Fig. 6): discovering implicit
  * relationships such as collaboration between authors or artists, provenance
  * chains, and university-membership patterns. Patterns are small (2–4
  * edges), touch a skewed subset of each graph's label alphabet, and every
  * pattern is realisable under the corresponding generator schema.
  *
  * Frequencies are relative weights; the motif support threshold (40%
  * default) applies to the normalised per-query containment mass.
  */
object Workloads {
  import QueryGraph.path

  /** DBLP: collaboration queries (paper Fig. 6 shows Author-Paper-Author
    * for DBLP). Citations are deliberately not traversed: the workload
    * focuses on the collaboration structure while the heavy citation
    * relation crosses communities.
    */
  val dblp: Workload = Workload(Vector(
    path("Author", "Paper", "Author")            -> 45.0, // co-authorship
    path("Author", "Paper", "Venue")             -> 30.0, // where an author publishes
    QueryGraph.star("Paper", "Author", "Author", "Author") -> 15.0, // triple collaborations
    path("Venue", "Paper", "Author", "Paper")    -> 10.0, // author's venue reach
  ))

  /** ProvGen: common PROV queries (derivation chains, attribution). */
  val provgen: Workload = Workload(Vector(
    path("Entity", "Entity", "Entity")     -> 40.0, // derivation chain
    path("Agent", "Activity", "Entity")    -> 35.0, // what an agent's activity used/generated
    path("Entity", "Activity", "Entity")   -> 25.0, // used / wasGeneratedBy chain
  ))

  /** MusicBrainz: artist/album navigation (paper Fig. 6 shows an
    * Artist-Album pattern for MusicBrainz). Discography-focused; the heavy
    * archival relations (recordings, releases, countries) are not traversed.
    */
  val musicbrainz: Workload = Workload(Vector(
    path("Artist", "Album", "Track")   -> 40.0, // artist discography
    path("Artist", "Album", "Artist")  -> 30.0, // collaborating artists
    path("Label", "Album", "Artist")   -> 20.0, // label roster
    QueryGraph.star("Album", "Artist", "Artist", "Label") -> 10.0, // signed collaborations
  ))

  /** LUBM: university-membership patterns (LUBM ships query patterns; these
    * mirror its Q1/Q5-style shapes over our 15-label schema).
    */
  val lubm: Workload = Workload(Vector(
    path("UndergradStudent", "Course", "FullProfessor")                -> 35.0, // takesCourse/teacherOf
    path("Publication", "FullProfessor", "Department")                 -> 25.0, // publicationAuthor/worksFor
    path("UndergradStudent", "Course", "FullProfessor", "Department")  -> 20.0, // course staff lookup
    path("GradStudent", "GradCourse")                                  -> 20.0, // takesCourse
  ))

  /** Workload for a dataset by name. */
  def forDataset(name: String): Workload = name match {
    case "DBLP"                    => dblp
    case "ProvGen"                 => provgen
    case "MusicBrainz"             => musicbrainz
    case "LUBM-100" | "LUBM-4000"  => lubm
    case other                     => sys.error(s"no workload for dataset $other")
  }
}
