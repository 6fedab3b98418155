package repro.core

import repro.fd.FD
import repro.views.{ViewSchema, ViewSpec}

/** Provenance type of an FD over an integrated view (paper Definition 8). */
sealed abstract class FDType(val label: String)
object FDType {
  case object Base              extends FDType("base")
  case object UpstagedSelection extends FDType("upstaged selection")
  case object UpstagedLeft      extends FDType("upstaged left")
  case object UpstagedRight     extends FDType("upstaged right")
  case object Inferred          extends FDType("inferred")
  case object JoinFD            extends FDType("joinFD")
  val all: Seq[FDType] =
    Seq(Base, UpstagedSelection, UpstagedLeft, UpstagedRight, Inferred, JoinFD)
}

/** Provenance triple `(d, t, s)`: the FD, its type, and the first sub-query
  * of the view specification in which it holds (paper Definition 8).
  */
final case class ProvenanceTriple(fd: FD, fdType: FDType, subquery: ViewSpec) {
  def render(schema: ViewSchema): String =
    s"(${schema.renderFd(fd)}, \"${fdType.label}\", ${subquery.render})"
}
