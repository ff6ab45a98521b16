package repro.rdf

import repro.core.QueryGraph
import scala.util.Random

/** LUBM-lite: a deterministic generator of the LUBM university ontology
  * (universities → departments → professors / students / courses), plus
  * the seven benchmark query shapes LQ1–LQ7 used in §VIII (stars LQ2/4/5,
  * complex LQ1/3/6/7; selective LQ3/4/5/6).
  *
  * Substitution for LUBM 100M–1B (documented in DESIGN.md): identical
  * schema and query shapes at a laptop scale factor. University-scoped URI
  * authorities (`http://univN.edu/...`) give semantic-hash partitioning the
  * same per-domain locality it has on real LUBM.
  */
object LubmData {
  val onto = "http://swat.lehigh.edu/onto#"

  // predicates
  val ptype = onto + "type"
  val subOrganizationOf = onto + "subOrganizationOf"
  val worksFor = onto + "worksFor"
  val memberOf = onto + "memberOf"
  val undergraduateDegreeFrom = onto + "undergraduateDegreeFrom"
  val doctoralDegreeFrom = onto + "doctoralDegreeFrom"
  val takesCourse = onto + "takesCourse"
  val teacherOf = onto + "teacherOf"
  val advisor = onto + "advisor"
  val name = onto + "name"
  val emailAddress = onto + "emailAddress"
  val researchInterest = onto + "researchInterest"

  // classes
  val University = onto + "University"
  val Department = onto + "Department"
  val FullProfessor = onto + "FullProfessor"
  val AssociateProfessor = onto + "AssociateProfessor"
  val Lecturer = onto + "Lecturer"
  val GraduateStudent = onto + "GraduateStudent"
  val UndergraduateStudent = onto + "UndergraduateStudent"
  val Course = onto + "Course"
  val ResearchGroup = onto + "ResearchGroup"

  final case class Spec(
      nUniv: Int = 16,
      deptsPerUniv: Int = 3,
      gradsPerDept: Int = 10,
      undergradsPerDept: Int = 20,
      coursesPerDept: Int = 8,
      seed: Long = 7,
  )

  def univ(u: Int) = s"http://univ$u.edu/univ"
  def dept(u: Int, d: Int) = s"http://univ$u.edu/dept$d"

  def triples(spec: Spec): Vector[(String, String, String)] = {
    import spec._
    val rng = new Random(seed)
    val out = Vector.newBuilder[(String, String, String)]
    def t(s: String, p: String, o: String): Unit = out += ((s, p, o))

    val topics = (0 until 20).map(i => onto + s"topic$i")

    for (u <- 0 until nUniv) {
      t(univ(u), ptype, University)
      for (d <- 0 until deptsPerUniv) {
        val dp = dept(u, d)
        t(dp, ptype, Department)
        t(dp, subOrganizationOf, univ(u))
        for (g <- 0 until 2) {
          val rg = s"$dp/group$g"
          t(rg, ptype, ResearchGroup)
          t(rg, subOrganizationOf, dp)
        }
        // professors: 2 full, 3 associate, 2 lecturers
        val profClasses =
          Seq.fill(2)(FullProfessor) ++ Seq.fill(3)(AssociateProfessor) ++ Seq.fill(2)(Lecturer)
        val profs = profClasses.zipWithIndex.map { case (cls, i) =>
          val pr = s"$dp/prof$i"
          t(pr, ptype, cls)
          t(pr, worksFor, dp)
          t(pr, name, s"lit://name/prof/$u/$d/$i")
          t(pr, emailAddress, s"lit://mail/prof/$u/$d/$i")
          if (cls != Lecturer) {
            t(pr, researchInterest, topics(rng.nextInt(topics.size)))
            val du = if (rng.nextDouble() < 0.7) u else rng.nextInt(nUniv)
            t(pr, doctoralDegreeFrom, univ(du))
          }
          pr
        }
        // courses, each taught by a professor of the department
        val taughtBy = new Array[Int](coursesPerDept)
        val courses = (0 until coursesPerDept).map { c =>
          val co = s"$dp/course$c"
          t(co, ptype, Course)
          val pi = rng.nextInt(profs.size)
          taughtBy(c) = pi
          t(profs(pi), teacherOf, co)
          co
        }
        // graduate students
        for (g <- 0 until gradsPerDept) {
          val st = s"$dp/grad$g"
          t(st, ptype, GraduateStudent)
          t(st, memberOf, dp)
          t(st, name, s"lit://name/grad/$u/$d/$g")
          // most students stayed at their own university for the bachelor's
          // (LQ1 triangle support + the locality semantic hash exploits)
          val ug = if (rng.nextDouble() < 0.75) u else rng.nextInt(nUniv)
          t(st, undergraduateDegreeFrom, univ(ug))
          val adv = rng.nextInt(profs.size)
          t(st, advisor, profs(adv))
          t(st, takesCourse, courses(rng.nextInt(courses.size)))
          // 50%: also a course taught by the advisor (LQ7 triangle)
          if (rng.nextDouble() < 0.5) {
            val advCourses = taughtBy.indices.filter(taughtBy(_) == adv)
            if (advCourses.nonEmpty) t(st, takesCourse, courses(advCourses(rng.nextInt(advCourses.size))))
          }
        }
        // undergraduate students
        for (s <- 0 until undergradsPerDept) {
          val st = s"$dp/under$s"
          t(st, ptype, UndergraduateStudent)
          t(st, memberOf, dp)
          t(st, name, s"lit://name/under/$u/$d/$s")
          t(st, takesCourse, courses(rng.nextInt(courses.size)))
          t(st, takesCourse, courses(rng.nextInt(courses.size)))
        }
      }
    }
    out.result()
  }

  def graph(spec: Spec = Spec()): RdfGraph = RdfGraph.fromStrings(triples(spec))

  /** gStore-signature predicates: folded into vertex constraints, never
    * partitioned as graph edges. Types, name/email literals, and
    * researchInterest (a literal attribute in real LUBM, "ResearchN").
    */
  val attributePredicates: Set[String] = Set(ptype, name, emailAddress, researchInterest)

  /** (name, query, hasSelectiveTriplePatterns) — the √ column of Table I. */
  def queries: Vector[(String, QueryGraph, Boolean)] = Vector(
    // complex (triangle), unselective
    ("LQ1", QueryGraph.of(
      s"?x $memberOf ?z",
      s"?z $subOrganizationOf ?y",
      s"?x $undergraduateDegreeFrom ?y"), false),
    // star, unselective, many matches
    ("LQ2", QueryGraph.of(
      s"?x $ptype $UndergraduateStudent",
      s"?x $memberOf ?d",
      s"?x $takesCourse ?c"), false),
    // complex, selective, zero matches (professors are not members)
    ("LQ3", QueryGraph.of(
      s"?x $memberOf ?z",
      s"?z $subOrganizationOf ?y",
      s"?x $undergraduateDegreeFrom ?y",
      s"?x $ptype $FullProfessor"), true),
    // star, selective constant
    ("LQ4", QueryGraph.of(
      s"?x $worksFor ${dept(0, 0)}",
      s"?x $ptype $FullProfessor",
      s"?x $emailAddress ?e"), true),
    // star, selective constant
    ("LQ5", QueryGraph.of(
      s"?x $memberOf ${dept(1, 1)}",
      s"?x $ptype $GraduateStudent",
      s"?x $name ?n"), true),
    // complex (path), selective constant
    ("LQ6", QueryGraph.of(
      s"?x $advisor ?p",
      s"?p $worksFor ${dept(2, 0)}",
      s"?x $undergraduateDegreeFrom ?u"), true),
    // complex (triangle), unselective, many matches
    ("LQ7", QueryGraph.of(
      s"?s $takesCourse ?c",
      s"?p $teacherOf ?c",
      s"?s $advisor ?p"), false),
  )
}
