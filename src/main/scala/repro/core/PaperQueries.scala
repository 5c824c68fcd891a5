package repro.core

import Ast.MatchQuery

/** The twelve queries of Section IV, verbatim (modulo whitespace), used in
  * the correctness fixtures and the Table-II benchmark. The NOI bound of
  * Q10–Q12 is a parameter (paper default 12 = one hour / two weeks at the
  * respective time units) so the Figure-4 sweep stays runnable.
  */
object PaperQueries {

  val q1 = "MATCH (x:Person) ON contact_tracing"
  val q2 = "MATCH (x:Person {risk = 'low'}) ON contact_tracing"
  val q3 = "MATCH (x:Person {risk = 'low' AND time = '1'}) ON contact_tracing"
  val q4 = "MATCH (x:Person {risk = 'low' AND time < '10'}) ON contact_tracing"
  val q5 =
    "MATCH (x:Person {risk = 'low'})-[z:meets]->(y:Person {risk = 'high'}) ON contact_tracing"
  val q6 = "MATCH (x:Person {test = 'pos'})-/PREV/-(y) ON contact_tracing"
  /** The three-variable form shown first for Q7. */
  val q7Long = "MATCH (x:Person {test = 'pos'})-/PREV/-(y)-[:visits]->(z) ON contact_tracing"
  /** The simplified two-variable form ("the following simplified MATCH clause"). */
  val q7 = "MATCH (x:Person {test = 'pos'})-/PREV/FWD/:visits/FWD/-(z) ON contact_tracing"
  val q8 = "MATCH (x:Person {test = 'pos'})-/PREV*/FWD/:visits/FWD/-(z) ON contact_tracing"
  val q9 =
    "MATCH (x:Person {risk = 'high'})-/FWD/:meets/FWD/NEXT*/-({test = 'pos'}) ON contact_tracing"
  /** The intro contact-tracing query — Q9 with the endpoint bound to `y`. */
  val q9Intro =
    "MATCH (x:Person {risk = 'high'})-/FWD/:meets/FWD/NEXT*/-(y:Person {test = 'pos'}) ON contact_tracing"

  def q10(m: Int = 12): String =
    s"MATCH (x:Person {risk = 'high'})-/FWD/:meets/FWD/PREV[0,$m]/-({test = 'pos'}) ON contact_tracing"
  def q11(m: Int = 12): String =
    s"MATCH (x:Person {risk = 'high'})-/FWD/:visits/FWD/:Room/BWD/:visits/BWD/NEXT[0,$m]/-({test = 'pos'}) ON contact_tracing"
  def q12(m: Int = 12): String =
    "MATCH (x:Person {risk = 'high'})-/(FWD/:meets/FWD + FWD/:visits/FWD/:Room/BWD/:visits/BWD)" +
      s"/NEXT[0,$m]/-({test = 'pos'}) ON contact_tracing"

  /** Name → query text at the paper's default parameters. */
  val all: Seq[(String, String)] = Seq(
    "Q1" -> q1, "Q2" -> q2, "Q3" -> q3, "Q4" -> q4, "Q5" -> q5, "Q6" -> q6,
    "Q7" -> q7, "Q8" -> q8, "Q9" -> q9, "Q10" -> q10(), "Q11" -> q11(), "Q12" -> q12())

  def parsed(name: String): MatchQuery =
    Parser.parseMatch(all.toMap.apply(name))
}
