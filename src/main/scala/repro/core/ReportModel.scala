package repro.core

/** The Render module's layout model (Section 4.2.3): a report is a set of
  * tabs (one per visualization/panel, as in Figure 1), each holding stats
  * tables, charts with their how-to guides, and insight highlights.
  */
object ReportModel {

  sealed trait Component

  /** A key/value table; keys in `highlights` are insight-flagged (rendered
    * red, like the distinct-count cell in Figure 1 part B).
    */
  final case class StatsTable(title: String, rows: Seq[(String, String)],
                              highlights: Set[String] = Set.empty) extends Component

  /** A chart: its kind (histogram, box, qq, …), the intermediate that backs
    * it (exposed so users can re-plot with their own library), and the
    * how-to guide lines listing the config keys that customize it.
    */
  final case class ChartComponent(kind: String, title: String,
                                  data: Any, howTo: Seq[String]) extends Component

  final case class InsightList(insights: Seq[Insight]) extends Component

  final case class Tab(name: String, components: Seq[Component])

  final case class Report(title: String, tabs: Seq[Tab]) {
    def tab(name: String): Tab = tabs.find(_.name == name).getOrElse(
      throw new NoSuchElementException(
        s"no tab '$name'; available: ${tabs.map(_.name).mkString(", ")}"))
    def charts: Seq[ChartComponent] =
      tabs.flatMap(_.components).collect { case c: ChartComponent => c }
    def insights: Seq[Insight] =
      tabs.flatMap(_.components).collect { case InsightList(is) => is }.flatten
  }
}
