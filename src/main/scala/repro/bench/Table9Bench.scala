package repro.bench

/** Table IX — the user study. A survey of 18 human experts cannot be
  * regenerated computationally; per DESIGN.md this bench *restates* the
  * published responses (checked into the repo as data) so the table is
  * present in the reproduction output, clearly labeled as a restatement.
  */
object Table9Bench {

  final case class Row(question: String, research: String, industry: String, all: String)

  val responses: Seq[Row] = Seq(
    Row("Participants", "9", "9", "18"),
    Row("Q1 find data within a single search (rarely 0% - often 100%)", "27.5%", "38.8%", "33.3%"),
    Row("Q2 single table sufficient? (yes)", "11%", "0%", "6%"),
    Row("Q3 most frequent task: discovery for rows", "33%", "67%", "50%"),
    Row("Q3 most frequent task: correlation discovery", "44%", "56%", "50%"),
    Row("Q3 most frequent task: join discovery", "44%", "33%", "39%"),
    Row("Q3 most frequent task: keyword search", "44%", "33%", "39%"),
    Row("Q3 most frequent task: multi-column join discovery", "33%", "22%", "28%"),
    Row("Q4 solve with custom scripts", "100%", "56%", "78%"),
    Row("Q4 solve by writing SQL", "44%", "56%", "50%"),
    Row("Q4 solve by asking people", "33%", "56%", "44%"),
    Row("Q4 solve with open source tools", "56%", "33%", "44%"),
    Row("Q4 solve with commercial tools", "22%", "22%", "22%"),
    Row("Q5 preferred language: Python", "100%", "89%", "94%"),
    Row("Q6 lake stored in DBMS / filesystem / both", "33/44/22%", "44/0/56%", "39/22/39%"),
    Row("Q7 would use DBMS with discovery indexes (yes)", "100%", "100%", "100%"),
    Row("Q8 simple-task API preference: BLEND / Python / SQL", "34/22/44%", "56/11/34%", "44/17/39%"),
    Row("Q9 complex-task API preference: BLEND / Python", "89/11%", "89/11%", "89/11%"),
  )

  final case class Result(rows: Seq[Row], report: String)

  def run(): Result = {
    val tab = BenchUtil.table(
      Seq("Question", "Research", "Industry", "All"),
      responses.map(r => Seq(r.question, r.research, r.industry, r.all)))
    val report = "RESTATEMENT of the paper's published survey results " +
      "(human-subject data; not computationally reproducible)\n\n" + tab
    Result(responses, BenchUtil.report("table9-userstudy", report))
  }
}
