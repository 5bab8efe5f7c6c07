package repro.data

import repro.datalog._

/** The paper's evaluation queries (Fig. 4) restated over the [[Datasets]]
  * schemas, and the why / why-not provenance questions of Fig. 5.
  */
object Queries {
  private def v(n: String): Var    = Var(n)
  private def c(x: Any): Const     = Const(x)

  // r1: InvalidD(C) :- LICENSE(I,B,G,C,T,d), ¬VALID(I)
  val r1: Program = Program(Rule("r1", "InvalidD", Vector(v("C")),
    Vector(
      Atom("LICENSE", Vector(v("I"), v("B"), v("G"), v("C"), v("T"), c("d"))),
      Atom("VALID", Vector(v("I")), negated = true),
    )))

  // r2: Fsenior(C) :- LICENSE(I,B,f,C,T,L), VALID(I), B < 1953
  val r2: Program = Program(Rule("r2", "Fsenior", Vector(v("C")),
    Vector(
      Atom("LICENSE", Vector(v("I"), v("B"), c("f"), v("C"), v("T"), v("L"))),
      Atom("VALID", Vector(v("I"))),
    ),
    Vector(Comparison(v("B"), CmpOp.Lt, c(1953L)))))

  // r3: CasualWatch(T,E,N) :- MOVIES(I,T,Y,R,P,B,V), GENRES(I,E),
  //     PRODCOMPANY(I,C), COMPANY(C,N), RATINGS(U,I,G,S),
  //     ¬GENRES(I,thriller), R < 100, G >= 4
  val r3: Program = Program(Rule("r3", "CasualWatch", Vector(v("T"), v("E"), v("N")),
    Vector(
      Atom("MOVIES", Vector(v("I"), v("T"), v("Y"), v("R"), v("P"), v("B"), v("V"))),
      Atom("GENRES", Vector(v("I"), v("E"))),
      Atom("PRODCOMPANY", Vector(v("I"), v("C"))),
      Atom("COMPANY", Vector(v("C"), v("N"))),
      Atom("RATINGS", Vector(v("U"), v("I"), v("G"), v("S"))),
      Atom("GENRES", Vector(v("I"), c("thriller")), negated = true),
    ),
    Vector(
      Comparison(v("R"), CmpOp.Lt, c(100L)),
      Comparison(v("G"), CmpOp.Geq, c(4L)),
    )))

  // r4 ∪ r4' ∪ r4'': Players(A) — successful actors in romance after 1999 /
  // comedies about love / dramas about relationships.
  private def playersRule(name: String, genre: String, keyword: Option[String]): Rule = {
    val baseAtoms = Vector(
      Atom("MOVIES", Vector(v("I"), v("T"), v("Y"), v("R"), v("P"), v("B"), v("V"))),
      Atom("CASTS", Vector(v("I"), v("C"), v("H"), v("A"), v("G"))),
      Atom("GENRES", Vector(v("I"), c(genre))),
    ) ++ keyword.map(k => Atom("KEYWORDS", Vector(v("I"), c(k)))) :+
      Atom("RATINGS", Vector(v("U"), v("I"), v("N"), v("S")))
    Rule(name, "Players", Vector(v("A")), baseAtoms,
      Vector(
        Comparison(v("Y"), CmpOp.Gt, c(1999L)),
        Comparison(v("N"), CmpOp.Geq, c(4L)),
      ))
  }
  val r4: Program = Program(Vector(
    playersRule("r4", "romance", None),
    playersRule("r4p", "comedy", Some("love")),
    playersRule("r4pp", "drama", Some("relationship")),
  ))

  // r5: CommCrime(T) :- CRIMES(I,Y,T,L,austin), ¬ARREST(I)
  val r5: Program = Program(Rule("r5", "CommCrime", Vector(v("T")),
    Vector(
      Atom("CRIMES", Vector(v("I"), v("Y"), v("T"), v("L"), c("austin"))),
      Atom("ARREST", Vector(v("I")), negated = true),
    )))

  // r6: CrimeSince(T) :- CRIMES(I,Y,T,L,C), ¬ARREST(I), Y > 2012
  val r6: Program = Program(Rule("r6", "CrimeSince", Vector(v("T")),
    Vector(
      Atom("CRIMES", Vector(v("I"), v("Y"), v("T"), v("L"), v("C"))),
      Atom("ARREST", Vector(v("I")), negated = true),
    ),
    Vector(Comparison(v("Y"), CmpOp.Gt, c(2012L)))))

  // r7: FavCom(T) :- MOVIES(I,T,Y), GENRES(I,comedy), RATES(U,I,R,M,A), R > 4
  val r7: Program = Program(Rule("r7", "FavCom", Vector(v("T")),
    Vector(
      Atom("MOVIES", Vector(v("I"), v("T"), v("Y"))),
      Atom("GENRES", Vector(v("I"), c("comedy"))),
      Atom("RATES", Vector(v("U"), v("I"), v("R"), v("M"), v("A"))),
    ),
    Vector(Comparison(v("R"), CmpOp.Gt, c(4L)))))

  // r8: ActMov(T) :- MOVIES(I,T,Y), GENRES(I,action), RATES(U,I,5,M,A)
  val r8: Program = Program(Rule("r8", "ActMov", Vector(v("T")),
    Vector(
      Atom("MOVIES", Vector(v("I"), v("T"), v("Y"))),
      Atom("GENRES", Vector(v("I"), c("action"))),
      Atom("RATES", Vector(v("U"), v("I"), c(5L), v("M"), v("A"))),
    )))

  // r9: Hops(L) — authors reachable by a co-author path of length `hops`.
  def hops(hopCount: Int): Program = {
    require(hopCount >= 1)
    val atoms = (0 until hopCount).map { i =>
      val from = if (i == 0) v("L") else v(s"R$i")
      Atom("DBLP", Vector(from, v(s"R${i + 1}")))
    }.toVector
    Program(Rule(s"r9_$hopCount", "Hops", Vector(v("L")), atoms))
  }
  val r9: Program = hops(6)

  // r10: Custs(CN,NK) :- CUSTOMER(CK,CN,NK,AB,MS), ORDERS(OK,CK,...),
  //      LINEITEM(OK,...) — over the TPC-H-lite schema (DESIGN.md).
  // `bindExtra` binds that many existential variables to constants, for the
  // Fig 9f sweep over the number of unbound variables.
  def custs(bindExtra: Int = 0): Program = {
    val ordersVars   = Vector(v("OK"), v("CK"), v("OS"), v("TP"), v("OD"))
    val lineitemVars = Vector(v("OK"), v("PK"), v("LN"), v("QT"), v("EP"),
      v("DC"), v("TX"), v("RF"), v("LS"), v("SD"))
    // Bindable existential variables, in the order they get pinned.
    val bindables: Vector[(Var, Const)] = Vector(
      v("MS") -> c("BUILDING"), v("OS") -> c("O"), v("RF") -> c("N"),
      v("LS") -> c("O"), v("AB") -> c(0L), v("TP") -> c(1000L),
      v("PK") -> c(1L), v("LN") -> c(1L), v("QT") -> c(1L), v("EP") -> c(900L),
      v("DC") -> c(0L), v("TX") -> c(0L), v("OD") -> c("1995-01-01"), v("SD") -> c("1995-01-01"),
    )
    require(bindExtra <= bindables.size, s"at most ${bindables.size} bindable vars")
    val bound = bindables.take(bindExtra).toMap
    def s(t: Term): Term = t match {
      case vv: Var => bound.getOrElse(vv, vv)
      case x       => x
    }
    Program(Rule("r10", "Custs", Vector(v("CN"), v("NK")),
      Vector(
        Atom("CUSTOMER", Vector(v("CK"), v("CN"), v("NK"), v("AB"), v("MS")).map(s)),
        Atom("ORDERS", ordersVars.map(s)),
        Atom("LINEITEM", lineitemVars.map(s)),
      )))
  }
  val r10: Program = custs(0)

  // r11: DirGen(N) :- MOVIES(I,T,Y,R,P,B,V), CREWS(I,W,N,director,M),
  //      GENRES(I,E), B > 20000000
  val r11: Program = Program(Rule("r11", "DirGen", Vector(v("N")),
    Vector(
      Atom("MOVIES", Vector(v("I"), v("T"), v("Y"), v("R"), v("P"), v("B"), v("V"))),
      Atom("CREWS", Vector(v("I"), v("W"), v("N"), c("director"), v("M"))),
      Atom("GENRES", Vector(v("I"), v("E"))),
    ),
    Vector(Comparison(v("B"), CmpOp.Gt, c(20000000L)))))

  // r12: TomKey(T,K,E) :- MOVIES(I,T,Y,R,P,B,V), CASTS(I,C,H,tom cruise,G),
  //      KEYWORDS(I,K), GENRES(I,E), RATINGS(U,I,A,S), A >= 4
  val r12: Program = Program(Rule("r12", "TomKey", Vector(v("T"), v("K"), v("E")),
    Vector(
      Atom("MOVIES", Vector(v("I"), v("T"), v("Y"), v("R"), v("P"), v("B"), v("V"))),
      Atom("CASTS", Vector(v("I"), v("C"), v("H"), c("tom cruise"), v("G"))),
      Atom("KEYWORDS", Vector(v("I"), v("K"))),
      Atom("GENRES", Vector(v("I"), v("E"))),
      Atom("RATINGS", Vector(v("U"), v("I"), v("A"), v("S"))),
    ),
    Vector(Comparison(v("A"), CmpOp.Geq, c(4L)))))

  // Airbnb running example (Fig 1):
  // AL(N,R) :- LISTING(I,N,T,R,queen anne,E), AVAIL(I,2016-11-09,P)
  val airbnb: Program = Program(Rule("rA", "AL", Vector(v("N"), v("R")),
    Vector(
      Atom("LISTING", Vector(v("I"), v("N"), v("T"), v("R"), c("queen anne"), v("E"))),
      Atom("AVAIL", Vector(v("I"), c("2016-11-09"), v("P"))),
    )))

  // Fig 3 running example: Qex(X,Y) :- R(X,Z), R(Z,Y), X < Y
  val rEx: Program = Program(Rule("rEx", "Qex", Vector(v("X"), v("Y")),
    Vector(
      Atom("R", Vector(v("X"), v("Z"))),
      Atom("R", Vector(v("Z"), v("Y"))),
    ),
    Vector(Comparison(v("X"), CmpOp.Lt, v("Y")))))

  // Artemis comparison query (§9.3): CrimeDesc(T,N,C,H) :- CRIME(T,S),
  // WITNESS(N,S), SAWPERSON(N,H,C), PERSON(M,H,C), S > 97
  val crimeDesc: Program = Program(Rule("rcd", "CrimeDesc",
    Vector(v("T"), v("N"), v("C"), v("H")),
    Vector(
      Atom("CRIME", Vector(v("T"), v("S"))),
      Atom("WITNESS", Vector(v("N"), v("S"))),
      Atom("SAWPERSON", Vector(v("N"), v("H"), v("C"))),
      Atom("PERSON", Vector(v("M"), v("H"), v("C"))),
    ),
    Vector(Comparison(v("S"), CmpOp.Gt, c(97L)))))

  // Synthetic chain query over Datasets.chainRelations: head = first key,
  // `extraVars` payload columns of each relation carried as variables.
  def chainQuery(joins: Int, extraCols: Int): Program = {
    val atoms = (1 to joins).map { i =>
      val keys = Vector(v(s"X${i - 1}"), v(s"X$i"))
      val pay  = (1 to extraCols).map(e => v(s"P${i}_$e")).toVector
      Atom(s"C$i", keys ++ pay)
    }.toVector
    Program(Rule(s"chain$joins", "ChainQ", Vector(v("X0")), atoms))
  }

  // Synthetic star query over Datasets.starRelations.
  def starQuery(dims: Int, extraCols: Int): Program = {
    val factArgs = (1 to dims).map(i => v(s"K$i")).toVector :+ v("FP")
    val atoms = Atom("F", factArgs) +: (1 to dims).map { i =>
      Atom(s"D$i", v(s"K$i") +: (1 to extraCols).map(e => v(s"Q${i}_$e")).toVector)
    }.toVector
    Program(Rule(s"star$dims", "StarQ", Vector(v("K1")), atoms))
  }

  /** Fig 5: the why / why-not question bindings, as (program, PQ) pairs. */
  def pq(pred: String, args: Term*): PTuple = PTuple(pred, args.toVector)

  val whyR1: ProvQuestion    = ProvQuestion(pq("InvalidD", c("new york")), Why)
  val whynotR1: ProvQuestion = ProvQuestion(pq("InvalidD", c("swanton")), Whynot)
  val whyR2: ProvQuestion    = ProvQuestion(pq("Fsenior", c("brooklyn")), Why)
  val whynotR2: ProvQuestion = ProvQuestion(pq("Fsenior", c("delaware")), Whynot)
  val whyR3: ProvQuestion    = ProvQuestion(pq("CasualWatch", v("T"), c("drama"), v("N")), Why)
  val whynotR3: ProvQuestion = ProvQuestion(pq("CasualWatch", v("T"), c("family"), v("N")), Whynot)
  val whyR4: ProvQuestion    = ProvQuestion(pq("Players", c("jack black")), Why)
  val whynotR4: ProvQuestion = ProvQuestion(pq("Players", c("tom ford")), Whynot)
  val whyR5: ProvQuestion    = ProvQuestion(pq("CommCrime", c("battery")), Why)
  val whynotR5: ProvQuestion = ProvQuestion(pq("CommCrime", c("domestic violence")), Whynot)
  val whyR6: ProvQuestion    = ProvQuestion(pq("CrimeSince", c("theft")), Why)
  val whynotR6: ProvQuestion = ProvQuestion(pq("CrimeSince", c("ritualism")), Whynot)
  val whyR7: ProvQuestion    = ProvQuestion(pq("FavCom", c("forrest gump")), Why)
  val whynotR7: ProvQuestion = ProvQuestion(pq("FavCom", c("babysitting")), Whynot)
  val whyR8: ProvQuestion    = ProvQuestion(pq("ActMov", c("fight club")), Why)
  val whynotR8: ProvQuestion = ProvQuestion(pq("ActMov", c("avalanche")), Whynot)
  val whynotR9: ProvQuestion = ProvQuestion(pq("Hops", c("xueni pan")), Whynot)
  val whynotR10: ProvQuestion = ProvQuestion(pq("Custs", v("CN"), c(3L)), Whynot)
  val whyR11: ProvQuestion    = ProvQuestion(pq("DirGen", c("steven spielberg")), Why)
  val whynotR11: ProvQuestion = ProvQuestion(pq("DirGen", c("robert altman")), Whynot)
  val whyR12: ProvQuestion    = ProvQuestion(pq("TomKey", v("T"), c("mission"), v("E")), Why)
  val whynotR12: ProvQuestion = ProvQuestion(pq("TomKey", v("T"), c("spying"), v("E")), Whynot)

  val whynotAirbnb: ProvQuestion = ProvQuestion(pq("AL", v("N"), c("shared")), Whynot)
  val whynotEx: ProvQuestion     = ProvQuestion(pq("Qex", v("X"), c(4L)), Whynot)
  val whynotCrimeDesc: ProvQuestion = ProvQuestion(
    pq("CrimeDesc", c("trespassing"), c("Aarongolden"), c("MidnightBlue"), c("lavender")), Whynot)
}
