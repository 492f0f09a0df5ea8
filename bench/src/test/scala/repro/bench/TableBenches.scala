package repro.bench

import repro.exp.{Tables, TablesSpecial}

/** One benchmark suite per table of the paper's evaluation section.
  * ScalaTest runs suites in name order; each prints its reproduced rows
  * into the bench log (tee'd to bench_output.txt) next to the paper's
  * numbers, and fails if a shape check breaks.
  */
class Table2aBench extends TableBench {
  test("Table 2a: pareto-1.5 d=1, band-width sweep") { emit(Tables.table2a(spark)) }
}

class Table2bBench extends TableBench {
  test("Table 2b: pareto-1.5 d=3, band-width sweep") { emit(Tables.table2b(spark)) }
}

class Table2cBench extends TableBench {
  test("Table 2c: ebird join cloud d=3, band-width sweep") { emit(Tables.table2c(spark)) }
}

class Table3Bench extends TableBench {
  test("Table 3: skew resistance") { emit(Tables.table3(spark)) }
}

class Table4aBench extends TableBench {
  test("Table 4a: scalability, pareto") { emit(Tables.table4a(spark)) }
}

class Table4bBench extends TableBench {
  test("Table 4b: scalability, ebird join cloud") { emit(Tables.table4b(spark)) }
}

class Table4cBench extends TableBench {
  test("Table 4c: input-size scaling, d=8") { emit(Tables.table4c(spark)) }
}

class Table4dBench extends TableBench {
  test("Table 4d: worker scaling, d=8") { emit(Tables.table4d(spark)) }
}

class Table5Bench extends TableBench {
  test("Table 5: grid-size sweep vs Grid*") { emit(TablesSpecial.table5(spark)) }
}

class Table6Bench extends TableBench {
  test("Table 6: Grid* vs RecPart on reverse-Pareto") { emit(TablesSpecial.table6(spark)) }
}

class Table7Bench extends TableBench {
  test("Table 7/11: distributed IEJoin comparison") { emit(TablesSpecial.table7(spark)) }
}

class Table8Bench extends TableBench {
  test("Table 8/13: cost-ratio sensitivity") { emit(TablesSpecial.table8(spark)) }
}

class Table9Bench extends TableBench {
  test("Table 9/14: symmetric partitioning") { emit(TablesSpecial.table9(spark)) }
}

class Table12Bench extends TableBench {
  test("Table 12: running-time model accuracy") { emit(TablesSpecial.table12(spark)) }
}

class Table15Bench extends TableBench {
  test("Table 15: dimensionality sweep") { emit(Tables.table15(spark)) }
}

class Table16Bench extends TableBench {
  test("Table 16: theoretical termination on PTF") { emit(TablesSpecial.table16(spark)) }
}
