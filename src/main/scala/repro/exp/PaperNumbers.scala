package repro.exp

/** The paper's reported numbers (Tables 3, 5–10), embedded verbatim so
  * every bench prints paper-vs-ours side by side and EXPERIMENTS.md can be
  * regenerated from artifacts. Keys: (dataset, method) → metric → cell.
  */
object PaperNumbers {

  private def parse(block: String): Map[(String, String, String), String] = {
    val out = Map.newBuilder[(String, String, String), String]
    var metrics: Array[String] = Array.empty
    block.linesIterator.map(_.trim).filter(_.nonEmpty).foreach { line =>
      val toks = line.split("\\s+")
      if (line.startsWith("#")) metrics = toks.drop(1)
      else {
        val ds = toks(0); val method = toks(1)
        metrics.zip(toks.drop(2)).foreach { case (m, cell) => out += ((ds, method, m) -> cell) }
      }
    }
    out.result()
  }

  /** Table 5 — runtime (s), 128 threads, DG/DW/FD. */
  val table5: Map[(String, String, String), String] = parse("""
# DG DW FD
soc Spade 23.46 28.10 30.67
soc GBBS 10.01 23.28 35.43
soc PKMC 103.16 105.77 106.96
soc FWA 704 1241 1381
soc ALENEX 138.73 120.19 128.81
soc Dupin 1.79 2.26 2.38
sk Spade 182.28 215.27 210.26
sk GBBS 13.95 35.91 48.80
sk PKMC 388.85 393.01 431.04
sk FWA 3092 4934 4716
sk ALENEX 411.75 488.49 473.45
sk Dupin 3.87 3.93 4.25
uk Spade 67.08 93.66 83.20
uk GBBS 7.26 27.15 50.29
uk PKMC 167.76 168.81 187.61
uk FWA 1794 TLE TLE
uk ALENEX 238.36 209.30 213.80
uk Dupin 3.38 3.57 3.56
la Spade 175.07 242.26 224.47
la GBBS 50.21 80.66 50.29
la PKMC 946.64 1048.48 1024.23
la FWA 4995 TLE TLE
la ALENEX 215.98 154.17 194.06
la Dupin 4.55 4.41 5.16
rv Spade 135.89 135.05 132.61
rv GBBS 32.51 62.29 71.67
rv PKMC 659.04 659.15 693.83
rv FWA 3569 TLE TLE
rv ALENEX 158.64 132.88 158.79
rv Dupin 3.34 3.76 3.89
bio Spade 1.99 2.02 2.11
bio GBBS 2.55 5.04 5.21
bio PKMC 11.38 11.39 12.97
bio FWA 62 393 428
bio ALENEX 62.16 68.22 63.62
bio Dupin 0.15 0.20 0.23
gfg Spade 2.30 2.62 2.70
gfg GBBS 0.41 2.10 5.74
gfg PKMC 15.96 15.00 16.25
gfg FWA 133 186 173
gfg ALENEX 4.13 4.01 4.75
gfg Dupin 0.29 0.33 0.35
kron Spade 5.08 5.36 5.61
kron GBBS 1.47 6.62 9.58
kron PKMC 34.47 35.71 37.23
kron FWA 254 344 372
kron ALENEX 85.8 83.05 82.98
kron Dupin 0.18 0.36 0.23
""")

  /** Table 6 — runtime (s), TDS/kCLiDS. */
  val table6: Map[(String, String, String), String] = parse("""
# TDS kCLiDS
soc Spade TLE TLE
soc kCLIST 1516 1444
soc PBBS 3524.11 TLE
soc Dupin 32.59 283.70
sk Spade TLE TLE
sk kCLIST TLE TLE
sk PBBS TLE TLE
sk Dupin 42.73 2636.17
uk Spade TLE TLE
uk kCLIST 494 447
uk PBBS 2900.83 TLE
uk Dupin 16.66 186.31
la Spade TLE TLE
la kCLIST 10663 8003
la PBBS TLE TLE
la Dupin 145.72 2241.69
rv Spade TLE TLE
rv kCLIST 5561 4655
rv PBBS TLE TLE
rv Dupin 96.32 1009.45
bio Spade TLE TLE
bio kCLIST 230.0 255.0
bio PBBS 225.06 TLE
bio Dupin 6.25 82.54
gfg Spade 5.66 5.84
gfg kCLIST 10 9
gfg PBBS 1.37 0.79
gfg Dupin 0.74 0.69
kron Spade TLE TLE
kron kCLIST 406 450
kron PBBS 330.18 TLE
kron Dupin 11.69 138.63
""")

  /** Table 7 — densities, DG/DW/FD. */
  val table7: Map[(String, String, String), String] = parse("""
# DG DW FD
soc Spade 1307 63372 16947
soc GBBS 1307 63372 16883
soc PKMC 1053 54373 15363
soc FWA 1307 63372 16883
soc ALENEX 1307 63372 16883
soc Dupin 1286 59379 16234
sk Spade 2257 109097 33741
sk GBBS 2257 109097 28118
sk PKMC 1954 95241 25868
sk FWA 2257 109097 28188
sk ALENEX 2257 109097 28188
sk Dupin 2235 98669 27067
uk Spade 426 27812 10155
uk GBBS 426 27812 8987
uk PKMC 375 24279 8268
uk FWA 486 TLE TLE
uk ALENEX 486 27812 8987
uk Dupin 309 24796 8424
la Spade 1877 89641 22198
la GBBS 1877 89641 21774
la PKMC 1512 83049 19637
la FWA 1877 TLE TLE
la ALENEX 1877 89641 21774
la Dupin 1843 87671 20610
rv Spade 1643 74779 22678
rv GBBS 1643 74779 20749
rv PKMC 1437 67328 16753
rv FWA 1643 TLE TLE
rv ALENEX 1643 74779 20749
rv Dupin 1518 71058 18115
bio Spade 777 36446 13039
bio GBBS 777 36446 12669
bio PKMC 721 32284 11283
bio FWA 787 36446 12669
bio ALENEX 787 36446 12669
bio Dupin 699 31172 10404
gfg Spade 28 1432 5369
gfg GBBS 28 1432 5018
gfg PKMC 28 1396 4782
gfg FWA 28 1432 5108
gfg ALENEX 28 1432 5108
gfg Dupin 26 1405 4879
kron Spade 1177 53539 15381
kron GBBS 1177 53539 14861
kron PKMC 1169 49983 12829
kron FWA 1177 53539 14861
kron ALENEX 1177 53539 14861
kron Dupin 1177 52695 13912
""")

  /** Table 8 — densities, TDS/kCLiDS. */
  val table8: Map[(String, String, String), String] = parse("""
# TDS kCLiDS
soc Spade TLE TLE
soc kCLIST 1525517 645536400
soc PBBS 1994617 TLE
soc Dupin 1533939 606708980
sk Spade TLE TLE
sk kCLIST TLE TLE
sk PBBS TLE TLE
sk Dupin 9995529 14890921876
uk Spade TLE TLE
uk kCLIST 188524 44272600
uk PBBS 304577 TLE
uk Dupin 187260 33823488
la Spade TLE TLE
la kCLIST 3865986 3306718000
la PBBS TLE TLE
la Dupin 3974028 3167144896
rv Spade TLE TLE
rv kCLIST 3561222 3280083600
rv PBBS TLE TLE
rv Dupin 3769671 2997257620
bio Spade TLE TLE
bio kCLIST 1043100 542860800
bio PBBS 1187388 TLE
bio Dupin 1138083 544047728
gfg Spade 0 0
gfg kCLIST 0 0
gfg PBBS 0 0
gfg Dupin 0 0
kron Spade TLE TLE
kron kCLIST 1447859 424908400
kron PBBS 330.18 TLE
kron Dupin 1447788 426677504
""")

  /** Table 3 — GPO/LPO impact on dataset `la` (rounds and pruned counts). */
  val table3: Map[(String, String), String] = Map(
    ("RoundsPlain", "DG") -> "17637", ("RoundsPlain", "DW") -> "150223", ("RoundsPlain", "FD") -> "112074",
    ("RoundsGPO", "DG") -> "13287", ("RoundsGPO", "DW") -> "79835", ("RoundsGPO", "FD") -> "108706",
    ("LongTail", "DG") -> "45017232", ("LongTail", "DW") -> "48248685", ("LongTail", "FD") -> "5658425",
    ("RedGPO", "DG") -> "24.67%", ("RedGPO", "DW") -> "46.84%", ("RedGPO", "FD") -> "3.01%",
    ("RoundsLPO", "DG") -> "3221", ("RoundsLPO", "DW") -> "10832", ("RoundsLPO", "FD") -> "101255",
    ("Sparse", "DG") -> "13324405", ("Sparse", "DW") -> "15487382", ("Sparse", "FD") -> "3762288",
    ("RedLPO", "DG") -> "81.74%", ("RedLPO", "DW") -> "92.79%", ("RedLPO", "FD") -> "9.65%",
  )

  /** Table 9 — case study: (method, metric) → (latency s, prevention %). */
  val table9: Map[(String, String), (String, String)] = Map(
    ("Dupin", "DG") -> ("3.10", "78%"), ("Dupin", "DW") -> ("3.54", "86%"),
    ("Dupin", "FD") -> ("3.59", "94.5%"), ("Dupin", "TDS") -> ("2145.00", "32%"),
    ("Spade", "DG") -> ("165.20", "58%"), ("Spade", "DW") -> ("235.63", "63%"),
    ("Spade", "FD") -> ("197.61", "45%"), ("Spade", "TDS") -> ("TLE", "TLE"),
    ("GBBS", "DG") -> ("927.88", "12%"), ("GBBS", "DW") -> ("TLE", "TLE"),
    ("GBBS", "FD") -> ("6014.00", "3%"), ("GBBS", "TDS") -> ("-", "-"),
  )

  /** Table 10 — (method, metric) → (X5650 s, EPYC 7742 s) on `soc`. */
  val table10: Map[(String, String), (String, String)] = Map(
    ("Spade", "DG") -> ("23.46", "20.45"), ("Spade", "DW") -> ("28.10", "26.04"), ("Spade", "FD") -> ("30.67", "28.41"),
    ("FWA", "DG") -> ("704", "559"), ("FWA", "DW") -> ("1241", "839"), ("FWA", "FD") -> ("1381", "914"),
    ("GBBS", "DG") -> ("10.01", "8.41"), ("GBBS", "DW") -> ("23.28", "15.73"), ("GBBS", "FD") -> ("35.43", "24.08"),
    ("PBBS", "TDS") -> ("3524.11", "1970.90"), ("PBBS", "kCLiDS") -> ("TLE", "TLE"),
    ("Dupin", "DG") -> ("1.79", "0.80"), ("Dupin", "DW") -> ("2.26", "1.09"), ("Dupin", "FD") -> ("2.38", "1.18"),
    ("Dupin", "TDS") -> ("32.59", "18.09"), ("Dupin", "kCLiDS") -> ("283.70", "148.83"),
  )

  /** Table 4 — paper dataset statistics (|V|, |E|, avg degree, type). */
  val table4: Map[String, (String, String, String, String)] = Map(
    "gfg" -> ("3,646,185", "28,635,763", "17", "Transaction"),
    "soc" -> ("28,504,110", "531,000,244", "18", "Social network"),
    "uk" -> ("39,454,748", "936,364,284", "24", "Web graph"),
    "rv" -> ("41,652,230", "1,468,365,182", "35", "Social network"),
    "kron" -> ("1,544,088", "91,042,012", "58", "Cheminformatics"),
    "sk" -> ("50,636,151", "1,949,412,601", "38", "Web graph"),
    "la" -> ("52,579,682", "1,963,263,821", "37", "Social network"),
    "bio" -> ("1,508,587", "32,761,889", "22", "Biologic graph"),
  )
}
