package repro.eval

/** The published numbers from the paper's evaluation tables, embedded so
  * benchmark output can print paper-vs-measured side by side (see
  * EXPERIMENTS.md). Row keys use our dataset names; "CESM" = CESM-ATM.
  */
object PaperNumbers {

  /** Table 1: dataset dims (per file). */
  val table1Dims: Map[String, String] = Map(
    "RTM" -> "449x449x235", "SegSalt" -> "1008x1008x352", "Miranda" -> "256x384x384",
    "SCALE" -> "98x1200x1200", "CESM" -> "26x1800x3600", "JHTDB" -> "512x512x512",
    "NSTX-GPI" -> "50000x80x64", "APS" -> "1792x2048")

  /** Table 2: compression speeds (MB/s per core) at ε=1e-3.
    * Columns: SZ 3.1, ZFP 0.5.5, QoZ 1.1, SPERR 0.6, FAZ, TTHRESH, HPEZ.
    */
  val table2Comp: Map[String, Seq[Double]] = Map(
    "CESM"    -> Seq(219, 331, 215, 49, 58, 10, 140),
    "RTM"     -> Seq(211, 412, 191, 63, 30, 18, 142),
    "Miranda" -> Seq(163, 416, 157, 35, 29, 28, 140),
    "SCALE"   -> Seq(188, 191, 182, 32, 61, 17, 129),
    "JHTDB"   -> Seq(140, 225, 122, 33, 28, 23, 105),
    "SegSalt" -> Seq(189, 645, 201, 51, 36, 13, 141))

  /** Table 2: decompression speeds (MB/s per core) at ε=1e-3. */
  val table2Decomp: Map[String, Seq[Double]] = Map(
    "CESM"    -> Seq(661, 584, 689, 92, 101, 53, 513),
    "RTM"     -> Seq(786, 622, 626, 124, 64, 108, 510),
    "Miranda" -> Seq(419, 946, 351, 75, 60, 111, 473),
    "SCALE"   -> Seq(610, 553, 567, 68, 140, 53, 450),
    "JHTDB"   -> Seq(376, 425, 243, 70, 59, 60, 330),
    "SegSalt" -> Seq(592, 1060, 629, 108, 65, 97, 485))

  /** Table 3: CR of high-performance compressors.
    * (dataset, ε) → (SZ 3.1, ZFP 0.5.5, QoZ 1.1, HPEZ, improvement %).
    */
  val table3: Map[(String, Double), (Double, Double, Double, Double, Double)] = Map(
    ("RTM", 1e-2)     -> (1764.0, 62.9, 2156.0, 2701.0, 25.3),
    ("RTM", 1e-3)     -> (249.0, 26.2, 285.0, 395.0, 38.6),
    ("RTM", 1e-4)     -> (55.3, 14.3, 58.0, 71.1, 22.6),
    ("Miranda", 1e-2) -> (574.6, 46.6, 977.0, 1320.0, 35.1),
    ("Miranda", 1e-3) -> (168.0, 25.6, 181.0, 258.0, 42.5),
    ("Miranda", 1e-4) -> (47.3, 14.5, 47.7, 63.6, 33.3),
    ("SegSalt", 1e-2) -> (856.0, 59.1, 1005.0, 1484.0, 47.7),
    ("SegSalt", 1e-3) -> (140.6, 24.9, 151.0, 260.0, 72.2),
    ("SegSalt", 1e-4) -> (38.2, 14.9, 35.9, 61.7, 61.5),
    ("SCALE", 1e-2)   -> (167.3, 14.5, 160.0, 186.0, 11.2),
    ("SCALE", 1e-3)   -> (40.4, 7.8, 41.5, 52.9, 27.5),
    ("SCALE", 1e-4)   -> (14.1, 4.6, 13.4, 15.4, 9.2),
    ("JHTDB", 1e-2)   -> (528.2, 22.3, 647.0, 838.0, 29.5),
    ("JHTDB", 1e-3)   -> (73.2, 9.8, 77.8, 101.0, 29.8),
    ("JHTDB", 1e-4)   -> (15.8, 5.0, 15.9, 20.6, 29.6),
    ("CESM", 1e-2)    -> (373.0, 18.2, 263.0, 675.0, 81.0),
    ("CESM", 1e-3)    -> (64.9, 9.6, 59.4, 153.0, 135.7),
    ("CESM", 1e-4)    -> (22.9, 5.8, 21.7, 38.9, 69.9))

  /** Table 4: CR of HPEZ vs high-ratio compressors.
    * (dataset, ε) → (SPERR 0.6, FAZ, TTHRESH, HPEZ).
    */
  val table4: Map[(String, Double), (Double, Double, Double, Double)] = Map(
    ("RTM", 1e-2)     -> (2187.0, 2695.0, 782.0, 2701.0),
    ("RTM", 1e-3)     -> (440.0, 642.0, 71.4, 395.0),
    ("RTM", 1e-4)     -> (84.1, 119.0, 23.7, 71.1),
    ("Miranda", 1e-2) -> (971.4, 996.5, 447.0, 1320.0),
    ("Miranda", 1e-3) -> (243.9, 263.5, 142.0, 258.0),
    ("Miranda", 1e-4) -> (74.5, 93.6, 55.1, 63.6),
    ("SegSalt", 1e-2) -> (1219.4, 1639.6, 291.0, 1484.0),
    ("SegSalt", 1e-3) -> (228.9, 388.9, 99.5, 260.0),
    ("SegSalt", 1e-4) -> (61.3, 117.3, 28.8, 61.7),
    ("SCALE", 1e-2)   -> (103.5, 177.9, 80.0, 186.0),
    ("SCALE", 1e-3)   -> (35.5, 51.8, 18.9, 52.9),
    ("SCALE", 1e-4)   -> (15.0, 16.8, 8.4, 15.4),
    ("JHTDB", 1e-2)   -> (639.8, 726.0, 373.0, 838.0),
    ("JHTDB", 1e-3)   -> (89.3, 90.7, 65.1, 101.0),
    ("JHTDB", 1e-4)   -> (19.9, 20.2, 17.1, 20.6),
    ("CESM", 1e-2)    -> (1221.0, 292.0, 83.5, 675.0),
    ("CESM", 1e-3)    -> (150.0, 77.4, 20.4, 153.0),
    ("CESM", 1e-4)    -> (35.0, 26.3, 8.7, 38.9))

  /** Table 5: transfer times (s, 2048 cores, PSNR=80), Anvil→Bebop rows.
    * Columns: SZ3, ZFP, QoZ 1.1, SPERR 0.6, FAZ, TTHRESH, HPEZ, improve%.
    */
  val table5AtoB: Map[String, Seq[Double]] = Map(
    "CESM"    -> Seq(1934, 3221, 1812, 1560, 1586, 7752, 1005, 35.6),
    "RTM"     -> Seq(198, 362, 173, 277, 494, 527, 181, -4.8),
    "Miranda" -> Seq(49, 84, 44, 72, 87, 121, 39, 11.3),
    "SCALE"   -> Seq(873, 1354, 820, 1037, 782, 2354, 728, 7.0),
    "JHTDB"   -> Seq(567, 826, 527, 645, 583, 835, 417, 20.9),
    "SegSalt" -> Seq(163, 289, 174, 221, 251, 393, 137, 15.9))

  /** Table 5: Bebop→Anvil rows. */
  val table5BtoA: Map[String, Seq[Double]] = Map(
    "CESM"    -> Seq(1614, 2695, 1553, 1522, 1544, 8560, 916, 39.8),
    "RTM"     -> Seq(189, 524, 166, 296, 474, 560, 182, -9.5),
    "Miranda" -> Seq(46, 117, 49, 71, 86, 120, 43, 6.5),
    "SCALE"   -> Seq(745, 1181, 707, 1007, 670, 2002, 624, 6.8),
    "JHTDB"   -> Seq(486, 707, 473, 648, 574, 883, 366, 22.7),
    "SegSalt" -> Seq(167, 241, 153, 213, 265, 300, 132, 14.0))

  /** Table 6: HPEZ speeds (MB/s) with / without fast-varying-first
    * interpolation at ε=1e-3: dataset → (compNoFvfi, comp, decompNoFvfi, decomp).
    */
  val table6: Map[String, (Double, Double, Double, Double)] = Map(
    "CESM"    -> (132.0, 140.0, 469.0, 513.0),
    "RTM"     -> (139.0, 142.0, 457.0, 510.0),
    "Miranda" -> (101.0, 140.0, 202.0, 473.0),
    "SCALE"   -> (124.0, 129.0, 420.0, 450.0),
    "JHTDB"   -> (87.0, 105.0, 184.0, 330.0),
    "SegSalt" -> (134.0, 141.0, 390.0, 485.0))
}
