"""The paper's reported numbers, for the EXPERIMENTS.md diff.

Figures 4–11 are log-scale plots; the concrete values quoted in the
running text (§5.2–§5.4) are recorded here verbatim, plus the exact
Fig. 2 table. The reproduction targets the *shape* of these claims
(who wins, roughly by what factor, where crossovers fall), since our
substrate is lite-scale synthetic graphs rather than the authors' C++
on billion-edge SNAP data (DESIGN.md §3).
"""

# §5.2, Fig. 4 (random queries) — headline speedup claims.
FIG4_CLAIMS = [
    "GEER consistently outperforms all competitors, often by orders of magnitude",
    "YouTube: GEER up to 37.5x faster than AMC and 6461x faster than SMM",
    "YouTube: GEER >3 orders of magnitude faster than RP, TP and TPC",
    "AMC >> TP/TPC on small graphs, but comparable/inferior to SMM when eps <= 0.02",
    "Large graphs: GEER up to 38.2x over AMC, >126.5x over SMM, >1000x over TP",
    "Friendster eps=0.02: GEER 1.3 s vs AMC 23 s; others DNF in one day",
    "EXACT only feasible on Facebook; RP OOM on Orkut/LiveJournal/Friendster",
]

# §5.2, Fig. 5 (edge queries).
FIG5_CLAIMS = [
    "GEER often >1000x faster than SMM, HAY and MC2",
    "GEER up to 132.7x faster than AMC",
    "AMC second best except on small graphs at eps <= 0.02 where SMM comparable",
]

# §5.3, Figs. 6–7 (accuracy).
FIG6_7_CLAIMS = [
    "All methods' actual average absolute error is below the threshold eps",
    "Errors approach 0 as eps is lowered; mostly < 0.1 even at eps = 0.5",
    "RP produces the highest empirical errors on Facebook/DBLP/YouTube",
    "GEER/AMC slightly larger errors than SMM/TP/TPC on DBLP and YouTube",
    "On high-avg-degree graphs errors are ~1e-4 for GEER/AMC (ER ~ 1/d)",
]

# §5.4, Figs. 8–9 (varying tau).
FIG8_9_CLAIMS = [
    "YouTube eps=0.2: AMC best at tau=5 (12x vs tau=1); GEER best at tau=2 (1.6x)",
    "Times first drop sharply with tau, then flatten or rise slowly",
    "Orkut: GEER time grows with tau (sampling cost insignificant at high degree)",
    "tau=5 is a good default in most cases",
]

# §5.4, Fig. 10 (varying ell_b).
FIG10_CLAIMS = [
    "GEER is fastest at (or near) the greedy switch point ell_b*",
    "Orkut: ell_b* +/- 6 is orders of magnitude slower than ell_b*",
    "ell_b < ell_b*: GEER degrades toward AMC; ell_b > ell_b*: SpMV dominates",
]

# §5.4, Fig. 11 (our ell vs Peng et al.'s ell in SMM).
FIG11_CLAIMS = [
    "eps=0.5: ours 3.3x (Facebook) and 6.7x (Orkut) faster; 2.1x on low-degree",
    "eps=0.05: ours 2.4x (Facebook) and 3.8x (Orkut); 1.2-2x elsewhere",
    "Gains grow with average degree (Eq. 6 is inversely degree-correlated)",
]

# Fig. 2's table, verbatim from the paper (toy graph, eps=0.5, delta=0.1).
FIG2_TABLE = {
    "ell_f": [1, 2, 3, 4, 5, 6, 7, 8],
    "paths_s": [2, 4, 8, 26, 42, 184, 268, 1346],
    "paths_t": [7, 9, 53, 71, 397, 539, 2963, 4041],
    "paths_total": [9, 13, 61, 97, 439, 723, 3231, 5387],
    "eta_star": [31, 122, 275, 488, 762, 1097, 1493, 1949],
}

# Table 3 — the original dataset statistics (mirrored in generators too).
TABLE3 = {
    "Facebook": (4_039, 88_234, 43.69),
    "DBLP": (317_080, 1_049_866, 6.62),
    "YouTube": (1_134_890, 2_987_624, 5.27),
    "Orkut": (3_072_441, 117_185_082, 76.28),
    "LiveJournal": (3_997_962, 34_681_189, 17.35),
    "Friendster": (65_608_366, 1_806_067_135, 55.06),
}

# Table 1 — asymptotic complexities (asserted indirectly by scaling tests).
TABLE1 = {
    "TP": "O(eps^-2 log^4(1/eps))",
    "TPC": "O(eps^-2 log^3(1/eps)) on expanders",
    "MC": "O(m d(s) / eps^2)",
    "AMC/GEER": "O(eps^-2 d^-2 log^3(1/(eps d))), d = min(d(s), d(t))",
}
