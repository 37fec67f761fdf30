"""Bench: Fig. 5 (time vs ε, edge queries) + Fig. 7 (its error table)."""
from repro.experiments.tables import (
    fig5_time_edge,
    fig7_error_edge,
    save_table,
)


def test_fig5_time_edge(benchmark):
    df = benchmark.pedantic(
        fig5_time_edge,
        kwargs=dict(n_queries=3, budget_s=45.0),
        rounds=1,
        iterations=1,
    )
    save_table(df, "fig5")
    save_table(fig7_error_edge(df), "fig7")

    ok = df[~df.timed_out]

    # Fig. 7 claim: all methods highly accurate on edge queries (edge ER
    # is small and easy) — guaranteed methods stay under eps.
    guaranteed = ok[ok.method.isin(["GEER", "AMC", "SMM"])]
    assert (guaranteed.avg_abs_err <= guaranteed.eps + 1e-9).all()

    # §5.2: GEER dominates the dedicated edge baselines wherever their
    # unscaled sample formulas forced an extrapolated probe.
    slow = df[df.method.isin(["HAY", "MC2"])
              & df.note.str.contains("extrapolated")]
    for _, row in slow.iterrows():
        geer_t = ok[(ok.dataset == row.dataset) & (ok.eps == row.eps)
                    & (ok.method == "GEER")].avg_time_ms
        if len(geer_t):
            assert float(geer_t.iloc[0]) * 10 < row.avg_time_ms, (
                row.dataset, row.eps, row.method
            )
