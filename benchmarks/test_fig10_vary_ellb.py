"""Bench: Fig. 10 — GEER cost as ℓ_b is forced away from the greedy ℓ_b*."""
from repro.experiments.tables import fig10_vary_ellb, save_table


def test_fig10_vary_ellb(benchmark):
    df = benchmark.pedantic(
        fig10_vary_ellb,
        kwargs=dict(n_queries=2),
        rounds=1,
        iterations=1,
    )
    save_table(df, "fig10")

    # §5.4 claim: the greedy switch point sits at (or near) the cost
    # minimum. On the lite graphs the ±6 offset window is only
    # non-degenerate where ℓ is comfortably larger than the window (on
    # high-avg-degree lites λ is so small that ℓ ≈ 1–2 and every negative
    # offset clamps to pure AMC — see EXPERIMENTS.md), so assert the
    # V-shape on cells with ℓ ≥ 8.
    deep = df[df.mean_ell >= 8]
    assert len(deep) > 0
    # "at or near" the optimum: within 4x of the best offset in op count
    # (observed ~2-3x; Eq. 17 compares frontier volume to the *sample*
    # count h, not h·(ℓ−ℓ_b) steps, so it can undershoot slightly).
    for (dsname, eps), sub in deep.groupby(["dataset", "eps"]):
        by_off = sub.set_index("offset").avg_ops
        assert by_off[0] <= 4.0 * by_off.min() + 1e-9, (dsname, eps)
    # and the extremes are dramatically worse somewhere (paper: Orkut
    # ±6 orders of magnitude slower; here the deep-ℓ dataset plays that role)
    worst_ratio = max(
        sub.set_index("offset").avg_ops.max()
        / sub.set_index("offset").avg_ops[0]
        for _, sub in deep.groupby(["dataset", "eps"])
    )
    assert worst_ratio > 10.0

    # accuracy is offset-independent (Theorem 3.4 holds for any split)
    assert (df.avg_abs_err <= df.eps + 1e-9).all()
