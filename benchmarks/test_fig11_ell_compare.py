"""Bench: Fig. 11 — SMM under our ℓ (Eq. 6) vs Peng et al.'s ℓ (Eq. 5)."""
from repro.experiments.tables import fig11_ell_compare, save_table


def test_fig11_ell_compare(benchmark):
    df = benchmark.pedantic(
        fig11_ell_compare,
        kwargs=dict(n_queries=3),
        rounds=1,
        iterations=1,
    )
    save_table(df, "fig11")
    ok = df[~df.timed_out]
    piv = ok.pivot_table(index=["dataset", "eps"], columns="method",
                         values="avg_ops", aggfunc="first")

    # Theorem 3.1: our ell <= Peng's ell always, so SMM does no more SpMV
    # work under ours.
    assert (piv["SMM-ours"] <= piv["SMM-peng"] + 1e-9).all()

    # §5.4: the gain is largest on the high-average-degree graphs.
    gains = piv["SMM-peng"] / piv["SMM-ours"]
    high = gains.loc[["facebook_lite", "orkut_lite"]].mean()
    assert high > 1.2

    # both variants keep the eps/2 truncation guarantee
    assert (ok.avg_abs_err <= ok.eps / 2 + 1e-9).all()
