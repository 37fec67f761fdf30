"""Bench: the Fig. 2 running-example table (#paths vs η*)."""
import pandas as pd

from repro.experiments.paper_numbers import FIG2_TABLE
from repro.experiments.tables import fig2_table, save_table


def test_fig2_running_example(benchmark):
    df = benchmark.pedantic(fig2_table, rounds=1, iterations=1)
    paper = pd.DataFrame(FIG2_TABLE).add_prefix("paper_")
    out = pd.concat([df.reset_index(drop=True), paper], axis=1)
    save_table(out, "fig2")
    # the figure's argument: for small ell_f deterministic traversal beats
    # sampling (paths_total < eta*), and the relation flips as ell_f grows
    assert (df.paths_total < df.eta_star)[:3].all()
    assert (df.paths_total > df.eta_star).any()
    # eta* grows ~quadratically in ell_f via psi (Eq. 8/9)
    assert df.eta_star.is_monotonic_increasing
    assert df.eta_star.iloc[-1] > 8 * df.eta_star.iloc[0]
