"""Bench: Table 3 — dataset generation + statistics."""
from repro.experiments.tables import save_table, table3_datasets


def test_table3_datasets(benchmark):
    df = benchmark.pedantic(table3_datasets, rounds=1, iterations=1)
    save_table(df, "table3")
    # average degrees must sit in the paper's regime (the substitution's
    # load-bearing property, DESIGN.md §3)
    rel = (df.avg_degree - df.paper_avg_degree).abs() / df.paper_avg_degree
    assert (rel < 0.25).all()
