"""Table II benchmark: one open-data-like collection end to end.

Evaluates a reduced NYC-like collection (fewer pairs than the
standalone job) through the cogrouped Spark harness, including the
full-join proxy estimates, and checks that sketch estimates rank-align
with full-join estimates.
"""
import pytest

from repro.experiments import table2


def test_table2_nyc_sweep(benchmark, spark):
    holder = {}

    def _run():
        raw = table2.run(spark, "nyc", n_pairs=24, n=1024, seed=1)
        holder["summary"] = table2.summarize(raw)
        return raw

    benchmark.pedantic(_run, rounds=1, iterations=1)
    summary = holder["summary"]
    print("\n", summary.to_string(index=False))
    tupsk = summary[summary["method"] == "tupsk"].iloc[0]
    assert tupsk["spearman_r"] > 0.5  # sketches rank-align with full join
