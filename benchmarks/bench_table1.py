"""Table I benchmark: the full synthetic sweep as one distributed job.

Runs a moderately reduced Table I workload (same distributions, fewer
trials per configuration than the standalone job) through the cogrouped
Spark harness and sanity-checks the headline shape: TUPSK attains the
lowest MSE with the largest sketch-join coverage.
"""
import pytest

from repro.experiments import table1


@pytest.fixture(scope="module")
def workload():
    return table1.build_workload(n_rows=10_000, trials_per_config=1, cdunif_draws=4, seed=11)


def test_table1_sweep(benchmark, spark, workload):
    summary_holder = {}

    def _run():
        raw = table1.run(spark, workload)
        summary_holder["summary"] = table1.summarize(raw)
        return raw

    benchmark.pedantic(_run, rounds=1, iterations=1)
    summary = summary_holder["summary"]
    print("\n", summary.to_string(index=False))
    piv = summary.pivot(index="method", columns="dataset", values="mse")
    # Headline shape of Table I: TUPSK beats the two-level baselines,
    # which beat the uncoordinated baselines.
    assert piv.loc["tupsk"].mean() <= piv.loc["lv2sk"].mean()
    assert piv.loc["lv2sk"].mean() <= piv.loc["indsk"].mean()
