"""Fig 8/9-style benchmark: forward-query latency over random numpy
pipelines, DSLog in-situ vs the DPSM baselines, at three selectivities.

Every system's result cell set is asserted identical; the latency table
is printed and recorded in EXPERIMENTS.md. Shape assertions encode the
paper's qualitative findings rather than absolute times.
"""
import pytest

from repro.experiments import latency


# seed 7 draws cumprod-class ops (compressible, multi-million-row
# relations) where DSLog's in-situ advantage shows; seed 11 draws two
# sorts (incompressible lineage) — the paper's variance case, where
# DSLog is merely competitive.
@pytest.mark.parametrize("seed,compressible", [(7, True), (11, False)])
def test_query_latency_5_ops(benchmark, tmp_path, seed, compressible):
    def run():
        return latency.run_latency(
            tmp_path / f"s{seed}", n_ops=5, shape=(2000, 50),
            query_rows=(2, 20, 200), seed=seed,
        )

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    print(f"\nseed {seed}\n" + latency.format_table(df))
    assert df["agrees"].all()
    piv = df.pivot_table(index="system", columns="query_rows", values="seconds")
    # DSLog always beats the row store; on compressible pipelines it also
    # beats the decompress-first baseline.
    assert (piv.loc["DSLog"] < piv.loc["Raw"]).all()
    if compressible:
        assert piv.loc["DSLog"].max() < piv.loc["Turbo-RC"].max()
    df.to_csv(tmp_path / f"latency5_{seed}.csv", index=False)


def test_query_latency_10_ops(benchmark, tmp_path):
    # As in the paper, Raw and DSLog-NoMerge appear only in the 5-op
    # experiment; without row-reduction a 10-op chain's intermediate
    # result grows multiplicatively (the paper used 3-hour timeouts).
    systems = [s for s in latency.SYSTEMS if s != "DSLog-NoMerge"]

    def run():
        return latency.run_latency(
            tmp_path / "ten", n_ops=10, shape=(2000, 50),
            query_rows=(20,), seed=7, systems=systems,
        )

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n10 ops\n" + latency.format_table(df))
    assert df["agrees"].all()
    piv = df.pivot_table(index="system", columns="query_rows", values="seconds")
    assert (piv.loc["DSLog"] < piv.loc["Raw"]).all()
