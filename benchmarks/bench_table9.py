"""Table IX benchmark: compression + reuse coverage over the 136-op
numpy registry (20 runs per op, m=1 automatic prediction)."""
from repro.experiments import table9


def test_table9_coverage(benchmark):
    df = benchmark.pedantic(lambda: table9.run_table9(), rounds=1, iterations=1)
    summary = table9.summarize(df)
    print("\n" + table9.format_table(summary))
    el = summary[summary["category"] == "element"].iloc[0]
    cx = summary[summary["category"] == "complex"].iloc[0]
    # Paper shape: element-wise fully covered; complex mostly compressed,
    # gen_sig markedly lower than dim_sig; exactly one misprediction
    # (np.cross).
    assert el["provrc"] == el["dim_sig"] == el["gen_sig"] == 75
    assert cx["provrc"] >= 45
    assert cx["dim_sig"] >= 45
    assert cx["gen_sig"] < cx["dim_sig"]
    assert df[df["error"]]["op"].tolist() == ["cross"]
