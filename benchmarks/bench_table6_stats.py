"""Table 6 benchmark: dataset-statistics computation (cube + support filter)
for all four real-like workloads."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "jobs"))

import table6_stats  # noqa: E402


def test_bench_table6_stats(benchmark):
    df = benchmark.pedantic(table6_stats.run, rounds=1, iterations=1)
    assert len(df) == 4
    assert (df["filtered_epsilon"] <= df["epsilon"]).all()
