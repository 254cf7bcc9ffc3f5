"""Benchmark: regenerate Table I (protocol feature matrix)."""
from repro.core.features import PAPER_TABLE1, feature_matrix


def test_table1_features(benchmark):
    ours = benchmark.pedantic(feature_matrix, rounds=3, iterations=1)
    for name, flags in PAPER_TABLE1.items():
        for f, v in flags.items():
            assert bool(ours.loc[name, f]) == v
