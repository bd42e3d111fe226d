"""Benchmark: effectiveness harnesses (Figs 17–25 and 26–29), scaled.

The full sweeps (all τ̂ × γ × datasets) run in the jobs; these benches
time one representative slice end-to-end, including exact-GED ground
truth and all four methods.
"""
from repro.experiments.effectiveness import accuracy_vs_n, effectiveness_real


def test_bench_effectiveness_grec(spark, benchmark):
    df = benchmark.pedantic(
        lambda: effectiveness_real(
            spark, "GREC", tau_hats=(1, 2), gammas=(0.8,),
            n_queries=2, n_pairs=150,
        ),
        rounds=1, iterations=1,
    )
    assert set(df["method"]) == {"gbda", "lsap", "greedy", "seriation"}


def test_bench_accuracy_vs_n_syn1(spark, benchmark):
    df = benchmark.pedantic(
        lambda: accuracy_vs_n(spark, "Syn-1", tau_hats=(3,), gammas=(0.8,)),
        rounds=1, iterations=1,
    )
    assert df["f1"].between(0, 1).all()
