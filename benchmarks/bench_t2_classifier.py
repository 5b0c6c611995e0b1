"""T2 bench: Fig-11 classifier train/eval loop."""
from repro.experiments import classifier_effect


def test_bench_t2_classifier_effect(benchmark):
    rows = benchmark(lambda: classifier_effect.run(n=6889, hf_train_counts=(0, 40)))
    assert len(rows) == 3
