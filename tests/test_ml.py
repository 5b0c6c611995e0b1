"""Decision-tree substrate and metrics (used by the Fig-11 experiment)."""
import numpy as np
import pytest

from repro.ml import DecisionTree, accuracy, f1_score


def test_accuracy_basic():
    assert accuracy([1, 0, 1, 1], [1, 0, 0, 1]) == 0.75
    assert accuracy([0, 0], [0, 0]) == 1.0


def test_accuracy_empty_raises():
    with pytest.raises(ValueError):
        accuracy([], [])


def test_f1_perfect():
    assert f1_score([1, 1, 0], [1, 1, 0]) == 1.0


def test_f1_no_true_positives():
    assert f1_score([1, 1, 0], [0, 0, 1]) == 0.0


def test_f1_manual():
    # tp=1, fp=1, fn=1 -> precision=recall=0.5 -> f1=0.5
    assert f1_score([1, 0, 1, 0], [1, 1, 0, 0]) == 0.5


def test_tree_learns_single_attribute_rule():
    X = np.array([[0, 0], [0, 1], [1, 0], [1, 1]] * 10)
    y = X[:, 0]
    tree = DecisionTree(max_depth=3, min_samples_split=2).fit(X, y)
    assert (tree.predict(X) == y).all()


def test_tree_learns_conjunction():
    # label = (a0 == 1) and (a2 == 2): needs two stacked splits.
    rng = np.random.default_rng(0)
    X = rng.integers(0, 3, size=(400, 3))
    y = ((X[:, 0] == 1) & (X[:, 2] == 2)).astype(int)
    tree = DecisionTree(max_depth=4, min_samples_split=2).fit(X, y)
    assert accuracy(y, tree.predict(X)) == 1.0


def test_tree_subgroup_exception_rule():
    """The Fig-11 scenario in miniature: a subgroup (a0=1,a1=1) whose
    label rule is the inverse of the global rule is learned only when
    the subgroup is present in training."""
    rng = np.random.default_rng(1)
    X = rng.integers(0, 2, size=(600, 3))
    sub = (X[:, 0] == 1) & (X[:, 1] == 1)
    y = np.where(sub, 1 - X[:, 2], X[:, 2])
    # Without the subgroup in training: predictions on it are wrong.
    tree0 = DecisionTree(max_depth=5, min_samples_split=2).fit(X[~sub], y[~sub])
    acc_without = accuracy(y[sub], tree0.predict(X[sub]))
    assert acc_without < 0.2
    # With it: near perfect.
    tree1 = DecisionTree(max_depth=5, min_samples_split=2).fit(X, y)
    acc_with = accuracy(y[sub], tree1.predict(X[sub]))
    assert acc_with == 1.0


def test_tree_majority_on_pure_noise_depth_zero():
    X = np.zeros((20, 2), dtype=int)
    y = np.array([1] * 15 + [0] * 5)
    tree = DecisionTree(max_depth=0).fit(X, y)
    assert (tree.predict(X) == 1).all()


def test_tree_predict_before_fit_raises():
    with pytest.raises(RuntimeError):
        DecisionTree().predict(np.zeros((1, 2), dtype=int))


def test_tree_shape_validation():
    with pytest.raises(ValueError):
        DecisionTree().fit(np.zeros((3, 2)), np.zeros(4))


def test_tree_deterministic():
    rng = np.random.default_rng(2)
    X = rng.integers(0, 3, size=(200, 4))
    y = rng.integers(0, 2, size=200)
    p1 = DecisionTree(max_depth=4).fit(X, y).predict(X)
    p2 = DecisionTree(max_depth=4).fit(X, y).predict(X)
    assert (p1 == p2).all()
