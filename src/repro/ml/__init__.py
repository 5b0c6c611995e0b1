"""Minimal ML substrate for the §V-B.2 classifier experiment.

scikit-learn is not available in this container, so the decision tree
the paper trains (scikit-learn 0.20 ``DecisionTreeClassifier``) is
substituted with a from-scratch numpy CART implementation with the same
model family (axis-aligned categorical splits, gini impurity).
"""
from repro.ml.decision_tree import DecisionTree  # noqa: F401
from repro.ml.metrics import accuracy, f1_score  # noqa: F401
