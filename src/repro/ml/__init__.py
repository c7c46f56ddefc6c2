"""The paper's three applications over LMFAO aggregate batches:
ridge linear regression (BGD), decision trees (CART), Rk-means."""

from repro.ml.decision_tree import build_tree, node_batch
from repro.ml.kmeans import weighted_lloyd
from repro.ml.linreg import Feature, sigma_batch, train_linreg
from repro.ml.rkmeans import projection_batch, rkmeans

__all__ = [
    "Feature",
    "build_tree",
    "node_batch",
    "projection_batch",
    "rkmeans",
    "sigma_batch",
    "train_linreg",
    "weighted_lloyd",
]
