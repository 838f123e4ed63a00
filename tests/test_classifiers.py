"""Tests for the from-scratch classifier substrate."""
import numpy as np
import pytest

from repro.classifiers import CLASSIFIER_NAMES, make_classifier
from repro.classifiers.forest import RandomForestClassifier
from repro.classifiers.gbdt import LightGBMLikeClassifier, XGBoostLikeClassifier
from repro.classifiers.knn import KNNClassifier
from repro.classifiers.tree import DecisionTreeClassifier
from repro.datasets.generators import make_blobs_classification


def _easy(q=2, n=400, p=4, seed=0):
    return make_blobs_classification(
        n_samples=n, n_features=p, n_classes=q, class_sep=6.0,
        clusters_per_class=1, seed=seed,
    )


ALL_CLASSES = [
    DecisionTreeClassifier,
    RandomForestClassifier,
    KNNClassifier,
    XGBoostLikeClassifier,
    LightGBMLikeClassifier,
]


@pytest.mark.parametrize("cls", ALL_CLASSES)
@pytest.mark.parametrize("q", [2, 3])
def test_learns_separable_blobs(cls, q):
    X, y = _easy(q=q)
    clf = cls().fit(X[:300], y[:300])
    acc = (clf.predict(X[300:]) == y[300:]).mean()
    assert acc > 0.9, f"{cls.__name__} acc={acc}"


@pytest.mark.parametrize("name", CLASSIFIER_NAMES)
def test_factory_names(name):
    X, y = _easy()
    clf = make_classifier(name, seed=0).fit(X, y)
    assert len(clf.predict(X[:10])) == 10


def test_factory_rejects_unknown():
    with pytest.raises(ValueError):
        make_classifier("SVM")


@pytest.mark.parametrize("cls", ALL_CLASSES)
def test_predict_before_fit_raises(cls):
    with pytest.raises(RuntimeError):
        cls().predict(np.zeros((1, 2)))


@pytest.mark.parametrize("cls", ALL_CLASSES)
def test_empty_train_raises(cls):
    with pytest.raises(ValueError):
        cls().fit(np.empty((0, 2)), np.empty(0, dtype=int))


@pytest.mark.parametrize("cls", ALL_CLASSES)
def test_single_class_training(cls):
    X = np.random.default_rng(0).normal(0, 1, (30, 3))
    y = np.full(30, 7)
    clf = cls().fit(X, y)
    assert (clf.predict(X) == 7).all()


@pytest.mark.parametrize("cls", ALL_CLASSES)
def test_noninteger_labels_roundtrip(cls):
    X, y = _easy()
    y = y + 10  # labels {10, 11}
    clf = cls().fit(X, y)
    assert set(np.unique(clf.predict(X))) <= {10, 11}


class TestDecisionTree:
    def test_pure_fit_memorises_training_set(self):
        X, y = _easy(n=200)
        clf = DecisionTreeClassifier().fit(X, y)
        assert (clf.predict(X) == y).mean() == 1.0

    def test_max_depth_limits_tree(self):
        X, y = _easy(n=300)
        stump = DecisionTreeClassifier(max_depth=1).fit(X, y)
        root = stump._root
        assert root.left is not None and root.left.left is None

    def test_proba_rows_sum_to_one(self):
        X, y = _easy(q=3)
        P = DecisionTreeClassifier().fit(X, y).predict_proba(X[:50])
        assert np.allclose(P.sum(axis=1), 1.0)

    def test_deterministic(self):
        X, y = _easy(seed=1)
        a = DecisionTreeClassifier(seed=3).fit(X, y).predict(X)
        b = DecisionTreeClassifier(seed=3).fit(X, y).predict(X)
        assert np.array_equal(a, b)

    def test_constant_features_fall_back_to_leaf(self):
        X = np.ones((40, 3))
        y = np.array([0, 1] * 20)
        clf = DecisionTreeClassifier().fit(X, y)
        assert clf._root.left is None  # unsplittable → leaf


class TestForest:
    def test_beats_single_tree_on_noisy_overlap(self):
        X, y = make_blobs_classification(
            n_samples=900, n_features=6, n_classes=2, class_sep=1.2, seed=5
        )
        tr, te = slice(0, 600), slice(600, None)
        acc_t = (DecisionTreeClassifier(seed=0).fit(X[tr], y[tr]).predict(X[te]) == y[te]).mean()
        acc_f = (RandomForestClassifier(seed=0).fit(X[tr], y[tr]).predict(X[te]) == y[te]).mean()
        assert acc_f >= acc_t - 0.02

    def test_n_estimators_respected(self):
        X, y = _easy(n=100)
        clf = RandomForestClassifier(n_estimators=5).fit(X, y)
        assert len(clf._trees) == 5


class TestKNN:
    def test_k1_memorises(self):
        X, y = _easy(n=100)
        assert (KNNClassifier(k=1).fit(X, y).predict(X) == y).all()

    def test_k_larger_than_train(self):
        X, y = _easy(n=20)
        clf = KNNClassifier(k=50).fit(X[:4], y[:4])
        assert len(clf.predict(X)) == len(X)

    def test_rejects_bad_k(self):
        with pytest.raises(ValueError):
            KNNClassifier(k=0)


class TestGBDT:
    def test_proba_valid(self):
        X, y = _easy(q=3)
        P = XGBoostLikeClassifier(n_rounds=5).fit(X, y).predict_proba(X[:20])
        assert np.allclose(P.sum(axis=1), 1.0) and (P >= 0).all()

    def test_more_rounds_fit_tighter(self):
        X, y = make_blobs_classification(
            n_samples=500, n_features=4, n_classes=2, class_sep=2.0, seed=6
        )
        weak = XGBoostLikeClassifier(n_rounds=2).fit(X, y)
        strong = XGBoostLikeClassifier(n_rounds=30).fit(X, y)
        assert (strong.predict(X) == y).mean() >= (weak.predict(X) == y).mean()

    def test_leafwise_and_levelwise_both_learn(self):
        X, y = _easy(n=300)
        for cls in (XGBoostLikeClassifier, LightGBMLikeClassifier):
            acc = (cls(n_rounds=10).fit(X, y).predict(X) == y).mean()
            assert acc > 0.95
