"""Tests for model containers: architectures, weight round-trips, counts."""
import numpy as np
import pytest

from repro.nn.model import MLP, logistic_regression, mlp_partitioner, n_parameters


class TestArchitectures:
    @pytest.mark.parametrize("d,m,hidden", [(8, 4, 16), (12, 2, 32), (3, 7, 8)])
    def test_predict_proba_shape_and_simplex(self, d, m, hidden):
        model = mlp_partitioner(d, m, hidden=hidden, seed=0)
        x = np.random.default_rng(0).normal(size=(20, d))
        p = model.predict_proba(x)
        assert p.shape == (20, m)
        np.testing.assert_allclose(p.sum(axis=1), 1.0)

    def test_logreg_single_layer(self):
        model = logistic_regression(5, 2)
        assert len(model.layers) == 1
        assert n_parameters(model) == 5 * 2 + 2

    @pytest.mark.parametrize("n_hidden", [1, 2, 3])
    def test_depth(self, n_hidden):
        model = mlp_partitioner(6, 4, hidden=8, n_hidden=n_hidden)
        # Each hidden block: Linear + BN + ReLU + Dropout; plus output Linear.
        assert len(model.layers) == 4 * n_hidden + 1

    def test_param_count_formula(self):
        d, h, m = 10, 16, 4
        model = mlp_partitioner(d, m, hidden=h, n_hidden=1)
        expect = d * h + h + 2 * h + h * m + m  # W1+b1+BN(gamma,beta)+W2+b2
        assert n_parameters(model) == expect

    def test_table2_neural_lsh_shape(self):
        """The 3×512-hidden stack reproduces Neural LSH's ~729k params."""
        model = mlp_partitioner(128, 256, hidden=512, n_hidden=3)
        assert 700_000 < n_parameters(model) < 760_000

    def test_predict_bin_argmax(self):
        model = mlp_partitioner(4, 3, seed=1)
        x = np.random.default_rng(1).normal(size=(10, 4))
        np.testing.assert_array_equal(
            model.predict_bin(x), model.predict_proba(x).argmax(axis=1)
        )


class TestWeightRoundtrip:
    def test_get_set_roundtrip(self):
        m1 = mlp_partitioner(6, 3, hidden=8, seed=0)
        m2 = mlp_partitioner(6, 3, hidden=8, seed=99)
        x = np.random.default_rng(2).normal(size=(15, 6))
        assert not np.allclose(m1.predict_proba(x), m2.predict_proba(x))
        m2.set_weights(m1.get_weights())
        np.testing.assert_allclose(m1.predict_proba(x), m2.predict_proba(x))

    def test_roundtrip_includes_bn_running_stats(self):
        m1 = mlp_partitioner(4, 2, hidden=8, seed=0)
        x = np.random.default_rng(3).normal(3.0, 2.0, size=(100, 4))
        m1.forward(x, train=True)  # update running stats
        m2 = mlp_partitioner(4, 2, hidden=8, seed=5)
        m2.set_weights(m1.get_weights())
        np.testing.assert_allclose(m1.predict_proba(x), m2.predict_proba(x))

    def test_weights_are_copies(self):
        m = mlp_partitioner(3, 2, seed=0)
        w = m.get_weights()
        w[0][...] = 0.0
        assert not np.allclose(m.params()[0].value, 0.0)


class TestEvalDeterminism:
    def test_eval_mode_deterministic(self):
        model = mlp_partitioner(5, 3, dropout=0.5, seed=0)
        x = np.random.default_rng(4).normal(size=(10, 5))
        np.testing.assert_array_equal(model.predict_proba(x), model.predict_proba(x))

    def test_train_mode_stochastic_with_dropout(self):
        model = mlp_partitioner(5, 3, dropout=0.5, seed=0)
        x = np.random.default_rng(5).normal(size=(10, 5))
        y1 = model.forward(x, train=True)
        y2 = model.forward(x, train=True)
        assert not np.allclose(y1, y2)
