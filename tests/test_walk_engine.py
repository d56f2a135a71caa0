"""Walk engine + application kernels: first-order bias correctness,
node2vec's Eq. 1 second-order distribution, PPR termination, dead ends."""
import numpy as np
import pandas as pd
import pytest

from repro.core import BingoStore
from repro.walk import (
    Node2VecParams,
    deepwalk,
    node2vec,
    ppr,
    random_walk,
    simple_sampling,
)
from tests.util import assert_distribution, rng


def store_from(rows):
    return BingoStore(pd.DataFrame(rows, columns=["src", "dst", "bias"]))


@pytest.fixture
def triangle():
    # 0 -> {1 (w3), 2 (w1)}; 1 -> {0}; 2 -> {0}; always returns to 0.
    return store_from([(0, 1, 3), (0, 2, 1), (1, 0, 1), (2, 0, 1)])


class TestFirstOrder:
    def test_paths_start_at_starts(self, triangle):
        res = random_walk(triangle, [0, 1, 2], rng(1), length=5)
        np.testing.assert_array_equal(res.paths[:, 0], [0, 1, 2])

    def test_walk_length(self, triangle):
        res = random_walk(triangle, [0] * 4, rng(2), length=7)
        assert res.paths.shape == (4, 8)
        assert (res.paths >= 0).all()
        assert res.steps == 4 * 7

    def test_edges_followed_exist(self, triangle):
        res = random_walk(triangle, [0] * 20, rng(3), length=10)
        for row in res.paths:
            for a, b in zip(row[:-1], row[1:]):
                if b >= 0:
                    assert triangle.has_edge(int(a), int(b))

    def test_first_step_distribution(self, triangle):
        res = random_walk(triangle, [0] * 40_000, rng(4), length=1)
        first = res.paths[:, 1]
        assert_distribution(first - 1, [0.75, 0.25])  # w3 vs w1

    def test_dead_end_terminates(self):
        st = store_from([(0, 1, 1)])  # vertex 1 has no out-edges
        res = random_walk(st, [0], rng(5), length=10)
        np.testing.assert_array_equal(res.paths[0, :2], [0, 1])
        assert (res.paths[0, 2:] == -1).all()

    def test_start_at_dead_end(self):
        st = store_from([(0, 1, 1)])
        res = random_walk(st, [1], rng(6), length=5)
        assert (res.paths[0, 1:] == -1).all()
        assert res.steps == 0

    def test_visits_count_all_hops(self, triangle):
        res = random_walk(triangle, [0] * 10, rng(7), length=4)
        assert res.visits.sum() == (res.paths >= 0).sum()

    def test_stationary_distribution_star(self):
        # Star: center 0 <-> leaves; leaf choice follows biases each visit.
        st = store_from(
            [(0, 1, 1), (0, 2, 2), (0, 3, 5), (1, 0, 1), (2, 0, 1), (3, 0, 1)]
        )
        res = random_walk(st, [0] * 3000, rng(8), length=20)
        leaves = res.paths[:, 1::2].ravel()  # odd steps are leaves
        leaves = leaves[leaves > 0]
        assert_distribution(leaves - 1, np.array([1, 2, 5]) / 8)


class TestNode2Vec:
    def _second_step_dist(self, p, q, n=40_000):
        # Graph: walk 0 -> 1 happened; from 1 the candidates are
        # 0 (distance 0), 2 (distance 1: edge 0-2 exists), 3 (distance 2).
        st = store_from(
            [
                (0, 1, 1), (0, 2, 1),
                (1, 0, 1), (1, 2, 1), (1, 3, 1),
                (2, 0, 1), (3, 1, 1),
            ]
        )
        res = random_walk(
            st, [0] * n, rng(9), length=2, node2vec=Node2VecParams(p=p, q=q)
        )
        two = res.paths[res.paths[:, 1] == 1, 2]  # walks that went 0 -> 1
        two = two[two >= 0]
        f = np.array([1.0 / p, 1.0, 1.0 / q])  # factors for 0, 2, 3
        return two, f / f.sum()

    def test_eq1_distribution_p_half_q_two(self):
        two, expect = self._second_step_dist(0.5, 2.0)
        remap = {0: 0, 2: 1, 3: 2}
        mapped = np.array([remap[int(x)] for x in two])
        assert_distribution(mapped, expect)

    def test_eq1_distribution_backtrack_heavy(self):
        two, expect = self._second_step_dist(0.2, 5.0)
        remap = {0: 0, 2: 1, 3: 2}
        mapped = np.array([remap[int(x)] for x in two])
        assert_distribution(mapped, expect)

    def test_eq1_uniform_when_p_q_one(self):
        two, expect = self._second_step_dist(1.0, 1.0)
        np.testing.assert_allclose(expect, 1 / 3)
        remap = {0: 0, 2: 1, 3: 2}
        mapped = np.array([remap[int(x)] for x in two])
        assert_distribution(mapped, expect)

    def test_first_step_is_first_order(self):
        st = store_from([(0, 1, 3), (0, 2, 1), (1, 0, 1), (2, 0, 1)])
        res = random_walk(st, [0] * 30_000, rng(10), length=1,
                          node2vec=Node2VecParams(0.25, 4.0))
        assert_distribution(res.paths[:, 1] - 1, [0.75, 0.25])


class TestPPR:
    def test_expected_length(self, triangle):
        res = ppr(triangle, rng(11), stop_prob=1 / 20, max_length=200,
                  starts=[0] * 5000)
        # Geometric termination: E[length] = 1/stop_prob = 20, sd 20/sqrt(n).
        assert res.mean_length() == pytest.approx(20.0, rel=0.15)

    def test_zero_stop_runs_full(self, triangle):
        res = random_walk(triangle, [0] * 10, rng(12), length=15, stop_prob=0.0)
        assert (res.paths >= 0).all()

    def test_always_stop(self, triangle):
        res = random_walk(triangle, [0] * 10, rng(13), length=15, stop_prob=1.0)
        assert (res.paths[:, 1:] == -1).all()


class TestApps:
    def test_deepwalk_defaults(self, triangle):
        res = deepwalk(triangle, rng(14), length=5)
        assert res.paths.shape[0] == 3  # one walker per vertex

    def test_walker_cap(self, triangle):
        res = deepwalk(triangle, rng(15), length=3, walkers=2)
        assert res.paths.shape[0] == 2

    def test_node2vec_app(self, triangle):
        res = node2vec(triangle, rng(16), length=4)
        assert (res.paths >= 0).all()

    def test_simple_sampling_is_one_hop(self, triangle):
        res = simple_sampling(triangle, rng(17))
        assert res.paths.shape[1] == 2

    def test_ppr_visits_normalizable(self, triangle):
        res = ppr(triangle, rng(18), starts=[0] * 200)
        assert res.visits.sum() > 0
