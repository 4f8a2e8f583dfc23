"""Tests of the shared dirtiness utilities."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.datasets.dirty import (
    perturb_string,
    person_names,
    unique_phrases,
)
from repro.simjoin.similarity import combined_similarity


class TestUniquePhrases:
    @pytest.mark.parametrize("n", [1, 40, 500])
    def test_distinct(self, n):
        out = unique_phrases(n)
        assert len(out) == n == len(set(out))

    def test_deterministic(self):
        assert unique_phrases(50, seed=3) == unique_phrases(50, seed=3)

    def test_word_count(self):
        for p in unique_phrases(30, n_words=3):
            assert len(p.split()) == 3


class TestPersonNames:
    def test_distinct(self):
        names = person_names(400)
        assert len(set(names)) == 400

    def test_format(self):
        assert all(len(n.split()) >= 2 for n in person_names(10))


class TestPerturb:
    def test_deterministic_with_rng(self):
        a = perturb_string("Amber River Tiger", np.random.default_rng(1))
        b = perturb_string("Amber River Tiger", np.random.default_rng(1))
        assert a == b

    @given(st.integers(0, 500))
    @settings(max_examples=30, deadline=None)
    def test_perturbed_stays_similar(self, seed):
        s = "Golden Harbor Anthem"
        out = perturb_string(s, np.random.default_rng(seed), strength=1)
        assert combined_similarity(s, out) > 0.5

    def test_strength_two_usually_changes(self):
        rng = np.random.default_rng(0)
        changed = sum(
            perturb_string("Silent Canyon Beacon", rng, strength=2)
            != "Silent Canyon Beacon"
            for _ in range(20)
        )
        assert changed >= 15
