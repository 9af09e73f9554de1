"""Tests for evolving-KG update batch generation (Sec 2.1 / 7.3 setup)."""
import numpy as np
import pytest

from repro.kg.updates import update_batch, update_sequence


class TestUpdateBatch:
    def test_triple_count_near_request(self):
        d = update_batch(n_triples=10_000, accuracy=0.9, seed=1, subject_offset=0)
        assert d.n_triples == pytest.approx(10_000, rel=0.15)

    def test_accuracy_near_request(self):
        d = update_batch(n_triples=20_000, accuracy=0.7, seed=2, subject_offset=0)
        assert d.accuracy == pytest.approx(0.7, abs=0.02)

    def test_subject_offset_respected(self):
        d = update_batch(n_triples=100, accuracy=0.9, seed=3, subject_offset=500)
        assert d.subjects().min() == 500

    def test_rejects_empty(self):
        with pytest.raises(ValueError):
            update_batch(n_triples=0, accuracy=0.9, seed=4, subject_offset=0)

    def test_deterministic(self):
        a = update_batch(n_triples=1000, accuracy=0.8, seed=5, subject_offset=0)
        b = update_batch(n_triples=1000, accuracy=0.8, seed=5, subject_offset=0)
        assert (a.taus == b.taus).all()


class TestUpdateSequence:
    def test_disjoint_subject_ranges(self):
        seq = update_sequence(
            n_batches=4, n_triples_each=500, accuracy=0.9, seed=6, subject_offset=100
        )
        assert len(seq) == 4
        seen = set()
        for d in seq:
            ids = set(d.subjects().tolist())
            assert not (ids & seen)
            seen |= ids

    def test_names_sequential(self):
        seq = update_sequence(
            n_batches=2, n_triples_each=100, accuracy=0.9, seed=7, subject_offset=0
        )
        assert [d.name for d in seq] == ["DELTA^1", "DELTA^2"]
