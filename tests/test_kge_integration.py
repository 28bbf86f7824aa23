"""Integration: KGE models on constructed benchmarks (not toy KGs)."""
import numpy as np
import pytest

from repro.kge.data import KGEDataset
from repro.kge.evaluate import evaluate
from repro.kge.multimodal import image_features_for_dataset
from repro.kge.text import entity_texts_for, hash_text_features
from repro.kge.trans import TransE


@pytest.fixture(scope="module")
def data500(benches):
    return KGEDataset.from_benchmark(benches["OpenBG500"])


def test_dataset_from_benchmark_consistent(benches, data500):
    b = benches["OpenBG500"]
    assert len(data500.train) == len(b.train_pdf)
    assert len(data500.test) == len(b.test_pdf)
    assert data500.n_ent == b.entity_count()


def test_transe_on_benchmark_beats_random(data500):
    m = TransE(data500.n_ent, data500.n_rel, seed=4).fit(
        data500, epochs=30, batch_size=256
    )
    res = evaluate(m, data500)
    assert res["mr"] < data500.n_ent / 2
    assert res["mrr"] > 1.0 / data500.n_ent * 5


def test_image_features_align_with_dataset(kg, benches):
    data = KGEDataset.from_benchmark(benches["OpenBG-IMG"])
    img = image_features_for_dataset(data, kg, dim=8)
    assert img.shape == (data.n_ent, 8)
    nonzero = (np.linalg.norm(img, axis=1) > 0).sum()
    mm = benches["OpenBG-IMG"].multimodal_entities
    assert nonzero == mm


def test_entity_texts_from_kg(kg, data500):
    labels = kg.entity_labels().set_index("entity")["text"].to_dict()
    texts = entity_texts_for(data500.entities, labels)
    assert len(texts) == data500.n_ent
    X = hash_text_features(texts, dim=64)
    assert X.shape == (data500.n_ent, 64)
    # products resolve to their titles (multi-token), values to themselves
    prods = [i for i, e in enumerate(data500.entities) if e.startswith("prod:")]
    if prods:
        assert " " in texts[prods[0]]
