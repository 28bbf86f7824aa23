"""Tests for the structured-perceptron tagger and BIO utilities."""
import pytest

from repro.construction.tagger import (
    PerceptronTagger,
    bio_spans,
    span_prf,
    token_features,
)


def test_token_features_include_identity_and_neighbours():
    f = token_features(["a", "b", "c"], 1)
    assert "w=b" in f and "prev=a" in f and "next=c" in f


def test_token_features_boundaries():
    f0 = token_features(["x"], 0)
    assert "prev=<s>" in f0 and "next=</s>" in f0


@pytest.mark.parametrize(
    "tags,expected",
    [
        (["O", "O"], set()),
        (["B-X"], {(0, 1, "X")}),
        (["B-X", "I-X"], {(0, 2, "X")}),
        (["B-X", "B-X"], {(0, 1, "X"), (1, 2, "X")}),
        (["B-X", "I-Y"], {(0, 1, "X"), }),
        (["O", "B-X", "I-X", "O", "B-Y"], {(1, 3, "X"), (4, 5, "Y")}),
    ],
)
def test_bio_spans(tags, expected):
    assert bio_spans(tags) == expected


def test_span_prf_perfect():
    g = [["B-X", "O"], ["O", "B-Y"]]
    assert span_prf(g, g) == (1.0, 1.0, 1.0)


def test_span_prf_half():
    g = [["B-X", "B-Y"]]
    p = [["B-X", "O"]]
    prec, rec, f1 = span_prf(g, p)
    assert prec == 1.0 and rec == 0.5
    assert abs(f1 - 2 / 3) < 1e-9


def test_span_prf_empty_pred():
    prec, rec, f1 = span_prf([["B-X"]], [["O"]])
    assert (prec, rec, f1) == (0.0, 0.0, 0.0)


def _toy_data():
    # word identity fully determines the tag — learnable by identity features
    sents = [
        ["acme", "shoes", "hot"],
        ["globex", "phone", "sale"],
        ["acme", "phone", "hot"],
        ["globex", "shoes", "sale"],
    ]
    tags = [
        ["B-Brand", "B-Cat", "O"],
        ["B-Brand", "B-Cat", "O"],
        ["B-Brand", "B-Cat", "O"],
        ["B-Brand", "B-Cat", "O"],
    ]
    return sents, tags


def test_tagger_learns_toy_task():
    sents, tags = _toy_data()
    tg = PerceptronTagger(["O", "B-Brand", "B-Cat"]).fit(sents, tags, epochs=5)
    assert tg.predict(["acme", "shoes", "sale"]) == ["B-Brand", "B-Cat", "O"]
    assert tg.predict(["globex", "phone", "hot"]) == ["B-Brand", "B-Cat", "O"]


def test_tagger_deterministic():
    sents, tags = _toy_data()
    a = PerceptronTagger(["O", "B-Brand", "B-Cat"]).fit(sents, tags, epochs=3, seed=1)
    b = PerceptronTagger(["O", "B-Brand", "B-Cat"]).fit(sents, tags, epochs=3, seed=1)
    assert a.predict(["acme", "shoes"]) == b.predict(["acme", "shoes"])
    assert a.weights_dict() == b.weights_dict()


def test_tagger_empty_sentence():
    tg = PerceptronTagger(["O"])
    assert tg.predict([]) == []


def test_tagger_pickles_small(tmp_path):
    import pickle

    sents, tags = _toy_data()
    tg = PerceptronTagger(["O", "B-Brand", "B-Cat"]).fit(sents, tags, epochs=3)
    blob = pickle.dumps(tg)
    tg2 = pickle.loads(blob)
    assert tg2.predict(["acme", "shoes", "sale"]) == tg.predict(["acme", "shoes", "sale"])


def test_transitions_learned():
    """Transition weights should exist after training (CRF-like structure)."""
    sents, tags = _toy_data()
    tg = PerceptronTagger(["O", "B-Brand", "B-Cat"]).fit(sents, tags, epochs=3)
    assert len(tg.transitions_dict()) > 0
