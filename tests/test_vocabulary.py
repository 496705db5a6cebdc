"""Unit tests for the tag vocabulary / embedding space."""
import numpy as np
import pytest

from repro.vocab.vocabulary import (
    MSCOCO_CLASSES,
    TagKind,
    Vocabulary,
    tag_kind,
    tag_name,
)

TAGS = [
    "class:car",
    "class:bus",
    "attr:red",
    "attr:white_roof",
    "rel:side_by_side",
    "bg:road",
]


@pytest.fixture(scope="module")
def vocab():
    return Vocabulary(dim=64, seed=7)


class TestTagParsing:
    @pytest.mark.parametrize(
        "tag,kind",
        [
            ("class:car", TagKind.CLASS),
            ("attr:red", TagKind.ATTR),
            ("rel:side_by_side", TagKind.REL),
            ("bg:road", TagKind.BG),
        ],
    )
    def test_tag_kind(self, tag, kind):
        assert tag_kind(tag) == kind

    @pytest.mark.parametrize("tag,name", [("class:car", "car"), ("attr:white_roof", "white_roof")])
    def test_tag_name(self, tag, name):
        assert tag_name(tag) == name

    def test_bad_prefix_raises(self):
        with pytest.raises(ValueError):
            tag_kind("unknown:thing")

    def test_mscoco_has_core_classes(self):
        assert "car" in MSCOCO_CLASSES and "person" in MSCOCO_CLASSES


class TestVectors:
    @pytest.mark.parametrize("tag", TAGS)
    def test_unit_norm(self, vocab, tag):
        assert np.linalg.norm(vocab.vec(tag)) == pytest.approx(1.0)

    @pytest.mark.parametrize("tag", TAGS)
    def test_deterministic_across_instances(self, tag):
        a = Vocabulary(dim=64, seed=7).vec(tag)
        b = Vocabulary(dim=64, seed=7).vec(tag)
        np.testing.assert_allclose(a, b)

    def test_seed_changes_vectors(self):
        a = Vocabulary(dim=64, seed=7).vec("class:car")
        b = Vocabulary(dim=64, seed=8).vec("class:car")
        assert not np.allclose(a, b)

    def test_distinct_tags_nearly_orthogonal(self, vocab):
        sims = [
            abs(float(vocab.vec(a) @ vocab.vec(b)))
            for i, a in enumerate(TAGS)
            for b in TAGS[i + 1 :]
        ]
        assert max(sims) < 0.5  # random 64-d vectors

    def test_dim_validation(self):
        with pytest.raises(ValueError):
            Vocabulary(dim=4)

    def test_cache_returns_same_object(self, vocab):
        assert vocab.vec("class:car") is vocab.vec("class:car")


class TestEmbedTags:
    def test_empty_is_zero(self, vocab):
        assert np.linalg.norm(vocab.embed_tags([])) == 0.0

    def test_unit_norm(self, vocab):
        assert np.linalg.norm(vocab.embed_tags(TAGS)) == pytest.approx(1.0)

    def test_class_weight_dominates(self, vocab):
        e = vocab.embed_tags(["class:car", "attr:red"])
        assert float(e @ vocab.vec("class:car")) > float(e @ vocab.vec("attr:red"))

    def test_custom_weights(self, vocab):
        e = vocab.embed_tags(["class:car", "attr:red"], {"attr:red": 10.0})
        assert float(e @ vocab.vec("attr:red")) > float(e @ vocab.vec("class:car"))

    def test_overlap_similarity_gradient(self, vocab):
        """More shared tags ⇒ higher cosine — the retrieval premise."""
        q = vocab.embed_tags(["class:car", "attr:red", "rel:side_by_side"])
        full = vocab.embed_tags(["class:car", "attr:red", "rel:side_by_side"])
        partial = vocab.embed_tags(["class:car", "attr:red"])
        classonly = vocab.embed_tags(["class:car"])
        other = vocab.embed_tags(["class:bus"])
        sims = [float(q @ v) for v in (full, partial, classonly, other)]
        assert sims[0] > sims[1] > sims[2] > sims[3]

    def test_token_matrix_shape(self, vocab):
        m = vocab.token_matrix(TAGS)
        assert m.shape == (len(TAGS), 64)
        assert np.allclose(np.linalg.norm(m, axis=1), 1.0)

    def test_token_matrix_empty(self, vocab):
        assert vocab.token_matrix([]).shape == (0, 64)
