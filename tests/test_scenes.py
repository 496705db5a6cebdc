"""Tests for dataset scene profiles."""
import pytest

from repro.queries.workload import queries_for_dataset
from repro.video.scenes import PROFILES, profile

DATASETS = ["cityscapes", "bellevue", "qvhighlights", "beach", "activitynet"]


@pytest.mark.parametrize("ds", DATASETS)
class TestProfiles:
    def test_exists(self, ds):
        assert PROFILES[ds].name == ds

    def test_grid_positive(self, ds):
        p = PROFILES[ds]
        assert p.patches_per_frame == p.grid[0] * p.grid[1] > 0

    def test_every_query_has_exact_population(self, ds):
        """Each workload query must have ≥1 track spec matching all tags."""
        p = PROFILES[ds]
        for q in queries_for_dataset(ds):
            assert any(
                set(q.tags) <= set(s.tags) and s.n_tracks > 0 for s in p.track_specs
            ), q.qid

    def test_every_query_has_distractors(self, ds):
        """Class-matching near-miss distractors exist for non-trivial
        queries (a class-only query has no possible same-class miss)."""
        p = PROFILES[ds]
        for q in queries_for_dataset(ds):
            if not (q.attr_tags or q.rel_tags):
                continue
            cls = set(q.class_tags)
            assert any(
                cls <= set(s.tags) and not set(q.tags) <= set(s.tags)
                for s in p.track_specs
            ), q.qid

    def test_specs_deduplicated(self, ds):
        keys = [tuple(sorted(s.tags)) for s in PROFILES[ds].track_specs]
        assert len(keys) == len(set(keys))

    def test_scaled_preserves_population(self, ds):
        small = profile(ds, 0.1)
        assert small.n_videos >= 1
        assert small.frames_per_video >= 20
        assert all(s.n_tracks >= 1 for s in small.track_specs)
        assert len(small.track_specs) == len(PROFILES[ds].track_specs)

    def test_scale_one_is_identity(self, ds):
        assert profile(ds, 1.0) is PROFILES[ds]

    def test_scaling_monotone(self, ds):
        a, b = profile(ds, 0.1), profile(ds, 0.5)
        assert a.n_frames <= b.n_frames


def test_fixed_vs_moving_cameras_match_paper():
    """Bellevue and Beach are fixed-camera; the others move (§VII-A)."""
    assert PROFILES["bellevue"].fixed_camera
    assert PROFILES["beach"].fixed_camera
    assert not PROFILES["cityscapes"].fixed_camera
    assert not PROFILES["qvhighlights"].fixed_camera


def test_daily_life_flags():
    """QVHighlights/ActivityNet are in UMT/VISA's training domain."""
    assert PROFILES["qvhighlights"].daily_life
    assert PROFILES["activitynet"].daily_life
    assert not PROFILES["bellevue"].daily_life


def test_unknown_profile_raises():
    with pytest.raises(KeyError):
        profile("nosuch")
