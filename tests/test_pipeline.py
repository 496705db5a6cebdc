"""End-to-end tests for the LOVO pipeline (build + two-stage query)."""
import dataclasses

import numpy as np
import pytest

from repro.core import LOVO
from repro.queries.workload import query_by_id
from repro.video.groundtruth import evaluate_ranking, gt_objects_pdf
from tests.conftest import TEST_CFG


@pytest.fixture(scope="module")
def system(lovo_built):
    return lovo_built[0]


@pytest.fixture(scope="module")
def report(lovo_built):
    return lovo_built[1]


class TestBuild:
    def test_counts_consistent(self, report, bellevue_profile):
        assert report.n_frames == bellevue_profile.n_frames
        assert 0 < report.n_keyframes < report.n_frames
        assert report.n_vectors == report.n_keyframes * bellevue_profile.patches_per_frame

    def test_timings_positive(self, report):
        assert report.processing_time > 0
        assert report.index_time > 0
        assert report.total_time == pytest.approx(
            report.processing_time + report.index_time
        )

    def test_store_materialised(self, system, report):
        assert system.store.n_vectors() == report.n_vectors

    def test_query_before_build_raises(self, spark):
        with pytest.raises(RuntimeError):
            LOVO(spark, TEST_CFG).fast_search(query_by_id("Q2.1"))

    def test_unknown_variant_raises(self, system):
        with pytest.raises(ValueError):
            system.fast_search(query_by_id("Q2.1"), variant="faiss")


class TestQuery:
    @pytest.mark.parametrize("variant", ["bf", "ivfpq", "hnsw"])
    def test_variant_end_to_end(self, system, variant):
        res = system.query(query_by_id("Q2.3"), variant=variant, k=20)
        assert res.results
        scores = [r.score for r in res.results]
        assert scores == sorted(scores, reverse=True)
        assert res.fast_time > 0 and res.rerank_time > 0

    def test_no_rerank_skips_stage2(self, system):
        res = system.query(query_by_id("Q2.3"), use_rerank=False, k=20)
        assert res.rerank_time == 0.0
        assert len(res.results) == 20
        assert res.search_time == pytest.approx(res.fast_time)

    def test_rerank_one_result_per_frame(self, system):
        res = system.query(query_by_id("Q2.3"), k=30)
        frames = [(r.video_id, r.frame_idx) for r in res.results]
        assert len(frames) == len(set(frames))

    def test_query_deterministic(self, system):
        q = query_by_id("Q2.1")
        a = [(r.video_id, r.frame_idx) for r in system.query(q, k=20).results]
        b = [(r.video_id, r.frame_idx) for r in system.query(q, k=20).results]
        assert a == b

    def test_finds_planted_objects(self, system, bellevue_patches):
        """The headline claim: LOVO retrieves the right objects."""
        q = query_by_id("Q2.3")
        gt = gt_objects_pdf(bellevue_patches, q)
        k = min(10 * gt["track_id"].nunique(), 120)
        ev = evaluate_ranking(system.query(q, k=k).results, gt)
        assert ev.avep > 0.5

    def test_rerank_helps_relation_query(self, system, bellevue_patches):
        """Table IV's core shape: rerank improves complex queries."""
        q = query_by_id("Q2.2")
        gt = gt_objects_pdf(bellevue_patches, q)
        k = min(10 * gt["track_id"].nunique(), 120)
        with_rr = evaluate_ranking(system.query(q, k=k).results, gt).avep
        without = evaluate_ranking(
            system.query(q, use_rerank=False, k=k).results, gt
        ).avep
        assert with_rr >= without

    def test_query_embedding_unit_norm(self, system):
        q = system.encode_query(query_by_id("Q1.1"))
        assert np.linalg.norm(q) == pytest.approx(1.0)


class TestAblations:
    def test_no_keyframe_indexes_more_vectors(self, spark, bellevue_patches, report):
        cfg = dataclasses.replace(TEST_CFG, use_keyframes=False)
        system = LOVO(spark, cfg)
        full = system.build(bellevue_patches)
        try:
            assert full.n_vectors > report.n_vectors
            assert full.n_keyframes == full.n_frames
        finally:
            system.close()

    def test_hnsw_shards_lazy_and_cached(self, system):
        a = system.hnsw_shards()
        b = system.hnsw_shards()
        assert a is b
        assert a.count() == TEST_CFG.hnsw_shards
