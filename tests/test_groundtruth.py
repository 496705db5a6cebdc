"""Tests for ground-truth semantics and the ranking evaluator."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.metrics import RankedResult
from repro.oracle import assert_equivalent
from repro.queries.workload import query_by_id
from repro.video.groundtruth import (
    evaluate_ranking,
    gt_objects_pdf,
    gt_tracks,
    matches_query_expr,
)


class TestMatchesQuery:
    def test_oracle_equivalence(self, spark, bellevue_patches):
        """Tag-superset predicate vs DuckDB list containment."""
        q = query_by_id("Q2.1")
        got = (
            bellevue_patches.filter("is_object")
            .filter(matches_query_expr(q))
            .select("patch_id")
        )
        flat = bellevue_patches.filter("is_object").select(
            "patch_id", F.explode("tags").alias("tag")
        )
        tags = ", ".join(f"'{t}'" for t in q.tags)
        assert_equivalent(
            got,
            f"""
            SELECT patch_id FROM flat WHERE tag IN ({tags})
            GROUP BY patch_id HAVING count(DISTINCT tag) = {len(q.tags)}
            """,
            flat=flat,
        )

    @pytest.mark.parametrize("qid", ["Q2.1", "Q2.2", "Q2.3", "Q2.4"])
    def test_gt_nonempty(self, bellevue_patches, qid):
        assert len(gt_tracks(bellevue_patches, query_by_id(qid))) >= 1

    def test_superset_queries_nest(self, bellevue_patches):
        """Q2.2's tags ⊇ Q2.1's, so its GT ⊆ Q2.1's GT."""
        g1 = gt_tracks(bellevue_patches, query_by_id("Q2.1"))
        g2 = gt_tracks(bellevue_patches, query_by_id("Q2.2"))
        assert g2 <= g1

    def test_gt_objects_columns(self, bellevue_patches):
        pdf = gt_objects_pdf(bellevue_patches, query_by_id("Q2.3"))
        assert list(pdf.columns) == ["video_id", "frame_idx", "track_id", "bbox"]


def _gt_pdf():
    """Two GT tracks: track 1 in frames 0–1, track 2 in frame 2."""
    return pd.DataFrame(
        {
            "video_id": [0, 0, 0],
            "frame_idx": [0, 1, 2],
            "track_id": [1, 1, 2],
            "bbox": [[0.1, 0.1, 0.3, 0.3]] * 3,
        }
    )


def _res(frame, bbox=(0.1, 0.1, 0.3, 0.3), score=1.0):
    return RankedResult(video_id=0, frame_idx=frame, bbox=tuple(bbox), score=score)


class TestEvaluateRanking:
    def test_perfect(self):
        ev = evaluate_ranking([_res(0), _res(2)], _gt_pdf())
        assert ev.avep == pytest.approx(1.0)
        assert ev.n_gt == 2 and ev.recall == 1.0

    def test_wrong_frame_is_fp(self):
        ev = evaluate_ranking([_res(7)], _gt_pdf())
        assert ev.avep == 0.0 and ev.tp_flags == (False,)

    def test_bad_iou_is_fp(self):
        ev = evaluate_ranking([_res(0, bbox=(0.6, 0.6, 0.9, 0.9))], _gt_pdf())
        assert ev.avep == 0.0

    def test_duplicate_track_ignored_not_fp(self):
        """Re-detections of a matched track skip the rank entirely."""
        ev = evaluate_ranking([_res(0), _res(1), _res(2)], _gt_pdf())
        # frame 1 re-detects track 1 → ignored; track 2 found at effective rank 2
        assert ev.n_ignored == 1
        assert ev.avep == pytest.approx(1.0)

    def test_fp_between_tps_lowers_ap(self):
        ev = evaluate_ranking([_res(0), _res(7), _res(2)], _gt_pdf())
        assert ev.avep == pytest.approx((1.0 + 2 / 3) / 2)

    def test_empty_results(self):
        ev = evaluate_ranking([], _gt_pdf())
        assert ev.avep == 0.0 and ev.n_results == 0

    def test_empty_gt(self):
        ev = evaluate_ranking([_res(0)], _gt_pdf().iloc[0:0])
        assert ev.avep == 0.0 and ev.n_gt == 0

    def test_iou_threshold_configurable(self):
        shifted = (0.18, 0.1, 0.38, 0.3)  # IoU ≈ 0.43 vs the GT box
        assert evaluate_ranking([_res(0, bbox=shifted)], _gt_pdf(), iou_thresh=0.5).avep == 0.0
        assert evaluate_ranking([_res(0, bbox=shifted)], _gt_pdf(), iou_thresh=0.3).avep > 0.0

    def test_two_tracks_same_frame(self):
        gt = pd.DataFrame(
            {
                "video_id": [0, 0],
                "frame_idx": [0, 0],
                "track_id": [1, 2],
                "bbox": [[0.1, 0.1, 0.3, 0.3], [0.6, 0.6, 0.8, 0.8]],
            }
        )
        res = [_res(0, bbox=(0.1, 0.1, 0.3, 0.3)), _res(0, bbox=(0.6, 0.6, 0.8, 0.8))]
        assert evaluate_ranking(res, gt).avep == pytest.approx(1.0)
