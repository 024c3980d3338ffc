"""Mask store substrate tests."""
import os

import numpy as np
import pytest

from repro.masks.synth import TINY, generate_mask
from repro.maskstore.store import MaskStore, build_store


class TestBuildStore:
    def test_all_mask_files_exist(self, tiny_store):
        for mid in range(tiny_store.n_masks()):
            assert os.path.exists(tiny_store.mask_path(mid))

    def test_mask_contents_match_generator(self, tiny_store):
        spec = tiny_store.spec
        for img, model in [(0, 1), (0, 2), (31, 1), (59, 2)]:
            mid = spec.mask_id(img, model)
            assert np.array_equal(
                tiny_store.load_mask(mid), generate_mask(spec, img, model)
            )

    def test_idempotent_reuse(self, spark, tiny_store):
        """Rebuilding with the same spec reuses the existing store."""
        mtime = os.path.getmtime(tiny_store.mask_path(0))
        again = build_store(spark, TINY, tiny_store.root)
        assert os.path.getmtime(again.mask_path(0)) == mtime

    def test_spec_roundtrip(self, tiny_store):
        st = MaskStore(tiny_store.root)
        assert st.spec == tiny_store.spec

    def test_raw_bytes(self, tiny_store):
        s = tiny_store.spec
        assert tiny_store.raw_bytes() == 4 * s.n_masks * s.width * s.height


class TestMetadata:
    def test_one_row_per_mask(self, tiny_meta, tiny_store):
        assert len(tiny_meta) == tiny_store.n_masks()
        assert tiny_meta["mask_id"].is_unique

    def test_columns(self, tiny_meta):
        for col in [
            "mask_id", "image_id", "model_id", "mask_type", "width", "height",
            "path", "obj_x1", "obj_y1", "obj_x2", "obj_y2", "pred_class",
        ]:
            assert col in tiny_meta.columns

    def test_two_models_per_image(self, tiny_meta):
        per_image = tiny_meta.groupby("image_id")["model_id"].agg(["count", "nunique"])
        assert (per_image["count"] == 2).all()
        assert (per_image["nunique"] == 2).all()

    def test_bbox_consistent_within_image(self, tiny_meta):
        cols = ["obj_x1", "obj_y1", "obj_x2", "obj_y2"]
        assert (tiny_meta.groupby("image_id")[cols].nunique() == 1).all().all()

    def test_bbox_within_mask(self, tiny_meta, tiny_store):
        w, h = tiny_store.spec.width, tiny_store.spec.height
        assert (tiny_meta["obj_x1"] >= 0).all() and (tiny_meta["obj_x2"] <= w).all()
        assert (tiny_meta["obj_y1"] >= 0).all() and (tiny_meta["obj_y2"] <= h).all()
        assert (tiny_meta["obj_x1"] < tiny_meta["obj_x2"]).all()
        assert (tiny_meta["obj_y1"] < tiny_meta["obj_y2"]).all()

    def test_paths_point_at_masks(self, tiny_meta, tiny_store):
        assert tiny_meta["path"].iloc[0].startswith(tiny_store.masks_dir)

    def test_spark_metadata_matches_pandas(self, spark, tiny_store, tiny_meta):
        sdf = tiny_store.metadata(spark)
        assert sdf.count() == len(tiny_meta)
        assert set(sdf.columns) == set(tiny_meta.columns)

    def test_index_path_per_config(self, tiny_store, tiny_cfg):
        assert tiny_store.index_path(tiny_cfg).endswith(tiny_cfg.tag())
