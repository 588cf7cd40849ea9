"""Benchmarks for Table 6 / Sec. 5.5: the image-search pipeline.

Times (a) the Borda-count Spark aggregation over a descriptor-level result
set and (b) the full HD-Index image-search pipeline (descriptor kANN +
aggregation) on a synthetic collection."""
import numpy as np
import pytest

from repro.baselines.linear_scan import knn_linear_scan
from repro.harness.table6 import run_image_search
from repro.imagesearch.borda import borda_counts
from repro.imagesearch.dataset import make_image_collection
from repro.synth_data import vectors_df


@pytest.fixture(scope="session")
def img_ctx(spark):
    col = make_image_collection(
        n_images=60, descs_per_image=24, nu=32, n_query_images=8, seed=0
    )
    df = vectors_df(spark, col.X).persist()
    df.count()
    exact = knn_linear_scan(df, col.queries, 100)
    return {"col": col, "df": df, "exact": exact}


def test_bench_borda_aggregation(benchmark, spark, img_ctx):
    col, exact = img_ctx["col"], img_ctx["exact"]
    bc = benchmark.pedantic(
        lambda: borda_counts(spark, exact, col.desc_image, col.query_image, 100),
        rounds=1,
        iterations=1,
    )
    assert len(bc) > 0


def test_bench_image_search_hdindex(benchmark, spark, img_ctx):
    run = benchmark.pedantic(
        lambda: run_image_search(
            spark, methods=["hdindex"], collection=img_ctx["col"]
        ),
        rounds=1,
        iterations=1,
    )
    assert run["methods"]["hdindex"]["map_img"] >= 0.5
