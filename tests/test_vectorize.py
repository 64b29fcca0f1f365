"""Tests for Spark-side vectorization."""
import numpy as np
import pandas as pd
import pytest

from repro.core.models import MODELS, embed_batch
from repro.core.tokenize import with_sentence
from repro.core.vectorize import init_model, vectorize


@pytest.fixture(scope="module")
def entities(spark):
    pdf = pd.DataFrame({
        "id": [1, 2, 3],
        "attr1": ["sony camera", "panasonic tv", "query optimization"],
        "attr2": ["black zoom", "portable lcd", "distributed database"],
    })
    return with_sentence(spark.createDataFrame(pdf))


class TestVectorize:
    @pytest.mark.parametrize("code", ["GE", "FT", "S5", "DT"])
    def test_matches_driver_embedding(self, spark, entities, code):
        """Distributed vectorization equals the in-process numpy kernel."""
        spec = MODELS[code]
        out = vectorize(entities, spec).select("id", "sentence", "embedding").toPandas()
        out = out.sort_values("id")
        expect = embed_batch(spec, out["sentence"].tolist())
        got = np.stack(out["embedding"].to_numpy())
        np.testing.assert_allclose(got, expect, atol=1e-5)

    def test_dim(self, spark, entities):
        out = vectorize(entities, MODELS["SM"]).toPandas()
        assert all(len(v) == 384 for v in out["embedding"])

    def test_preserves_columns(self, spark, entities):
        out = vectorize(entities, MODELS["GE"])
        assert set(entities.columns).issubset(out.columns)

    def test_custom_out_col(self, spark, entities):
        out = vectorize(entities, MODELS["GE"], out_col="vec")
        assert "vec" in out.columns

    def test_init_model_returns_time(self):
        t = init_model(MODELS["GE"])
        assert t > 0

    def test_static_init_slower_than_bert(self):
        """Table 4 init shape: dictionary/bucket loading (FT) dominates the
        dynamic models' weight setup."""
        t_ft = init_model(MODELS["FT"])
        t_dt = init_model(MODELS["DT"])
        assert t_ft > t_dt
