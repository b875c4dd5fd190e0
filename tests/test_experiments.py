"""Tests for the table harnesses at TEST_WORLD scale (fast end-to-end)."""
import re

import pytest

from repro.baselines.common import TrainConfig
from repro.experiments import TEST_WORLD, table1, table2, table3

FAST = TrainConfig(epochs=45, seed=0)


@pytest.mark.slow
def test_table1_shape_and_ordering(spark):
    df = table1(spark, TEST_WORLD, cfg=FAST)
    assert list(df["Stage"]) == [
        "TRMP w.o. E&R_s",
        "TRMP w.o. E&R",
        "TRMP w.o. E",
        "TRMP",
    ]
    accs = [float(a.rstrip("%")) for a in df["ACC"]]
    assert accs[1] > accs[0] and accs[2] > accs[1]
    assert all(re.match(r"\d+\.\d\d%", a) for a in df["ACC"])


@pytest.mark.slow
def test_table2_shape(spark):
    df = table2(spark, TEST_WORLD, cfg=FAST, methods=["DeepWalk", "Geniepath", "ALPC"])
    assert len(df) == 4  # meta + 3 methods
    assert {"AUC_A", "ACC_A", "AUC_B", "ACC_B", "AUC_C", "ACC_C"} <= set(df.columns)
    data = df.iloc[1:]
    for col in ["AUC_A", "AUC_B", "AUC_C"]:
        assert data[col].astype(float).between(0.5, 1.0).all()


@pytest.mark.slow
def test_table3_shape(spark, tmp_path):
    df = table3(spark, TEST_WORLD, cfg=FAST, store_path=str(tmp_path / "gea"), top_k=30)
    assert list(df["Services"]) == [
        "Railway",
        "Dicos",
        "Cosmetics",
        "Dessert",
        "Women Football",
    ]
    for col in ["CVR (EGL)", "CVR (rule)"]:
        vals = df[col].str.rstrip("%").astype(float)
        assert vals.between(0, 100).all()
    assert df["Running Time"].str.endswith(" s").all()
