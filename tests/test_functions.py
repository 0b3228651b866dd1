"""Unit tests for OpenMLDB SQL surface functions (Table 1)."""
import pytest

from repro.core.functions import (
    MulticlassLabeler,
    SignatureSpec,
    hash_discrete,
    split_by_key,
    split_by_value,
    to_libsvm,
)


class TestSplitByKey:
    def test_basic(self):
        assert split_by_key("a:1,b:2,c:3", ",", ":") == ["a", "b", "c"]

    def test_values(self):
        assert split_by_value("a:1,b:2", ",", ":") == ["1", "2"]

    def test_segment_without_kv_delimiter_skipped(self):
        assert split_by_key("a:1,junk,b:2", ",", ":") == ["a", "b"]

    def test_empty_and_none(self):
        assert split_by_key("", ",", ":") == []
        assert split_by_key(None, ",", ":") == []

    def test_value_containing_delimiter(self):
        assert split_by_key("a:1:2,b:3", ",", ":") == ["a", "b"]
        assert split_by_value("a:1:2", ",", ":") == ["1:2"]


class TestMulticlassLabeler:
    def test_labels_by_first_appearance(self):
        lab = MulticlassLabeler().fit(["cat", "dog", "cat", "bird"])
        assert lab.transform("cat") == 0
        assert lab.transform("dog") == 1
        assert lab.transform("bird") == 2
        assert lab.n_classes == 3

    def test_lazy_assignment(self):
        lab = MulticlassLabeler()
        assert lab.transform("x") == 0
        assert lab.transform("y") == 1
        assert lab.transform("x") == 0

    def test_non_string_values(self):
        lab = MulticlassLabeler()
        assert lab.transform(3.5) == 0
        assert lab.transform("3.5") == 0  # stringified identity


class TestSignatures:
    SPEC = SignatureSpec(label="y", discrete=("city",), continuous=("age", "income"), dim=1000)

    def test_hash_stable_and_bounded(self):
        h1 = hash_discrete("city", "paris", 1000)
        h2 = hash_discrete("city", "paris", 1000)
        assert h1 == h2
        assert 0 <= h1 < 1000

    def test_hash_distinguishes_columns(self):
        assert hash_discrete("a", "x", 1 << 20) != hash_discrete("b", "x", 1 << 20)

    def test_continuous_index_after_hash_space(self):
        assert self.SPEC.continuous_index("age") == 1000
        assert self.SPEC.continuous_index("income") == 1001

    def test_to_libsvm_line(self):
        row = {"y": 1, "city": "paris", "age": 33, "income": 5.5}
        line = to_libsvm(row, self.SPEC)
        parts = line.split(" ")
        assert parts[0] == "1"
        idxs = [int(p.split(":")[0]) for p in parts[1:]]
        assert idxs == sorted(idxs)
        assert f"{1000}:33" in line and f"{1001}:5.5" in line
        h = hash_discrete("city", "paris", 1000)
        assert f"{h}:1" in line

    def test_null_columns_omitted(self):
        row = {"y": 0, "city": None, "age": None, "income": 2.0}
        line = to_libsvm(row, self.SPEC)
        assert line == f"0 {1001}:2"

    def test_label_only(self):
        row = {"y": 0, "city": None, "age": None, "income": None}
        assert to_libsvm(row, self.SPEC) == "0"
