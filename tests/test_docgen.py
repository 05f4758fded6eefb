"""Dataset generator tests: determinism and Table 1 structural targets."""
import json

import pytest

from repro.docgen import DATASETS, PAPER_TABLE1
from repro.dremel.shred import Shredder


from repro.experiments import dominant_kind


def profile(name, n=250):
    sh = Shredder()
    total = 0
    docs = list(DATASETS[name](n))
    for pk, doc in docs:
        sh.add(doc, pk)
        total += len(json.dumps(doc))
    batch = sh.finish()
    return docs, batch, total / n, dominant_kind(batch)


class TestDeterminism:
    @pytest.mark.parametrize("name", list(DATASETS))
    def test_same_seed_same_docs(self, name):
        a = list(DATASETS[name](50))
        b = list(DATASETS[name](50))
        assert a == b

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_unique_pks(self, name):
        pks = [pk for pk, _ in DATASETS[name](100)]
        assert len(set(pks)) == 100


class TestTable1Shapes:
    def test_cell_flat_7_columns(self):
        _docs, batch, avg, dom = profile("cell")
        assert len(batch.schema.columns) == 7
        assert avg < 250  # paper: 141 B
        assert dom == "mix"  # Table 1: "Mix"

    def test_cell_is_1nf(self):
        _docs, batch, _avg, _k = profile("cell")
        assert all(c.max_def == 1 and not c.is_repeated for c in batch.schema.columns)

    def test_sensors_16_columns_numeric(self):
        _docs, batch, avg, dom = profile("sensors", 100)
        assert len(batch.schema.columns) == 16
        assert dom in ("bigint", "mix")  # Table 1: Integer-dominant
        assert 2000 < avg < 6000  # paper: 3.8 KB

    def test_tweet1_many_columns_string_dominant(self):
        _docs, batch, avg, dom = profile("tweet_1", 400)
        assert len(batch.schema.columns) > 500  # paper: 933
        assert dom == "string"

    def test_tweet2_moderate_columns(self):
        _docs, batch, _avg, dom = profile("tweet_2", 400)
        t1_cols = profile("tweet_1", 400)[1]
        assert 100 < len(batch.schema.columns) < len(t1_cols.schema.columns)
        assert dom == "string"

    def test_tweet2_monotone_timestamp(self):
        docs = list(DATASETS["tweet_2"](100))
        ts = [d["timestamp"] for _pk, d in docs]
        assert ts == sorted(ts) and len(set(ts)) == 100

    def test_wos_heterogeneous_address(self):
        docs, batch, avg, dom = profile("wos", 150)
        addr_types = {
            type(
                d["static_data"]["fullrecord_metadata"]["addresses"]["address_name"]
            )
            for _pk, d in docs
        }
        assert addr_types == {dict, list}  # the §6.1 union
        node = batch.schema.resolve("static_data.fullrecord_metadata.addresses.address_name")
        assert node.kind == "union"
        assert dom == "string"
        assert avg > 3000  # paper: 6.2 KB (large abstracts)

    def test_wos_subjects_arrays(self):
        docs, _b, _a, _k = profile("wos", 20)
        subj = docs[0][1]["static_data"]["fullrecord_metadata"]["category_info"][
            "subjects"
        ]["subject"]
        assert isinstance(subj, list) and {"ascatype", "value"} <= set(subj[0])

    def test_record_size_ordering_matches_paper(self):
        # paper Table 1: cell << tweet_2 < tweet_1 < wos
        avg = {n: profile(n, 150)[2] for n in ("cell", "tweet_2", "tweet_1", "wos")}
        assert avg["cell"] < avg["tweet_2"] < avg["tweet_1"] < avg["wos"]
