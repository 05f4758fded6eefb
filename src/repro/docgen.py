"""Synthetic generators for the paper's five evaluation datasets (Table 1).

The real datasets (telecom *cell*, synthetic *sensors*, Twitter *tweet_1*
/ *tweet_2*, Web of Science *wos*) are proprietary or API-gated; these
generators reproduce the **structural** properties the experiments depend
on — record count (scaled), average record size, number of inferred
columns, dominant value type, nesting/arrays, heterogeneous union types
(wos), and a monotone ``timestamp`` (tweet_2).  Paper-vs-ours
characteristics are reported by ``jobs/table1_datasets.py``.

All generators are deterministic in ``seed`` and yield ``(pk, doc)``.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np

_WORDS = np.array(
    """the of and a to in is you that it he was for on are as with his they I at
    be this have from or one had by word but not what all were we when your can
    said there use an each which she do how their if will up other about out
    many then them these so some her would make like him into time has look two
    more write go see number no way could people my than first water been call
    who oil its now find long down day did get come made may part data system
    query storage column record schema value index merge page document field
    type array object store engine format level key flush read write scan
    """.split()
)

_COUNTRIES = np.array(
    ["USA", "China", "Germany", "UK", "Japan", "France", "Canada", "Italy",
     "Spain", "Australia", "Brazil", "India", "Netherlands", "Korea",
     "Switzerland", "Sweden", "Poland", "Turkey", "Iran", "Mexico"]
)

_SUBJECTS = np.array(
    ["Computer Science", "Physics", "Chemistry", "Biology", "Medicine",
     "Mathematics", "Engineering", "Materials Science", "Neuroscience",
     "Economics", "Psychology", "Geology", "Astronomy", "Ecology"]
)


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _text(g: np.random.Generator, n_words: int) -> str:
    return " ".join(g.choice(_WORDS, n_words))


# --------------------------------------------------------------------- cell
def cell(n: int, seed: int = 0) -> Iterator[tuple[int, dict]]:
    """1NF, 7 columns, mixed types, ~140 B/record (Table 1)."""
    g = _rng(seed)
    callers = g.integers(1, max(2, n // 20), n)
    callees = g.integers(1, max(2, n // 20), n)
    durations = g.integers(0, 3600, n)
    towers = g.integers(0, 500, n)
    ts = 1_500_000_000 + np.cumsum(g.integers(0, 60, n))
    costs = np.round(g.random(n) * 10, 2)
    kinds = g.choice(["voice", "sms", "data"], n)
    for i in range(n):
        yield i + 1, {
            "caller": int(callers[i]),
            "callee": int(callees[i]),
            "duration": int(durations[i]),
            "tower": f"T{int(towers[i]):04d}",
            "ts": int(ts[i]),
            "cost": float(costs[i]),
            "kind": str(kinds[i]),
        }


# ------------------------------------------------------------------ sensors
def sensors(n: int, seed: int = 1, readings_per_record: int = 64) -> Iterator:
    """Numeric-heavy, 16 columns, ~3.8 KB/record: connectivity/battery
    status plus a day of captured readings (Table 1, §6.1)."""
    g = _rng(seed)
    for i in range(n):
        base_ts = 1_556_400_000_000 + int(i) * 900_000
        temps = np.round(15 + 20 * g.random(readings_per_record), 2)
        hums = g.integers(20, 90, readings_per_record)
        rts = base_ts + np.arange(readings_per_record) * 900_000
        yield i + 1, {
            "sensor_id": int(g.integers(1, max(2, n // 10))),
            "report_time": base_ts,
            "battery": {
                "level": int(g.integers(0, 100)),
                "voltage": float(np.round(3 + g.random(), 3)),
                "charging": bool(g.integers(0, 2)),
                "health": int(g.integers(0, 100)),
            },
            "connectivity": {
                "rssi": int(g.integers(-90, -30)),
                "protocol": str(g.choice(["lora", "wifi", "nbiot"])),
                "dropped": int(g.integers(0, 10)),
                "latency_ms": float(np.round(g.random() * 100, 2)),
            },
            "status": {
                "uptime_s": int(g.integers(0, 10_000_000)),
                "errors": int(g.integers(0, 5)),
                "fw": str(g.choice(["1.0.3", "1.1.0", "2.0.1"])),
            },
            "readings": [
                {
                    "ts": int(rts[j]),
                    "temp": float(temps[j]),
                    "humidity": int(hums[j]),
                }
                for j in range(readings_per_record)
            ],
        }


# ------------------------------------------------------------------- tweets
def _tweet_user(g: np.random.Generator, uid: int) -> dict:
    return {
        "id": int(uid),
        "name": f"user_{uid}",
        "screen_name": f"u{uid}",
        "location": str(g.choice(_COUNTRIES)),
        "description": _text(g, int(g.integers(3, 12))),
        "verified": bool(g.integers(0, 2) == 0),
        "followers_count": int(g.integers(0, 100000)),
        "friends_count": int(g.integers(0, 5000)),
        "statuses_count": int(g.integers(0, 50000)),
        "created_at": f"20{int(g.integers(10, 21)):02d}-0{int(g.integers(1, 9))}-15",
        "lang": str(g.choice(["en", "es", "ar", "ja", "pt"])),
        "profile_image_url": f"https://pbs.example.com/{uid}/photo_{int(g.integers(0, 999999))}.jpg",
        "profile_banner_url": f"https://pbs.example.com/{uid}/banner_{int(g.integers(0, 999999))}.jpg",
        "profile_background_color": str(g.choice(["C0DEED", "000000", "F5F8FA"])),
        "url": f"https://example.org/{uid}",
        "time_zone": str(g.choice(["PST", "EST", "UTC", "CET", "JST"])),
        "favourites_count": int(g.integers(0, 20000)),
    }


def _tweet_doc(
    g: np.random.Generator,
    i: int,
    n_users: int,
    text_words: tuple[int, int],
    sparse_pool: int,
    sparse_per_rec: int,
    with_retweet: bool,
) -> dict:
    uid = int(g.integers(1, n_users))
    nhash = int(g.integers(0, 4))
    doc = {
        "created_at": f"2020-{int(g.integers(1, 13)):02d}-{int(g.integers(1, 29)):02d}",
        "text": _text(g, int(g.integers(*text_words))),
        "lang": str(g.choice(["en", "es", "ar", "ja", "pt"])),
        "source": str(g.choice(["web", "android", "iphone"])),
        "retweet_count": int(g.integers(0, 1000)),
        "favorite_count": int(g.integers(0, 5000)),
        "user": _tweet_user(g, uid),
        "entities": {
            "hashtags": [
                {"text": str(g.choice(["jobs", "news", "sports", "music", "tech", "food"])),
                 "indices": [int(g.integers(0, 100)), int(g.integers(100, 140))]}
                for _ in range(nhash)
            ],
            "urls": [
                {"url": f"https://t.co/{_text(g,1)}{int(g.integers(0,9999))}",
                 "expanded_url": f"https://example.com/{_text(g,1)}/{int(g.integers(0,99999))}",
                 "display_url": f"example.com/{_text(g,1)}"}
                for _ in range(int(g.integers(0, 3)))
            ],
            "media": [
                {"media_url": f"https://pbs.example.com/media/{int(g.integers(0,999999))}.jpg",
                 "type": str(g.choice(["photo", "video", "animated_gif"])),
                 "sizes": {"large": {"w": int(g.integers(600, 2048)),
                                     "h": int(g.integers(400, 2048))}}}
                for _ in range(int(g.integers(0, 3)))
            ],
        },
    }
    if with_retweet and g.integers(0, 4) == 0:
        doc["retweeted_status"] = {
            "text": _text(g, int(g.integers(*text_words))),
            "retweet_count": int(g.integers(0, 100000)),
            "user": _tweet_user(g, int(g.integers(1, n_users))),
        }
    if g.integers(0, 10) == 0:
        doc["place"] = {
            "country": str(g.choice(_COUNTRIES)),
            "full_name": _text(g, 2),
            "bounding_box": {"coordinates": [float(np.round(g.random() * 180 - 90, 5)),
                                             float(np.round(g.random() * 360 - 180, 5))]},
        }
    # sparse extension fields -> drives the inferred column count up
    # (tweet_1: ~933 columns; tweet_2: ~275, Table 1)
    for f in g.choice(sparse_pool, size=sparse_per_rec, replace=False):
        grp, fld = int(f) // 40, int(f) % 40
        doc.setdefault(f"ext_{grp}", {})[f"f{fld}"] = (
            _text(g, 2) if fld % 3 else int(g.integers(0, 1000))
        )
    return doc


def tweet_1(n: int, seed: int = 2) -> Iterator[tuple[int, dict]]:
    """String-heavy, ~900 inferred columns, ~5.3 KB/record."""
    g = _rng(seed)
    n_users = max(2, n // 10)
    for i in range(n):
        yield i + 1, _tweet_doc(
            g, i, n_users, (45, 60), sparse_pool=800, sparse_per_rec=14,
            with_retweet=True,
        )


def tweet_2(n: int, seed: int = 3) -> Iterator[tuple[int, dict]]:
    """Moderate column count (~275), ~2.7 KB/record, 140-char-era tweets,
    plus a synthetic monotonically-increasing ``timestamp`` (§6.1)."""
    g = _rng(seed)
    n_users = max(2, n // 10)
    for i in range(n):
        doc = _tweet_doc(
            g, i, n_users, (14, 26), sparse_pool=200, sparse_per_rec=10,
            with_retweet=False,
        )
        doc["timestamp"] = 1_460_000_000_000 + i * 1000
        yield i + 1, doc


# ---------------------------------------------------------------------- wos
def wos(n: int, seed: int = 4) -> Iterator[tuple[int, dict]]:
    """Web-of-Science-like: large abstracts, ~300 columns, and
    *heterogeneous* ``address_name`` (object for single-author articles,
    array of objects otherwise — the XML-to-JSON union of §6.1)."""
    g = _rng(seed)
    for i in range(n):
        n_auth = int(g.integers(1, 6))
        countries = g.choice(_COUNTRIES, n_auth)
        addresses = [
            {"address_spec": {
                "country": str(countries[j]),
                "city": _text(g, 1),
                "organization": f"Univ of {_text(g, 1)}",
            }}
            for j in range(n_auth)
        ]
        # THE union: object when one author, array when several
        address_name = addresses[0] if n_auth == 1 else addresses
        nsubj = int(g.integers(1, 4))
        doc = {
            "UID": f"WOS:{i+1:09d}",
            "static_data": {
                "summary": {
                    "pub_info": {
                        "pubyear": int(g.integers(1980, 2015)),
                        "pubtype": str(g.choice(["Journal", "Conference", "Book"])),
                        "page_count": int(g.integers(4, 40)),
                    },
                    "titles": {"title": _text(g, int(g.integers(8, 16)))},
                },
                "fullrecord_metadata": {
                    "abstracts": {
                        "abstract": {
                            "abstract_text": _text(g, int(g.integers(500, 1000))),
                        }
                    },
                    "category_info": {
                        "subjects": {
                            "subject": [
                                {"ascatype": str(g.choice(["traditional", "extended"])),
                                 "value": str(g.choice(_SUBJECTS))}
                                for _ in range(nsubj)
                            ]
                        }
                    },
                    "addresses": {"address_name": address_name},
                },
            },
        }
        # sparse bibliographic metadata -> column count (~296, Table 1)
        for f in g.choice(250, size=int(g.integers(4, 10)), replace=False):
            grp, fld = int(f) // 25, int(f) % 25
            doc["static_data"].setdefault(f"meta_{grp}", {})[f"m{fld}"] = (
                _text(g, 3) if fld % 2 else int(g.integers(0, 10000))
            )
        yield i + 1, doc


DATASETS = {
    "cell": cell,
    "sensors": sensors,
    "tweet_1": tweet_1,
    "wos": wos,
    "tweet_2": tweet_2,
}

# paper Table 1, for side-by-side reporting
PAPER_TABLE1 = {
    "cell": dict(size_gb=172, n_records="1.43B", avg_record="141B", n_columns=7, dominant="Mix"),
    "sensors": dict(size_gb=212, n_records="40M", avg_record="3.8KB", n_columns=16, dominant="Integer"),
    "tweet_1": dict(size_gb=210, n_records="17M", avg_record="5.3KB", n_columns=933, dominant="String"),
    "wos": dict(size_gb=277, n_records="48M", avg_record="6.2KB", n_columns=296, dominant="String"),
    "tweet_2": dict(size_gb=200, n_records="77.2M", avg_record="2.7KB", n_columns=275, dominant="String"),
}
