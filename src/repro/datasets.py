"""Synthetic machine-generated corpora mirroring the paper's Table 2.

Every dataset in the paper is proprietary (KV1–KV5, AliLogs) or an
external download (Loghub logs, github/cities/unece JSON, FSST's
urls/uuid) — unavailable offline. Each generator below reproduces the
*shape* that drives compression behaviour: a small set of sprintf-style
templates, realistic variable kinds (timestamps, ids, prices, IPs,
block ids, free text), and Table 2's average record length. Generators
are deterministic in ``seed``; records never contain ``\\n``.

Use :func:`records` for a plain list and :func:`dataset_df` for a
Spark ``DataFrame[id: long, record: string]``.
"""
from __future__ import annotations

import json
import random
import uuid as uuid_mod
from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_SYMBOLS = ["IBM", "AAPL", "GOOG", "MSFT", "AMZN", "TSLA", "BABA", "NVDA"]
_WORDS = (
    "alpha beta gamma delta epsilon zeta eta theta iota kappa lakeside "
    "monitor packet service cluster node shard replica leader worker"
).split()


def _ts(rng: random.Random) -> int:
    return 1_630_000_000 + rng.randrange(0, 100_000_000)


# --------------------------------------------------------------------------
# production key-value datasets (KV1-KV5)
# --------------------------------------------------------------------------

def gen_kv1(n: int, seed: int = 0) -> list[str]:
    """JSON trade records (the paper's §1 running example), ~71 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        out.append(
            '{"symbol": "%s", "side": "%s", "quantity": %d, "price": %.2f, '
            '"timestamp": %d}'
            % (
                rng.choice(_SYMBOLS),
                rng.choice("BS"),
                rng.randrange(1, 10_000),
                rng.uniform(1, 500),
                _ts(rng),
            )
        )
    return out


def gen_kv2(n: int, seed: int = 0) -> list[str]:
    """Serialized session objects (k=v&... with tokens), ~158 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        token = "%032x" % rng.getrandbits(128)
        device = rng.choice(["ios", "android", "web", "miniapp"])
        out.append(
            "uid=2088%010d&sessionId=%s&device=%s&appVer=10.%d.%d&loginTime=%d"
            "&expire=%d&riskLevel=%d&city=%s"
            % (
                rng.randrange(10**9),
                token,
                device,
                rng.randrange(0, 9),
                rng.randrange(0, 99),
                _ts(rng),
                _ts(rng) + 86_400,
                rng.randrange(0, 5),
                rng.choice(["hangzhou", "shanghai", "beijing", "shenzhen"]),
            )
        )
    return out


def gen_kv3(n: int, seed: int = 0) -> list[str]:
    """Pipe-delimited payment records, ~90 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        out.append(
            "PAY|%d|2088%010d|2088%010d|CNY|%.2f|%s|%02d|SUCCESS"
            % (
                _ts(rng) * 1000 + rng.randrange(1000),
                rng.randrange(10**9),
                rng.randrange(10**9),
                rng.uniform(0.01, 10_000),
                rng.choice(["ALIPAY", "WECHAT", "UNIONPAY", "BANK"]),
                rng.randrange(0, 99),
            )
        )
    return out


def gen_kv4(n: int, seed: int = 0) -> list[str]:
    """Short csv counters, ~44 B."""
    rng = random.Random(seed)
    return [
        "cnt,%d,%d,%d,%d"
        % (_ts(rng), rng.randrange(10**6), rng.randrange(100), rng.randrange(2))
        for _ in range(n)
    ]


def gen_kv5(n: int, seed: int = 0) -> list[str]:
    """Compact JSON feature flags, ~53 B."""
    rng = random.Random(seed)
    return [
        '{"f":"%s_%d","v":%s,"t":%d}'
        % (
            rng.choice(_WORDS),
            rng.randrange(1000),
            rng.choice(["true", "false"]),
            _ts(rng),
        )
        for _ in range(n)
    ]


# --------------------------------------------------------------------------
# log datasets (Loghub-style)
# --------------------------------------------------------------------------

def _clock(rng: random.Random) -> str:
    return "%02d:%02d:%02d.%03d" % (
        rng.randrange(24),
        rng.randrange(60),
        rng.randrange(60),
        rng.randrange(1000),
    )


def gen_android(n: int, seed: int = 0) -> list[str]:
    """logcat lines, ~130 B."""
    rng = random.Random(seed)
    tags = ["ActivityManager", "WindowManager", "PowerManagerService", "AudioFlinger"]
    msgs = [
        "Start proc %d:com.tencent.%s/u0a%d for service",
        "Killing %d:com.android.%s/u0a%d (adj 906): empty #%d",
        "Force stopping %d:com.example.%s appid=%d user=0",
    ]
    out = []
    for _ in range(n):
        msg = rng.choice(msgs)
        nargs = msg.count("%")
        args = (rng.randrange(30000), rng.choice(_WORDS), rng.randrange(500), rng.randrange(40))
        out.append(
            "03-17 %s %5d %5d %s %s: %s"
            % (
                _clock(rng),
                rng.randrange(30000),
                rng.randrange(30000),
                rng.choice("VDIWE"),
                rng.choice(tags),
                msg % args[:nargs],
            )
        )
    return out


def gen_apache(n: int, seed: int = 0) -> list[str]:
    """Apache error-log lines, ~64 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        out.append(
            "[Mon Dec %02d %s 2005] [error] mod_jk child workerEnv in error state %d"
            % (rng.randrange(1, 29), _clock(rng)[:8], rng.randrange(10))
        )
    return out


def gen_bgl(n: int, seed: int = 0) -> list[str]:
    """BlueGene/L RAS logs, ~164 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        ts = _ts(rng)
        node = "R%02d-M%d-N%d-C:J%02d-U%02d" % (
            rng.randrange(64), rng.randrange(2), rng.randrange(16),
            rng.randrange(18), rng.randrange(12),
        )
        out.append(
            "- %d 2005.06.%02d %s 2005-06-%02d-%s RAS KERNEL INFO "
            "instruction cache parity error corrected, %d total"
            % (
                ts, rng.randrange(1, 29), node, rng.randrange(1, 29),
                _clock(rng), rng.randrange(10**6),
            )
        )
    return out


def gen_hdfs(n: int, seed: int = 0) -> list[str]:
    """HDFS DataNode block logs, ~141 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        ip = "10.%d.%d.%d" % (rng.randrange(256), rng.randrange(256), rng.randrange(256))
        out.append(
            "081109 %06d %d INFO dfs.DataNode$PacketResponder: PacketResponder %d "
            "for block blk_%d terminating, src: /%s:%d dest: /%s:50010"
            % (
                rng.randrange(10**6), rng.randrange(100, 999), rng.randrange(3),
                rng.randrange(-(10**18), 10**18), ip, rng.randrange(30000, 60000),
                ip,
            )
        )
    return out


def gen_hadoop(n: int, seed: int = 0) -> list[str]:
    """Hadoop MapReduce app logs, ~267 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        app = "application_%d_%04d" % (1445062781478 + rng.randrange(10**6), rng.randrange(10000))
        att = "attempt_%d_%04d_m_%06d_%d" % (
            1445062781478, rng.randrange(10000), rng.randrange(10**6), rng.randrange(3)
        )
        out.append(
            "2015-10-17 %s INFO [main] org.apache.hadoop.mapreduce.v2.app.MRAppMaster: "
            "Executing with tokens: Kind: YARN_AM_RM_TOKEN, Service: , Ident: "
            "(appAttemptId { application_id { id: %d cluster_timestamp: %d } attemptId: %d } "
            "keyId: %d) for %s in %s"
            % (
                _clock(rng)[:8], rng.randrange(10000), 1445062781478 + rng.randrange(10**6),
                rng.randrange(3), rng.randrange(10**9), att, app,
            )
        )
    return out


def gen_alilogs(n: int, seed: int = 0) -> list[str]:
    """Industrial-cloud structured k=v logs, ~299 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        trace = "%016x" % rng.getrandbits(64)
        out.append(
            "ts=%d.%03d|level=%s|host=app-%03d.ea119|trace=%s|rpc=com.alibaba.%s."
            "%sService.%s|rt=%dms|code=%d|size=%d|upstream=10.%d.%d.%d:%d|"
            "retry=%d|queue=%s_%s|tenant=%06d|result=%s"
            % (
                _ts(rng), rng.randrange(1000), rng.choice(["INFO", "WARN", "ERROR"]),
                rng.randrange(1000), trace, rng.choice(_WORDS), rng.choice(_WORDS).title(),
                rng.choice(["query", "update", "insert", "batchGet"]), rng.randrange(2000),
                rng.choice([0, 0, 0, 200, 500]), rng.randrange(10**6),
                rng.randrange(256), rng.randrange(256), rng.randrange(256),
                rng.randrange(1024, 65535), rng.randrange(3), rng.choice(_WORDS),
                rng.choice(_WORDS), rng.randrange(10**6),
                rng.choice(["SUCCESS", "SUCCESS", "TIMEOUT", "FAIL"]),
            )
        )
    return out


# --------------------------------------------------------------------------
# JSON / string datasets
# --------------------------------------------------------------------------

def gen_github(n: int, seed: int = 0) -> list[str]:
    """GitHub-user-like JSON objects (Zstd test corpus style), ~860 B."""
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        login = "%s%d" % (rng.choice(_WORDS), rng.randrange(10**4))
        uid = rng.randrange(10**7)
        obj = {
            "login": login,
            "id": uid,
            "node_id": "MDQ6VXNlcg%d=" % uid,
            "avatar_url": "https://avatars.githubusercontent.com/u/%d?v=4" % uid,
            "gravatar_id": "",
            "url": "https://api.github.com/users/%s" % login,
            "html_url": "https://github.com/%s" % login,
            "followers_url": "https://api.github.com/users/%s/followers" % login,
            "following_url": "https://api.github.com/users/%s/following{/other_user}" % login,
            "gists_url": "https://api.github.com/users/%s/gists{/gist_id}" % login,
            "starred_url": "https://api.github.com/users/%s/starred{/owner}{/repo}" % login,
            "subscriptions_url": "https://api.github.com/users/%s/subscriptions" % login,
            "organizations_url": "https://api.github.com/users/%s/orgs" % login,
            "repos_url": "https://api.github.com/users/%s/repos" % login,
            "type": "User",
            "site_admin": rng.random() < 0.01,
        }
        out.append(json.dumps(obj, separators=(", ", ": ")))
    return out


def gen_cities(n: int, seed: int = 0) -> list[str]:
    """World-cities JSON objects, ~232 B."""
    rng = random.Random(seed)
    countries = ["CN", "US", "JP", "DE", "FR", "BR", "IN", "AU"]
    out = []
    for _ in range(n):
        name = "%s%s" % (rng.choice(_WORDS).title(), rng.choice(["ville", " City", "burg", "ton"]))
        obj = {
            "name": name,
            "country": rng.choice(countries),
            "admin1": "%02d" % rng.randrange(100),
            "lat": round(rng.uniform(-90, 90), 5),
            "lng": round(rng.uniform(-180, 180), 5),
            "pop": rng.randrange(1000, 30_000_000),
            "timezone": rng.choice(
                ["Asia/Shanghai", "America/New_York", "Europe/Berlin", "Asia/Tokyo"]
            ),
            "elevation": rng.randrange(0, 4000),
        }
        out.append(json.dumps(obj, separators=(",", ":")))
    return out


def gen_unece(n: int, seed: int = 0) -> list[str]:
    """Large nested UNECE-country JSON, ~4.5 KB per record."""
    rng = random.Random(seed)
    indicators = [
        "Population", "GDP per capita", "Unemployment rate", "Exports",
        "Imports", "Life expectancy", "Fertility rate", "Energy use",
        "Internet users", "Road density", "CO2 emissions", "Urban population",
    ]
    out = []
    for _ in range(n):
        name = "%sland" % rng.choice(_WORDS).title()
        series = {}
        for ind in indicators:
            # indicator levels drift slowly year-over-year, as in the real
            # UNECE tables (short numerals, many repeats)
            level = rng.uniform(1, 100)
            years = {}
            for year in range(2000, 2021):
                level *= rng.uniform(0.98, 1.03)
                years[str(year)] = round(level, 1)
            series[ind] = years
        obj = {
            "country": name,
            "iso3": "".join(rng.choice("ABCDEFGHIJKLMNOPQRSTUVWXYZ") for _ in range(3)),
            "region": rng.choice(["Europe", "Asia", "Americas", "Africa", "Oceania"]),
            "source": "UNECE Statistical Database",
            "indicators": series,
        }
        out.append(json.dumps(obj, separators=(",", ":")))
    return out


def gen_urls(n: int, seed: int = 0) -> list[str]:
    """URLs with shared prefixes (FSST corpus style), ~63 B."""
    rng = random.Random(seed)
    hosts = ["www.wikipedia.org", "www.amazon.com", "github.com", "news.ycombinator.com"]
    out = []
    for _ in range(n):
        path = "/".join(rng.choice(_WORDS) for _ in range(rng.randrange(2, 5)))
        out.append(
            "https://%s/%s?id=%d&ref=%s"
            % (rng.choice(hosts), path, rng.randrange(10**7), rng.choice(_WORDS))
        )
    return out


def gen_uuid(n: int, seed: int = 0) -> list[str]:
    """Random UUID4 strings — the structure-free control, 36 B."""
    rng = random.Random(seed)
    return [str(uuid_mod.UUID(int=rng.getrandbits(128), version=4)) for _ in range(n)]


GENERATORS: dict[str, Callable[[int, int], list[str]]] = {
    "KV1": gen_kv1,
    "KV2": gen_kv2,
    "KV3": gen_kv3,
    "KV4": gen_kv4,
    "KV5": gen_kv5,
    "Android": gen_android,
    "Apache": gen_apache,
    "BGL": gen_bgl,
    "HDFS": gen_hdfs,
    "Hadoop": gen_hadoop,
    "AliLogs": gen_alilogs,
    "github": gen_github,
    "cities": gen_cities,
    "unece": gen_unece,
    "urls": gen_urls,
    "uuid": gen_uuid,
}

LOG_DATASETS = ["Android", "Apache", "BGL", "HDFS", "Hadoop", "AliLogs"]
JSON_DATASETS = ["cities", "github", "unece"]

#: Table 2 average record lengths (bytes), for the stats harness
PAPER_AVG_LEN = {
    "KV1": 71.5, "KV2": 158.6, "KV3": 90.6, "KV4": 44.1, "KV5": 53.1,
    "Android": 129.7, "Apache": 63.9, "BGL": 164.1, "HDFS": 141.2,
    "Hadoop": 266.9, "AliLogs": 299.2, "github": 863.8, "cities": 232.2,
    "unece": 4494.8, "urls": 63.1, "uuid": 35.6,
}


def records(name: str, n: int, seed: int = 0) -> list[str]:
    """Generate ``n`` records of dataset ``name`` deterministically."""
    return GENERATORS[name](n, seed)


def dataset_df(spark: SparkSession, name: str, n: int, seed: int = 0) -> DataFrame:
    """Dataset as ``DataFrame[id: long, record: string]``."""
    recs = records(name, n, seed)
    pdf = pd.DataFrame({"id": range(len(recs)), "record": recs})
    return spark.createDataFrame(pdf)
