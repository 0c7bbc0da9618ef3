"""The 20-query a1–a5 investigation (paper §3 "End-to-End Investigation
Procedure": 19 multievent + 1 anomaly query).

Each query carries ground-truth expectations against the injected attack
(rows that must appear / must not appear in the result), so tests verify
both result-equivalence (DuckDB oracle) *and* that the investigation
actually recovers the attack artifacts the paper's narrative names.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.monitor.generator import ATTACKER_IP

_AT = '(at "04/10/2018")'


@dataclass(frozen=True)
class InvestigationQuery:
    """One workload query: AIQL text + ground-truth row expectations.

    ``contains``/``absent`` are partial rows: each dict must match (resp.
    must match no) result row on the named output columns.
    """
    name: str
    step: str        # attack step a1..a5
    kind: str        # 'multievent' | 'dependency' | 'anomaly'
    title: str
    aiql: str
    contains: tuple = field(default_factory=tuple)
    absent: tuple = field(default_factory=tuple)


QUERIES: list[InvestigationQuery] = [
    # ---------------------------------------------------------------- a5
    InvestigationQuery(
        "q01_anomaly_exfil", "a5", "anomaly",
        "Large data transfer from database server (paper Query 3)",
        f"""{_AT}
agentid = 5 // SQL database server
window = 1 min, step = 10 sec
proc p write ip i[dstip="{ATTACKER_IP}"] as evt
return p, avg(evt.amount) as amt
group by p
having amt > 2 * (amt + amt[1] + amt[2]) / 3
""",
        contains=({"p": "powershell.exe"}, {"p": "sbblv.exe"}),
        absent=({"p": "telemetry.exe"},),
    ),
    InvestigationQuery(
        "q02_powershell_reads", "a5", "multievent",
        "Files read by the flagged powershell.exe",
        f"""{_AT}
agentid = 5
proc p["%powershell.exe"] read file f as evt1
return distinct p, f
""",
        contains=({"p": "powershell.exe", "f": "/db/db.bak"},),
    ),
    InvestigationQuery(
        "q03_dump_creator", "a5", "multievent",
        "Creation process of the database dump db.bak",
        f"""{_AT}
agentid = 5
proc p write file f["%db.bak"] as evt1
return distinct p, f
""",
        contains=({"p": "sqlservr.exe", "f": "/db/db.bak"},),
    ),
    InvestigationQuery(
        "q04_connect_before_transfer", "a5", "multievent",
        "powershell.exe connects to XXX.129 before the data transfer",
        f"""{_AT}
agentid = 5
proc p["%powershell.exe"] connect ip i1[dstip="{ATTACKER_IP}"] as evt1
proc p write ip i2[dstip="{ATTACKER_IP}"] as evt2
with evt1 before evt2
return distinct p, i1, i1.dst_port as port
""",
        contains=({"p": "powershell.exe", "i1": ATTACKER_IP, "port": 443},),
    ),
    InvestigationQuery(
        "q05_exfil_chain", "a5", "multievent",
        "Data exfiltration from database server (paper Query 1)",
        f"""{_AT}
agentid = 5 // SQL database server
proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
proc p2 write file f1["%backup1.dmp"] as evt2
proc p3["%sbblv.exe"] read file f1 as evt3
proc p3 write ip i1[dstip="{ATTACKER_IP}"] as evt4
with evt1 before evt2, evt2 before evt3, evt3 before evt4
return distinct p1, p2, f1, p3, i1
""",
        contains=({"p1": "cmd.exe", "p2": "osql.exe", "f1": "/db/backup1.dmp",
                   "p3": "sbblv.exe", "i1": ATTACKER_IP},),
    ),
    # ---------------------------------------------------------------- a4
    InvestigationQuery(
        "q06_pw_dumpers_started", "a4", "multievent",
        "Password dumping tools executed on the domain controller",
        f"""{_AT}
agentid = 4 // domain controller
proc p start proc q["%PwDump7.exe", "%WCE.exe"] as evt1
return distinct p, q
""",
        contains=({"p": "cmd.exe", "q": "PwDump7.exe"},
                  {"p": "cmd.exe", "q": "WCE.exe"}),
    ),
    InvestigationQuery(
        "q07_pw_dump_files", "a4", "multievent",
        "Files written by the password dumping tools",
        f"""{_AT}
agentid = 4
proc p["%PwDump7.exe", "%WCE.exe"] write file f as evt1
return distinct p, f
""",
        contains=({"p": "PwDump7.exe", "f": "/windows/temp/passdump.txt"},
                  {"p": "WCE.exe", "f": "/windows/temp/passdump.txt"}),
    ),
    InvestigationQuery(
        "q08_creds_exfil", "a4", "multievent",
        "Credential file exfiltrated to the attacker host",
        f"""{_AT}
agentid = 4
proc p read file f["%passdump.txt"] as evt1
proc p connect ip i1[dstip="{ATTACKER_IP}"] as evt2
proc p write ip i2[dstip="{ATTACKER_IP}"] as evt3
with evt1 before evt2, evt2 before evt3
return distinct p, f, i1
""",
        contains=({"p": "nc.exe", "f": "/windows/temp/passdump.txt",
                   "i1": ATTACKER_IP},),
    ),
    InvestigationQuery(
        "q09_backtrack_dumper", "a4", "dependency",
        "Backward tracking: what launched the PwDump7 parent",
        f"""{_AT}
agentid = 4
backward
proc a start proc b["%PwDump7.exe"] as evt1
proc c start proc a as evt2
return distinct c, a, b
""",
        contains=({"c": "services.exe", "a": "cmd.exe", "b": "PwDump7.exe"},),
    ),
    # ---------------------------------------------------------------- a3
    InvestigationQuery(
        "q10_memdump_tools", "a3", "multievent",
        "Memory dumping tools executed after privilege escalation",
        f"""{_AT}
agentid = 3
proc p start proc q["%mimikatz.exe", "%kiwi.exe"] as evt1
return distinct p, q
""",
        contains=({"p": "cmd.exe", "q": "mimikatz.exe"},
                  {"p": "cmd.exe", "q": "kiwi.exe"}),
    ),
    InvestigationQuery(
        "q11_mimikatz_output", "a3", "multievent",
        "Files written by mimikatz (any host)",
        f"""{_AT}
proc p["%mimikatz.exe"] write file f as evt1
return distinct p, f, evt1.agentid as host
""",
        contains=({"p": "mimikatz.exe", "f": "/windows/tmp/creds.txt",
                   "host": 3},),
    ),
    InvestigationQuery(
        "q12_privesc_chain", "a3", "multievent",
        "CVE-2015-1701 exploit spawning the credential-dumping shell",
        f"""{_AT}
agentid = 3
proc e["%cve%"] start proc c["%cmd.exe"] as evt1
proc c start proc m["%mimikatz.exe"] as evt2
with evt1 before evt2
return distinct e, c, m
""",
        contains=({"e": "cve-2015-1701.exe", "c": "cmd.exe",
                   "m": "mimikatz.exe"},),
    ),
    # ---------------------------------------------------------------- a2
    InvestigationQuery(
        "q13_malware_written", "a2", "multievent",
        "Which process wrote the malware file on the IRC server",
        f"""{_AT}
agentid = 1
proc p write file f["%info_stealer%"] as evt1
return distinct p, f
""",
        contains=({"p": "bash", "f": "/tmp/info_stealer"},),
    ),
    InvestigationQuery(
        "q14_malware_download", "a2", "multievent",
        "Malware downloaded from the attacker then dropped within 5 min",
        f"""{_AT}
agentid = 1
proc p read ip i[dstip="{ATTACKER_IP}"] as evt1
proc p write file f["%info_stealer%"] as evt2
with evt1 before[5 min] evt2
return distinct p, f, i
""",
        contains=({"p": "bash", "f": "/tmp/info_stealer", "i": ATTACKER_IP},),
    ),
    InvestigationQuery(
        "q15_malware_exec", "a2", "multievent",
        "Every execution of the info_stealer malware in the enterprise",
        f"""{_AT}
proc p start proc q["%info_stealer%"] as evt1
return distinct p, q, evt1.agentid as host
""",
        contains=({"p": "bash", "q": "info_stealer", "host": 1},
                  {"p": "bash", "q": "info_stealer", "host": 2}),
    ),
    InvestigationQuery(
        "q16_forward_ramification", "a2", "dependency",
        "Forward tracking of malware ramification across hosts (paper Query 2)",
        f"""{_AT}
forward
proc m["%info_stealer%", agentid=1] connect ip i[dstip="10.0.0.2"] as evt1
proc w[agentid=2] write file f["%info_stealer%"] as evt2
proc q[agentid=2] read file f as evt3
return distinct m, w, f, q
""",
        contains=({"m": "info_stealer", "w": "wget", "f": "/tmp/info_stealer",
                   "q": "info_stealer"},),
    ),
    InvestigationQuery(
        "q17_wget_fetch", "a2", "multievent",
        "How the intranet host fetched the payload from the IRC server",
        f"""{_AT}
agentid = 2
proc w["%wget%"] connect ip i[dstip="10.0.0.1"] as evt1
proc w write file f as evt2
with evt1 before evt2
return distinct w, i, f
""",
        contains=({"w": "wget", "i": "10.0.0.1", "f": "/tmp/info_stealer"},),
    ),
    # ---------------------------------------------------------------- a1
    InvestigationQuery(
        "q18_ircd_exploit", "a1", "multievent",
        "UnrealIRCd remote-code-execution spawning a shell",
        f"""{_AT}
agentid = 1
proc u["%unrealircd%"] start proc s as evt1
return distinct u, s
""",
        contains=({"u": "unrealircd", "s": "bash"},),
    ),
    InvestigationQuery(
        "q19_backdoor_conn", "a1", "multievent",
        "Telnet back-connection from the spawned shell to the attacker",
        f"""{_AT}
agentid = 1
proc s["%bash%"] connect ip i[dstip="{ATTACKER_IP}"] as evt1
return distinct s, i, i.dst_port as port
""",
        contains=({"s": "bash", "i": ATTACKER_IP, "port": 31337},),
    ),
    InvestigationQuery(
        "q20_initial_compromise", "a1", "dependency",
        "Forward tracking of the full initial compromise",
        f"""{_AT}
agentid = 1
forward
proc u["%unrealircd%"] start proc b as evt1
proc b connect ip i[dstip="{ATTACKER_IP}"] as evt2
proc b write file f["%info_stealer%"] as evt3
proc b start proc m["%info_stealer%"] as evt4
return distinct u, b, f, m
""",
        contains=({"u": "unrealircd", "b": "bash", "f": "/tmp/info_stealer",
                   "m": "info_stealer"},),
    ),
]

assert len(QUERIES) == 20
assert sum(q.kind == "anomaly" for q in QUERIES) == 1
assert sum(q.kind in ("multievent", "dependency") for q in QUERIES) == 19


def query_by_name(name: str) -> InvestigationQuery:
    """Look up a workload query by its ``qNN_...`` name."""
    for q in QUERIES:
        if q.name == name:
            return q
    raise KeyError(name)
