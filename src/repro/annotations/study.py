"""The §3.1 parallelizability study of GNU Coreutils and POSIX, as data.

The paper reports only per-class counts (Tab. 1); per-command membership is
our reconstruction from the class definitions (stateless = purely-functional
map/filter over lines; parallelizable-pure = pure with mergeable state;
non-parallelizable-pure = pure with sequential state, e.g. hashing;
side-effectful = touches the filesystem/environment/network or consumes no
input / produces no output). Counts match Tab. 1 exactly and are asserted in
``tests/test_table1.py``.
"""
from __future__ import annotations

from typing import Dict, List, Tuple

from .model import CLASS_E, CLASS_N, CLASS_P, CLASS_S

COREUTILS: Dict[str, List[str]] = {
    CLASS_S: [
        "base32", "base64", "basename", "basenc", "cat", "cut", "dirname",
        "echo", "expand", "fmt", "fold", "numfmt", "od", "paste", "printf",
        "ptx", "readlink", "realpath", "seq", "tr", "unexpand", "yes",
    ],
    CLASS_P: ["head", "nl", "pr", "sort", "tac", "tail", "uniq", "wc"],
    CLASS_N: [
        "b2sum", "cksum", "factor", "join", "md5sum", "sha1sum", "sha224sum",
        "sha256sum", "sha384sum", "sha512sum", "shuf", "sum", "tsort",
    ],
    CLASS_E: [
        "chcon", "chgrp", "chmod", "chown", "chroot", "cp", "csplit", "date",
        "dd", "df", "dircolors", "du", "env", "expr", "false", "groups",
        "hostid", "id", "install", "kill", "link", "ln", "logname", "ls",
        "mkdir", "mkfifo", "mknod", "mktemp", "mv", "nice", "nohup", "nproc",
        "pathchk", "pinky", "pwd", "rm", "rmdir", "runcon", "sleep", "split",
        "stat", "stdbuf", "stty", "sync", "tee", "test", "timeout", "touch",
        "true", "truncate", "tty", "uname", "unlink", "uptime", "users",
        "who", "whoami",
    ],
}

POSIX: Dict[str, List[str]] = {
    CLASS_S: [
        "asa", "basename", "cat", "compress", "cut", "dd", "dirname", "echo",
        "egrep", "expand", "fgrep", "fold", "grep", "iconv", "line", "nm",
        "od", "paste", "printf", "sed", "strings", "tr", "uncompress",
        "unexpand", "uudecode", "uuencode", "what", "zcat",
    ],
    CLASS_P: ["comm", "head", "join", "nl", "pr", "sort", "tail", "uniq", "wc"],
    CLASS_N: [
        "awk", "bc", "cksum", "cmp", "dc", "diff", "expr", "lex", "m4",
        "sum", "tsort", "xargs", "yacc",
    ],
    CLASS_E: [
        "admin", "alias", "ar", "at", "batch", "bg", "cal", "cd", "cflow",
        "chgrp", "chmod", "chown", "command", "cp", "crontab", "csplit",
        "ctags", "cxref", "date", "delta", "df", "du", "ed", "env", "ex",
        "false", "fc", "fg", "file", "find", "fort77", "fuser", "gencat",
        "get", "getconf", "getopts", "hash", "id", "ipcrm", "ipcs", "jobs",
        "kill", "link", "ln", "locale", "localedef", "logger", "logname",
        "lp", "ls", "mailx", "make", "man", "mesg", "mkdir", "mkfifo",
        "more", "mv", "newgrp", "nice", "nohup", "pathchk", "pax", "prs",
        "ps", "pwd", "qalter", "qdel", "qhold", "qmove", "qmsg", "qrerun",
        "read", "renice", "rm", "rmdel", "rmdir", "sact", "sccs", "sh",
        "sleep", "split", "stty", "tabs", "talk", "tee", "test", "time",
        "touch", "tput", "tty", "type", "ulimit", "umask", "unalias",
        "uname", "unget", "unlink", "uucp", "uux", "val", "vi", "wait",
        "who", "write",
    ],
}

# Paper Tab. 1: (class, coreutils count, coreutils %, posix count, posix %)
PAPER_TABLE1: List[Tuple[str, int, float, int, float]] = [
    (CLASS_S, 22, 21.1, 28, 18.0),
    (CLASS_P, 8, 7.6, 9, 5.0),
    (CLASS_N, 13, 12.4, 13, 8.3),
    (CLASS_E, 57, 58.8, 105, 67.8),
]


def counts(study: Dict[str, List[str]]) -> Dict[str, int]:
    return {cls: len(cmds) for cls, cmds in study.items()}


def table1_rows() -> List[Dict[str, object]]:
    """Reproduce Tab. 1: class, examples, coreutils/POSIX counts and shares."""
    ex = {CLASS_S: "tr, cat, grep", CLASS_P: "sort, wc, head",
          CLASS_N: "sha1sum", CLASS_E: "env, cp, whoami"}
    cu, px = counts(COREUTILS), counts(POSIX)
    cu_tot, px_tot = sum(cu.values()), sum(px.values())
    return [
        {
            "class": cls,
            "examples": ex[cls],
            "coreutils": cu[cls],
            "coreutils_pct": round(100 * cu[cls] / cu_tot, 1),
            "posix": px[cls],
            "posix_pct": round(100 * px[cls] / px_tot, 1),
        }
        for cls in (CLASS_S, CLASS_P, CLASS_N, CLASS_E)
    ]
