"""Unix command substrate.

PaSh treats commands as black boxes and shells out to the real binaries.
Our execution substrate is Spark, so each command the benchmarks use is
reimplemented here as a pure function over line streams (``list[str]``,
lines without trailing newlines). Implementations follow GNU semantics
under ``LC_ALL=C`` and are validated against the real ``/usr/bin``
binaries in ``tests/test_commands_vs_gnu.py``.

The registry maps a command name to a :class:`repro.commands.base.Command`;
``run_cli`` executes one with full CLI semantics (file operands resolved
against the virtual filesystem in :class:`repro.commands.base.ExecEnv`).
"""
from .base import Command, ExecEnv, REGISTRY, register, run_cli, CommandError

# importing the modules populates the registry
from . import textproc  # noqa: F401
from . import sortcmds  # noqa: F401
from . import misc  # noqa: F401
from . import custom  # noqa: F401

__all__ = ["Command", "ExecEnv", "REGISTRY", "register", "run_cli", "CommandError"]
