"""Minimal in-tree PEP 517 build backend (pure stdlib, zero deps).

The sandbox has no network and no ``wheel`` package, so the standard
``setuptools.build_meta`` backend cannot build (editable) wheels —
``pip install -e .`` dies with "invalid command 'bdist_wheel'" or while
fetching build dependencies.  This backend declares **no build
requirements** (nothing for build isolation to download) and writes
wheels by hand with ``zipfile``:

- ``build_editable`` → a wheel containing a ``.pth`` file pointing at
  ``src/`` (the classic editable mechanism);
- ``build_wheel`` → a wheel containing ``src/repro`` verbatim;
- ``build_sdist`` → a tar of the project tree.
"""
from __future__ import annotations

import base64
import hashlib
import os
import tarfile
import zipfile

NAME = "repro"
VERSION = "0.1.0"
_DIST_INFO = f"{NAME}-{VERSION}.dist-info"
_ROOT = os.path.dirname(os.path.abspath(__file__))

_METADATA = f"""Metadata-Version: 2.1
Name: {NAME}
Version: {VERSION}
Summary: PySpark reproduction of Auto-Validate (SIGMOD 2021)
Requires-Python: >=3.11
"""

_WHEEL = """Wheel-Version: 1.0
Generator: repro-build-backend
Root-Is-Purelib: true
Tag: py3-none-any
"""


# --- PEP 517 required hooks -------------------------------------------------

def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []


def get_requires_for_build_sdist(config_settings=None):
    return []


def _write_dist_info(files):
    """Append (arcname, data) pairs for the dist-info directory."""
    files.append((f"{_DIST_INFO}/METADATA", _METADATA.encode()))
    files.append((f"{_DIST_INFO}/WHEEL", _WHEEL.encode()))


def _record(files):
    lines = []
    for arcname, data in files:
        digest = base64.urlsafe_b64encode(
            hashlib.sha256(data).digest()
        ).rstrip(b"=").decode()
        lines.append(f"{arcname},sha256={digest},{len(data)}")
    lines.append(f"{_DIST_INFO}/RECORD,,")
    return "\n".join(lines) + "\n"


def _write_wheel(wheel_directory, files):
    name = f"{NAME}-{VERSION}-py3-none-any.whl"
    path = os.path.join(wheel_directory, name)
    record = _record(files)
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        for arcname, data in files:
            zf.writestr(arcname, data)
        zf.writestr(f"{_DIST_INFO}/RECORD", record)
    return name


def prepare_metadata_for_build_wheel(metadata_directory, config_settings=None):
    out = os.path.join(metadata_directory, _DIST_INFO)
    os.makedirs(out, exist_ok=True)
    with open(os.path.join(out, "METADATA"), "w") as f:
        f.write(_METADATA)
    with open(os.path.join(out, "WHEEL"), "w") as f:
        f.write(_WHEEL)
    return _DIST_INFO


prepare_metadata_for_build_editable = prepare_metadata_for_build_wheel


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.join(_ROOT, "src")
    files = [(f"__editable__.{NAME}.pth", (src + "\n").encode())]
    _write_dist_info(files)
    return _write_wheel(wheel_directory, files)


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.join(_ROOT, "src")
    files = []
    for dirpath, _, filenames in os.walk(src):
        for fn in sorted(filenames):
            if fn.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, fn)
            arc = os.path.relpath(full, src).replace(os.sep, "/")
            with open(full, "rb") as f:
                files.append((arc, f.read()))
    _write_dist_info(files)
    return _write_wheel(wheel_directory, files)


def build_sdist(sdist_directory, config_settings=None):
    name = f"{NAME}-{VERSION}.tar.gz"
    base = f"{NAME}-{VERSION}"
    path = os.path.join(sdist_directory, name)
    with tarfile.open(path, "w:gz") as tf:
        for item in ("pyproject.toml", "repro_build_backend.py", "src",
                     "README.md", "DESIGN.md"):
            full = os.path.join(_ROOT, item)
            if os.path.exists(full):
                tf.add(full, arcname=f"{base}/{item}")
    return name
