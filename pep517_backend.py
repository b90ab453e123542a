"""Minimal stdlib-only PEP 517/660 build backend for this repository.

The evaluation container has no network access and no ``wheel`` package,
so the standard setuptools editable-install path (which shells out to
``bdist_wheel``) cannot run.  This backend builds the required wheels
with nothing but the standard library:

* ``build_editable`` produces a wheel containing a ``.pth`` file pointing
  at ``src/`` — the classic editable-install mechanism;
* ``build_wheel`` produces a regular wheel with the package files copied
  in (used by ``pip install .`` without ``-e``).
"""
import base64
import hashlib
import os
import zipfile

NAME = "repro"
VERSION = "0.1.0"
DIST = f"{NAME}-{VERSION}"
TAG = "py3-none-any"

_METADATA = f"""Metadata-Version: 2.1
Name: {NAME}
Version: {VERSION}
Summary: PySpark reproduction of 'Extract-Transform-Load for Video Streams' (VLDB 2023)
Requires-Python: >=3.11
"""

_WHEEL = f"""Wheel-Version: 1.0
Generator: pep517_backend (local)
Root-Is-Purelib: true
Tag: {TAG}
"""


def _record_line(arcname: str, data: bytes) -> str:
    digest = base64.urlsafe_b64encode(hashlib.sha256(data).digest())
    return f"{arcname},sha256={digest.rstrip(b'=').decode()},{len(data)}"


def _write_wheel(wheel_directory: str, payload: dict[str, bytes]) -> str:
    filename = f"{DIST}-{TAG}.whl"
    path = os.path.join(wheel_directory, filename)
    entries = dict(payload)
    entries[f"{DIST}.dist-info/METADATA"] = _METADATA.encode()
    entries[f"{DIST}.dist-info/WHEEL"] = _WHEEL.encode()
    record_name = f"{DIST}.dist-info/RECORD"
    record = "\n".join(
        _record_line(arc, data) for arc, data in entries.items()
    )
    record += f"\n{record_name},,\n"
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        for arc, data in entries.items():
            zf.writestr(arc, data)
        zf.writestr(record_name, record)
    return filename


def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []


def get_requires_for_build_sdist(config_settings=None):
    return []


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.abspath(os.path.join(os.path.dirname(__file__), "src"))
    payload = {f"{NAME}_editable.pth": (src + "\n").encode()}
    return _write_wheel(wheel_directory, payload)


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    root = os.path.join(os.path.dirname(__file__), "src")
    payload: dict[str, bytes] = {}
    for dirpath, _dirnames, filenames in os.walk(os.path.join(root, NAME)):
        for fn in sorted(filenames):
            if fn.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, fn)
            arc = os.path.relpath(full, root).replace(os.sep, "/")
            with open(full, "rb") as f:
                payload[arc] = f.read()
    return _write_wheel(wheel_directory, payload)


def build_sdist(sdist_directory, config_settings=None):
    raise NotImplementedError("sdist builds are not needed in this repo")
