"""Minimal offline PEP 517/660 build backend.

The container has setuptools but no ``wheel`` package and no network, so
the stock ``setuptools.build_meta`` backend cannot produce the editable
wheel ``pip install -e .`` needs.  This backend builds a spec-compliant
editable wheel by hand: a ``.pth`` file pointing at ``src/`` plus the
dist-info metadata.  It has zero build requirements, so pip's build
isolation never touches the network.
"""
import base64
import hashlib
import os
import zipfile

NAME = "repro"
VERSION = "0.1.0"
SRC = os.path.join(os.path.dirname(os.path.abspath(__file__)), "src")

_METADATA = f"""Metadata-Version: 2.1
Name: {NAME}
Version: {VERSION}
Summary: Reproduction of HTPGM temporal pattern mining (VLDB 2021) in PySpark
Requires-Python: >=3.11
"""

_WHEEL = """Wheel-Version: 1.0
Generator: editable_backend (local)
Root-Is-Purelib: true
Tag: py3-none-any
"""


def _record_line(name: str, data: bytes) -> str:
    digest = base64.urlsafe_b64encode(hashlib.sha256(data).digest()).rstrip(b"=")
    return f"{name},sha256={digest.decode()},{len(data)}"


def _write_wheel(wheel_directory: str) -> str:
    dist_info = f"{NAME}-{VERSION}.dist-info"
    fname = f"{NAME}-{VERSION}-py3-none-any.whl"
    files = {
        f"__editable__.{NAME}.pth": (SRC + "\n").encode(),
        f"{dist_info}/METADATA": _METADATA.encode(),
        f"{dist_info}/WHEEL": _WHEEL.encode(),
    }
    record_name = f"{dist_info}/RECORD"
    record = "\n".join(
        [_record_line(n, d) for n, d in files.items()] + [f"{record_name},,", ""]
    )
    path = os.path.join(wheel_directory, fname)
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        for n, d in files.items():
            zf.writestr(n, d)
        zf.writestr(record_name, record)
    return fname


# --- PEP 517 / PEP 660 hooks -------------------------------------------------

def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    # A "regular" wheel of this repo is only ever installed inside this
    # container, where the source tree is fixed — the .pth form is fine.
    return _write_wheel(wheel_directory)


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    return _write_wheel(wheel_directory)


def build_sdist(sdist_directory, config_settings=None):
    raise NotImplementedError("sdist not supported by the offline backend")
